"""Reproduce Table 3: TabSketchFM with only one sketch type (seed 0)."""
from _common import arg_parser, emit, session


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = session("table3")
    from repro.experiments import finetune

    df = finetune.table3(spark, scale=args.scale, seed=args.seed)
    emit(df, args.out, "Table 3 — single-sketch ablation")
    spark.stop()


if __name__ == "__main__":
    main()
