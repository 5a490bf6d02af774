"""Reproduce Table 4: TabSketchFM with one sketch type removed (seed 0)."""
from _common import arg_parser, emit, session


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = session("table4")
    from repro.experiments import finetune

    df = finetune.table4(spark, scale=args.scale, seed=args.seed)
    emit(df, args.out, "Table 4 — remove-one-sketch ablation")
    spark.stop()


if __name__ == "__main__":
    main()
