"""Reproduce Table 2: TabSketchFM vs baseline models on all 8 LakeBench
tasks, averaged over 5 random seeds (weighted F1 / R2)."""
from _common import arg_parser, emit, session


def main() -> None:
    p = arg_parser(__doc__)
    p.add_argument("--seeds", type=int, default=5, help="number of head seeds")
    args = p.parse_args()
    spark = session("table2")
    from repro.experiments import finetune

    df = finetune.table2(spark, scale=args.scale, seeds=tuple(range(args.seeds)))
    wide = df.pivot_table(index=["benchmark", "metric"], columns="model", values="mean").reset_index()
    emit(df, args.out, "Table 2 — model comparison (long)")
    emit(wide, None, "Table 2 — model comparison (wide, means)")
    spark.stop()


if __name__ == "__main__":
    main()
