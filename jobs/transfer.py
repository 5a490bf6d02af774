"""Reproduce Figs. 11–13 as a table: cross-task/cross-lake transfer — a
cross encoder finetuned on Wiki Jaccard reranks SANTOS-lake union search."""
from _common import arg_parser, emit, session


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = session("transfer")
    from repro.experiments import search

    df = search.run_transfer(spark, scale=args.scale, seed=args.seed)
    emit(df, args.out, "Transfer (Figs. 11–13) — F1@10")
    spark.stop()


if __name__ == "__main__":
    main()
