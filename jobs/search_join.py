"""Reproduce Fig. 8 as a table: Wiki Join search F1@k — TabSketchFM
embeddings vs JOSIE, LSHForest and EmbedJoin over the KB lake."""
from _common import arg_parser, emit, session


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = session("search_join")
    from repro.experiments import search

    df = search.run_wiki_join_search(spark, scale=args.scale, seed=args.seed, ks=(5, 10, 20))
    emit(df, args.out, "Join search (Fig. 8) — F1@k")
    spark.stop()


if __name__ == "__main__":
    main()
