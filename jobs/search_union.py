"""Reproduce Figs. 9/10 as tables: union search F1@k on SANTOS-like and
TUS-like lakes — TabSketchFM vs D3L-like, Starmie-like, header overlap."""
import pandas as pd

from _common import arg_parser, emit, session


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = session("search_union")
    from repro.experiments import search

    frames = [
        search.run_union_search(spark, which=w, scale=args.scale, seed=args.seed, ks=(5, 10, 20))
        for w in ("santos", "tus")
    ]
    emit(pd.concat(frames, ignore_index=True), args.out, "Union search (Figs. 9–10) — F1@k")
    spark.stop()


if __name__ == "__main__":
    main()
