"""Benchmark: regenerate the union-search tables (Figs. 9–10) at SF=0.25."""
import pandas as pd


def test_union_search(benchmark, spark):
    from repro.experiments import search

    def run():
        return pd.concat(
            [
                search.run_union_search(spark, which=w, scale=0.25, ks=(5, 10))
                for w in ("santos", "tus")
            ],
            ignore_index=True,
        )

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    assert set(df["lake"]) == {"santos", "tus"}
