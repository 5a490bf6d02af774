"""Benchmark: regenerate the join-search table (Fig. 8) at SF=0.3."""


def test_join_search(benchmark, spark):
    from repro.experiments import search

    df = benchmark.pedantic(
        lambda: search.run_wiki_join_search(spark, scale=0.3, ks=(5, 10)),
        rounds=1,
        iterations=1,
    )
    assert set(df["system"]) == {"tabsketchfm", "josie", "lshforest", "embedjoin"}
