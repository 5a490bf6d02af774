"""Benchmark: regenerate Table 1 (LakeBench statistics) at SF=0.2."""


def test_table1_stats(benchmark, spark):
    from repro.lakebench import registry

    df = benchmark.pedantic(
        lambda: registry.table1(spark, scale=0.2, seed=0), rounds=1, iterations=1
    )
    assert len(df) == 8
    assert (df["n_tables"] > 0).all()
