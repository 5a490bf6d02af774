"""Benchmark: regenerate Table 3 (single-sketch ablation) at SF=0.12."""


def test_table3_sketch_only(benchmark, spark, pretrained):
    from repro.experiments import finetune

    df = benchmark.pedantic(
        lambda: finetune.table3(spark, scale=0.12, seed=0, pre=pretrained),
        rounds=1,
        iterations=1,
    )
    assert len(df) == len(finetune.ABLATION_TASKS)
    assert {"only_minhash", "only_numerical", "only_content", "full"} <= set(df.columns)
