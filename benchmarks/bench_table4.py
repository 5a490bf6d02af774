"""Benchmark: regenerate Table 4 (remove-one-sketch ablation) at SF=0.12."""


def test_table4_sketch_removal(benchmark, spark, pretrained):
    from repro.experiments import finetune

    df = benchmark.pedantic(
        lambda: finetune.table4(spark, scale=0.12, seed=0, pre=pretrained),
        rounds=1,
        iterations=1,
    )
    assert len(df) == len(finetune.ABLATION_TASKS)
    assert {"no_minhash", "no_numerical", "no_content", "full"} <= set(df.columns)
