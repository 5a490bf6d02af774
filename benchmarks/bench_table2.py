"""Benchmark: regenerate Table 2 (model comparison) at SF=0.12, 1 seed."""


def test_table2_model_comparison(benchmark, spark, pretrained):
    from repro.experiments import finetune

    df = benchmark.pedantic(
        lambda: finetune.table2(spark, scale=0.12, seeds=(0,), pre=pretrained),
        rounds=1,
        iterations=1,
    )
    assert len(df) == 8 * len(finetune.MODELS)
    # headline shape: TabSketchFM dominates CKAN Subset where text models fail
    sub = df[df.benchmark == "ckan_subset"].set_index("model")["mean"]
    assert sub["tabsketchfm"] > sub["tapas"]
