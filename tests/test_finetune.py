"""Integration tests for the Table 2/3/4 finetuning harness."""
import numpy as np
import pandas as pd
import pytest

from repro.experiments import finetune as ft
from repro.lakebench import registry


@pytest.fixture(scope="module")
def pre(spark):
    return ft.default_pretrained(spark, n_tables=15, seed=777)


class TestHarnessPieces:
    def test_labels_binary(self):
        b = registry.build("ckan_subset", scale=0.05, seed=0)
        y = ft.labels_for(b, b.split("train"))
        assert y.dtype in (np.int64, np.int32) and set(np.unique(y)) <= {0, 1}

    def test_labels_regression(self):
        b = registry.build("ecb_union", scale=0.05, seed=0)
        y = ft.labels_for(b, b.split("train"))
        assert y.dtype == np.float64

    def test_labels_multilabel(self):
        b = registry.build("ecb_join", scale=0.2, seed=0)
        y = ft.labels_for(b, b.split("train"))
        assert y.ndim == 2 and y.shape[1] == len(b.label_names)

    def test_featurizer_for_baseline(self, spark):
        b = registry.build("ckan_subset", scale=0.05, seed=0)
        fz = ft.make_featurizer(b, None, "tabert", None)
        assert fz.name == "tabert"

    def test_featurizer_multilabel_gets_names(self, spark, pre):
        b = registry.build("ecb_join", scale=0.2, seed=0)
        store = ft.sketch_benchmark(spark, b)
        fz = ft.make_featurizer(b, store, "tabsketchfm", pre)
        assert fz.extra_names == b.label_names[:-1]

    def test_ablation_config_forwarded(self, spark, pre):
        b = registry.build("ckan_subset", scale=0.05, seed=0)
        store = ft.sketch_benchmark(spark, b)
        fz = ft.make_featurizer(b, store, "tabsketchfm", pre, ft.ABLATIONS_ONLY["only_minhash"])
        assert fz.use_minhash and not fz.use_numerical and not fz.use_content


class TestRunModel:
    def test_tabsketchfm_beats_chance_on_subset(self, spark, pre):
        b = registry.build("ckan_subset", scale=0.12, seed=0)
        store = ft.sketch_benchmark(spark, b)
        r = ft.run_model(b, store, "tabsketchfm", pre, seeds=(0,))
        assert r.mean > 0.8

    def test_vanilla_fails_subset(self, spark, pre):
        # identical schemas → headers carry no signal (paper's CKAN row)
        b = registry.build("ckan_subset", scale=0.12, seed=0)
        store = ft.sketch_benchmark(spark, b)
        r = ft.run_model(b, store, "vanilla_bert", None, seeds=(0,))
        assert r.mean < 0.7

    def test_multiple_seeds_give_std(self, spark, pre):
        b = registry.build("ckan_subset", scale=0.08, seed=0)
        store = ft.sketch_benchmark(spark, b)
        r = ft.run_model(b, store, "tabsketchfm", pre, seeds=(0, 1))
        assert r.std >= 0.0


class TestTables:
    def test_table2_frame_shape(self, spark, pre):
        df = ft.table2(
            spark, scale=0.08, seeds=(0,),
            models=["vanilla_bert", "tabsketchfm"],
            benchmarks=["tus_santos", "ckan_subset"], pre=pre,
        )
        assert len(df) == 4
        assert set(df["model"]) == {"vanilla_bert", "tabsketchfm"}
        assert df["mean"].between(-1, 1).all()

    def test_table3_frame(self, spark, pre):
        df = ft.table3(spark, scale=0.08, benchmarks=["ckan_subset"], pre=pre)
        assert set(df.columns) >= {"benchmark", "only_minhash", "only_numerical", "only_content", "full"}

    def test_table4_frame(self, spark, pre):
        df = ft.table4(spark, scale=0.08, benchmarks=["ecb_union"], pre=pre)
        assert set(df.columns) >= {"benchmark", "no_minhash", "no_numerical", "no_content", "full"}

    def test_tus_santos_headers_sufficient(self, spark, pre):
        # paper §6.1.2: TUS-SANTOS solvable from headers alone
        b = registry.build("tus_santos", scale=0.12, seed=0)
        store = ft.sketch_benchmark(spark, b)
        r = ft.run_model(b, store, "vanilla_bert", None, seeds=(0,))
        assert r.mean > 0.9
