"""Tests for cross-encoder pair features (repro.core.features)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import features as ft
from repro.core import sketches
from repro.experiments import finetune
from repro.lakebench import registry


@pytest.fixture(scope="module")
def subset_env(spark):
    bench = registry.build("ckan_subset", scale=0.08, seed=0)
    store = finetune.sketch_benchmark(spark, bench)
    return bench, store


@pytest.fixture(scope="module")
def join_env(spark):
    bench = registry.build("wiki_jaccard", scale=0.08, seed=0)
    store = finetune.sketch_benchmark(spark, bench)
    return bench, store


class TestSketchStore:
    def test_columns_sorted_by_idx(self, subset_env):
        _, store = subset_env
        tid = next(iter(store.cols))
        idx = store.columns(tid)["col_idx"].to_numpy()
        assert (np.diff(idx) > 0).all()

    def test_n_rows(self, subset_env):
        bench, store = subset_env
        tid = next(iter(bench.tables))
        assert store.n_rows(tid) == len(bench.tables[tid])

    def test_content_sig_uint64(self, subset_env):
        _, store = subset_env
        tid = next(iter(store.cols))
        assert store.content_sig(tid).dtype == np.uint64


class TestFeatureVector:
    def test_dim_constant(self, subset_env):
        bench, store = subset_env
        fz = ft.PairFeaturizer(store)
        r = bench.pairs.iloc[0]
        assert fz.features(r.table1, r.table2).shape == (ft.FEATURE_DIM,)

    def test_extra_names_extend_dim(self, subset_env):
        bench, store = subset_env
        fz = ft.PairFeaturizer(store, extra_names=["record_id", "code"])
        r = bench.pairs.iloc[0]
        assert fz.features(r.table1, r.table2).shape == (ft.FEATURE_DIM + 4,)

    def test_toggles_zero_groups(self, subset_env):
        bench, store = subset_env
        r = bench.pairs.iloc[0]
        full = ft.PairFeaturizer(store).features(r.table1, r.table2)
        no_mh = ft.PairFeaturizer(store, use_minhash=False).features(r.table1, r.table2)
        sl = slice(ft.N_BASE, ft.N_BASE + ft.N_MH)
        assert np.all(no_mh[sl] == 0)
        assert not np.all(full[sl] == 0)
        np.testing.assert_array_equal(full[: ft.N_BASE], no_mh[: ft.N_BASE])

    def test_matrix_shape(self, subset_env):
        bench, store = subset_env
        fz = ft.PairFeaturizer(store)
        X = fz.matrix(bench.pairs.head(6))
        assert X.shape == (6, ft.FEATURE_DIM)

    def test_all_finite(self, join_env):
        bench, store = join_env
        X = ft.PairFeaturizer(store).matrix(bench.pairs)
        assert np.isfinite(X).all()


class TestFeatureSemantics:
    def test_subset_positive_range_containment_higher(self, subset_env):
        bench, store = subset_env
        fz = ft.PairFeaturizer(store)
        pos = bench.pairs[bench.pairs.label == 1]
        neg = bench.pairs[bench.pairs.label == 0]
        i_cont = ft.N_BASE + ft.N_MH + 2  # frac of A's numeric cols contained in B
        pos_cont = np.mean([fz.features(r.table1, r.table2)[i_cont] for r in pos.itertuples()])
        neg_cont = np.mean([fz.features(r.table1, r.table2)[i_cont] for r in neg.itertuples()])
        assert pos_cont > neg_cont + 0.2

    def test_subset_content_containment_discriminates(self, subset_env):
        bench, store = subset_env
        fz = ft.PairFeaturizer(store)
        i_ct = ft.N_BASE + ft.N_MH + ft.N_NUM + 1  # content containment A in B
        pos = bench.pairs[bench.pairs.label == 1].iloc[0]
        neg = bench.pairs[bench.pairs.label == 0].iloc[0]
        assert (
            fz.features(pos.table1, pos.table2)[i_ct]
            > fz.features(neg.table1, neg.table2)[i_ct] + 0.3
        )

    def test_join_value_jaccard_tracks_label(self, join_env):
        bench, store = join_env
        fz = ft.PairFeaturizer(store)
        X = fz.matrix(bench.pairs)
        y = bench.pairs["label"].to_numpy(float)
        i_vjmax = ft.N_BASE + 1  # best value-sig jaccard
        corr = np.corrcoef(X[:, i_vjmax], y)[0, 1]
        assert corr > 0.8

    def test_encoder_features_populate(self, join_env, spark):
        bench, store = join_env
        from repro.core.model import SketchEncoder

        fz = ft.PairFeaturizer(store, encoder=SketchEncoder(hidden=64))
        r = bench.pairs.iloc[0]
        v = fz.features(r.table1, r.table2)
        enc_slice = v[ft.N_BASE + ft.N_MH + ft.N_NUM + ft.N_CONTENT :]
        assert np.any(enc_slice != 0)

    def test_embedding_cache_used(self, join_env):
        bench, store = join_env
        from repro.core.model import SketchEncoder

        fz = ft.PairFeaturizer(store, encoder=SketchEncoder(hidden=32))
        r = bench.pairs.iloc[0]
        fz.features(r.table1, r.table2)
        assert r.table1 in fz._emb and r.table2 in fz._emb
