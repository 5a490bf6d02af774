"""Tests for the baseline input regimes (repro.core.baselines)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import baselines as bl


@pytest.fixture()
def tiny_tables():
    return {
        "a": pd.DataFrame({"school name": ["Riverside School", "Juniper School"], "grade": [5, 6]}),
        "b": pd.DataFrame({"school name": ["Riverside School", "Brookdale School"], "grade": [7, 8]}),
        "c": pd.DataFrame({"permit id": [101, 102], "fee": [9.5, 10.5]}),
    }


class TestLmTokens:
    def test_strings_kept(self):
        assert "riverside" in bl.lm_tokens(["Riverside School"])

    def test_numbers_bucketed(self):
        toks = bl.lm_tokens(["12345", "99"])
        assert toks == ["num5", "num2"]

    def test_numeric_identity_lost(self):
        # The LM-style property: distinct same-magnitude numbers collide.
        assert bl.lm_tokens(["123"]) == bl.lm_tokens(["456"])

    def test_limit(self):
        toks = bl.lm_tokens(["a b c d e"], limit=3)
        assert len(toks) == 3


class TestBagEmbedding:
    def test_empty(self):
        assert np.all(bl.bag_embedding([]) == 0)

    def test_deterministic(self):
        np.testing.assert_array_equal(bl.bag_embedding(["x", "y"]), bl.bag_embedding(["x", "y"]))

    def test_similar_bags_closer(self):
        a = bl.bag_embedding(["school", "grade", "year"])
        b = bl.bag_embedding(["school", "grade", "total"])
        c = bl.bag_embedding(["permit", "fee", "status"])
        cos = lambda u, v: u @ v / (np.linalg.norm(u) * np.linalg.norm(v))
        assert cos(a, b) > cos(a, c)


@pytest.mark.parametrize("name", sorted(bl.BASELINES))
class TestAllBaselines:
    def test_features_finite_and_fixed_dim(self, tiny_tables, name):
        m = bl.BASELINES[name](tiny_tables)
        f_ab = m.features("a", "b")
        f_ac = m.features("a", "c")
        assert f_ab.shape == f_ac.shape
        assert np.isfinite(f_ab).all()

    def test_same_domain_scores_higher_cos(self, tiny_tables, name):
        m = bl.BASELINES[name](tiny_tables)
        assert m.features("a", "b")[0] > m.features("a", "c")[0]

    def test_matrix(self, tiny_tables, name):
        m = bl.BASELINES[name](tiny_tables)
        pairs = pd.DataFrame({"table1": ["a", "a"], "table2": ["b", "c"]})
        assert m.matrix(pairs).shape[0] == 2


class TestRegimes:
    def test_vanilla_blind_to_values(self, tiny_tables):
        m = bl.VanillaBertFeatures(tiny_tables)
        # same headers, different values → identical embeddings
        np.testing.assert_allclose(m.table_embedding("a"), m.table_embedding("b"))

    def test_tabert_sees_values(self, tiny_tables):
        m = bl.TabertFeatures(tiny_tables)
        assert not np.allclose(m.table_embedding("a"), m.table_embedding("b"))

    def test_frozen_models_have_no_column_features(self, tiny_tables):
        frozen = bl.TapasFeatures(tiny_tables)
        trainable = bl.TabertFeatures(tiny_tables)
        assert len(frozen.features("a", "b")) < len(trainable.features("a", "b"))

    def test_extra_names_trainable_only(self, tiny_tables):
        with_names = bl.TabertFeatures(tiny_tables, extra_names=["grade"])
        without = bl.TabertFeatures(tiny_tables)
        assert len(with_names.features("a", "b")) == len(without.features("a", "b")) + 2

    def test_extra_names_frozen_unchanged(self, tiny_tables):
        with_names = bl.TapasFeatures(tiny_tables, extra_names=["grade"])
        without = bl.TapasFeatures(tiny_tables)
        assert len(with_names.features("a", "b")) == len(without.features("a", "b"))

    def test_vanilla_named_feature_no_value_cos(self, tiny_tables):
        m = bl.VanillaBertFeatures(tiny_tables, extra_names=["grade"])
        v = m.features("a", "b")
        assert v[-2] == 1.0  # present in both
        assert v[-1] == 0.0  # but headers-only model sees no values

    def test_tabbie_truncates_rows(self):
        big = {
            "x": pd.DataFrame({"v": [f"tok{i}" for i in range(500)]}),
            "y": pd.DataFrame({"v": [f"tok{i}" for i in range(30)]}),
        }
        m = bl.TabbieFeatures(big)
        # first 30 rows identical → identical embeddings despite size gap
        np.testing.assert_allclose(m.table_embedding("x"), m.table_embedding("y"))
