"""Tests for the numpy MLP trainer and the paper's metrics."""
import numpy as np
import pytest

from repro.core import metrics
from repro.core.mlp import (
    MLP,
    TASK_BINARY,
    TASK_MULTICLASS,
    TASK_MULTILABEL,
    TASK_REGRESSION,
)


def _blobs(n=400, d=8, seed=0):
    g = np.random.default_rng(seed)
    X = g.normal(0, 1, (n, d))
    y = (X[:, 0] + 0.5 * X[:, 1] > 0).astype(int)
    return X, y


class TestMLPBinary:
    def test_learns_separable(self):
        X, y = _blobs()
        m = MLP(8, 2, TASK_BINARY, seed=0).fit(X, y, X, y, epochs=100)
        acc = np.mean(m.predict(X) == y)
        assert acc > 0.9

    def test_loss_decreases(self):
        X, y = _blobs()
        m = MLP(8, 2, TASK_BINARY).fit(X, y, epochs=30)
        h = m.history["train_loss"]
        assert h[-1] < h[0]

    def test_early_stopping_restores_best(self):
        X, y = _blobs(200)
        Xv, yv = _blobs(100, seed=1)
        m = MLP(8, 2, TASK_BINARY).fit(X, y, Xv, yv, epochs=500, patience=3)
        assert len(m.history["valid_loss"]) < 500

    def test_predict_score_in_unit_interval(self):
        X, y = _blobs()
        m = MLP(8, 2, TASK_BINARY).fit(X, y, epochs=10)
        s = m.predict_score(X)
        assert np.all((s >= 0) & (s <= 1))

    def test_seed_reproducible(self):
        X, y = _blobs()
        m1 = MLP(8, 2, TASK_BINARY, seed=7).fit(X, y, epochs=5, seed=7)
        m2 = MLP(8, 2, TASK_BINARY, seed=7).fit(X, y, epochs=5, seed=7)
        np.testing.assert_allclose(m1.predict_score(X), m2.predict_score(X))


class TestMLPRegression:
    def test_fits_linear_target(self):
        g = np.random.default_rng(0)
        X = g.normal(0, 1, (500, 5))
        y = 2 * X[:, 0] - X[:, 2]
        m = MLP(5, 1, TASK_REGRESSION, lr=3e-3).fit(X, y, X, y, epochs=200)
        assert metrics.r2_score(y, m.predict(X)) > 0.9

    def test_constant_target(self):
        X = np.random.default_rng(0).normal(0, 1, (100, 3))
        y = np.full(100, 2.0)
        m = MLP(3, 1, TASK_REGRESSION).fit(X, y, epochs=100)
        assert abs(m.predict(X).mean() - 2.0) < 0.3


class TestMLPMulticlass:
    def test_three_classes(self):
        g = np.random.default_rng(0)
        X = g.normal(0, 1, (600, 4))
        y = np.clip(np.digitize(X[:, 0], [-0.5, 0.5]), 0, 2)
        m = MLP(4, 3, TASK_MULTICLASS).fit(X, y, X, y, epochs=150)
        assert np.mean(m.predict(X) == y) > 0.85


class TestMLPMultilabel:
    def test_independent_labels(self):
        g = np.random.default_rng(0)
        X = g.normal(0, 1, (600, 6))
        Y = np.stack([(X[:, 0] > 0), (X[:, 1] > 0), (X[:, 2] > 0)], axis=1).astype(float)
        m = MLP(6, 3, TASK_MULTILABEL).fit(X, Y, X, Y, epochs=150)
        pred = m.predict(X)
        assert metrics.multilabel_weighted_f1(Y, pred) > 0.85


class TestMLPValidation:
    def test_unknown_task_raises(self):
        with pytest.raises(ValueError):
            MLP(4, 2, "nonsense")


class TestWeightedF1:
    def test_perfect(self):
        y = np.array([0, 1, 1, 0])
        assert metrics.weighted_f1(y, y) == 1.0

    def test_all_wrong(self):
        assert metrics.weighted_f1(np.array([0, 1]), np.array([1, 0])) == 0.0

    def test_skew_weighting(self):
        # 90/10 skew: predicting majority everywhere → weighted F1 ≈ 0.9*0.947
        y = np.array([0] * 90 + [1] * 10)
        p = np.zeros(100, dtype=int)
        got = metrics.weighted_f1(y, p)
        assert abs(got - 0.9 * (2 * 0.9 / 1.9)) < 1e-9

    def test_multiclass(self):
        y = np.array([0, 1, 2, 2])
        p = np.array([0, 1, 2, 1])
        assert 0 < metrics.weighted_f1(y, p) < 1

    def test_sklearn_reference_case(self):
        # Hand-checked against sklearn f1_score(average='weighted').
        y = np.array([0, 1, 0, 1, 1])
        p = np.array([0, 0, 0, 1, 1])
        # class0: P=2/3,R=1,F1=0.8 (w=2); class1: P=1,R=2/3,F1=0.8 (w=3)
        assert abs(metrics.weighted_f1(y, p) - 0.8) < 1e-9


class TestR2:
    def test_perfect(self):
        y = np.array([1.0, 2.0, 3.0])
        assert metrics.r2_score(y, y) == 1.0

    def test_mean_predictor_zero(self):
        y = np.array([1.0, 2.0, 3.0])
        assert abs(metrics.r2_score(y, np.full(3, 2.0))) < 1e-9

    def test_bad_fit_negative(self):
        y = np.array([1.0, 2.0, 3.0])
        assert metrics.r2_score(y, np.array([3.0, 1.0, -2.0])) < 0


class TestMultilabelF1:
    def test_perfect(self):
        Y = np.array([[1, 0], [0, 1], [1, 1]])
        assert metrics.multilabel_weighted_f1(Y, Y) == 1.0

    def test_empty_support(self):
        Y = np.zeros((3, 2))
        assert metrics.multilabel_weighted_f1(Y, Y) == 0.0
