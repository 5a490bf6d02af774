"""Trainable heads for cross-encoders: a small numpy MLP with Adam.

Mirrors the paper's finetuning protocol (§6): cross-entropy loss for
classification, MSE for regression, BCE-with-logits for multi-label
classification, and early stopping with **patience 5** on validation
loss (the paper uses the same patience for both pretraining and
finetuning).

Architecture: ``in → hidden (ReLU) → hidden2 (ReLU) → out`` — the
"two-layered MLP" the paper puts on top of the dual encoders, with one
extra layer for the trainable-encoder regimes. Features are
standardized with train-split statistics inside ``fit``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

TASK_BINARY = "binary"
TASK_MULTICLASS = "multiclass"
TASK_REGRESSION = "regression"
TASK_MULTILABEL = "multilabel"


def _softmax(z: np.ndarray) -> np.ndarray:
    z = z - z.max(axis=1, keepdims=True)
    e = np.exp(z)
    return e / e.sum(axis=1, keepdims=True)


def _sigmoid(z: np.ndarray) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(z, -30, 30)))


@dataclass
class _Adam:
    lr: float = 1e-3
    b1: float = 0.9
    b2: float = 0.999
    eps: float = 1e-8

    def init(self, params: list[np.ndarray]) -> None:
        self.m = [np.zeros_like(p) for p in params]
        self.v = [np.zeros_like(p) for p in params]
        self.t = 0

    def step(self, params: list[np.ndarray], grads: list[np.ndarray]) -> None:
        self.t += 1
        for i, (p, g) in enumerate(zip(params, grads)):
            self.m[i] = self.b1 * self.m[i] + (1 - self.b1) * g
            self.v[i] = self.b2 * self.v[i] + (1 - self.b2) * g * g
            mh = self.m[i] / (1 - self.b1**self.t)
            vh = self.v[i] / (1 - self.b2**self.t)
            p -= self.lr * mh / (np.sqrt(vh) + self.eps)


class MLP:
    """Task-generic MLP head. ``task`` selects output layer + loss.

    ``out_dim``: 2 for binary (softmax over {0,1}), K for multiclass,
    1 for regression, L for multilabel (independent sigmoids).
    """

    def __init__(
        self,
        in_dim: int,
        out_dim: int,
        task: str,
        hidden: int = 64,
        hidden2: int = 32,
        seed: int = 0,
        lr: float = 1e-3,
        weight_decay: float = 1e-4,
    ):
        if task not in (TASK_BINARY, TASK_MULTICLASS, TASK_REGRESSION, TASK_MULTILABEL):
            raise ValueError(f"unknown task {task!r}")
        self.task = task
        self.out_dim = out_dim
        self.weight_decay = weight_decay
        g = np.random.default_rng(seed)
        self.W1 = g.normal(0, np.sqrt(2.0 / in_dim), (in_dim, hidden))
        self.b1 = np.zeros(hidden)
        self.W2 = g.normal(0, np.sqrt(2.0 / hidden), (hidden, hidden2))
        self.b2 = np.zeros(hidden2)
        self.W3 = g.normal(0, np.sqrt(2.0 / hidden2), (hidden2, out_dim))
        self.b3 = np.zeros(out_dim)
        self.opt = _Adam(lr=lr)
        self.opt.init(self._params())
        self.mu = None
        self.sd = None
        # Regression targets are standardized internally (fit on train
        # split) so the MSE landscape is well-scaled for Adam; predictions
        # are mapped back to the original units.
        self.y_mu = 0.0
        self.y_sd = 1.0
        self.history: dict[str, list[float]] = {"train_loss": [], "valid_loss": []}

    def _params(self):
        return [self.W1, self.b1, self.W2, self.b2, self.W3, self.b3]

    def _standardize(self, X: np.ndarray) -> np.ndarray:
        if self.mu is None:
            return X
        return (X - self.mu) / self.sd

    def _forward(self, X: np.ndarray):
        a1 = np.maximum(X @ self.W1 + self.b1, 0)
        a2 = np.maximum(a1 @ self.W2 + self.b2, 0)
        z = a2 @ self.W3 + self.b3
        return a1, a2, z

    def _loss_and_dz(self, z: np.ndarray, y: np.ndarray):
        n = len(z)
        if self.task in (TASK_BINARY, TASK_MULTICLASS):
            p = _softmax(z)
            yi = y.astype(int)
            loss = -np.mean(np.log(p[np.arange(n), yi] + 1e-12))
            dz = p.copy()
            dz[np.arange(n), yi] -= 1.0
            return loss, dz / n
        if self.task == TASK_REGRESSION:
            diff = z[:, 0] - y
            return float(np.mean(diff**2)), (2 * diff / n)[:, None]
        # multilabel BCE with logits
        p = _sigmoid(z)
        loss = -np.mean(y * np.log(p + 1e-12) + (1 - y) * np.log(1 - p + 1e-12))
        return float(loss), (p - y) / (n * z.shape[1])

    def _scale_y(self, y: np.ndarray) -> np.ndarray:
        if self.task == TASK_REGRESSION:
            return (np.asarray(y, dtype=np.float64) - self.y_mu) / self.y_sd
        return y

    def loss(self, X: np.ndarray, y: np.ndarray) -> float:
        _, _, z = self._forward(self._standardize(X))
        return float(self._loss_and_dz(z, self._scale_y(y))[0])

    def fit(
        self,
        X: np.ndarray,
        y: np.ndarray,
        X_valid: np.ndarray | None = None,
        y_valid: np.ndarray | None = None,
        epochs: int = 200,
        batch_size: int = 64,
        patience: int = 5,
        min_epochs: int = 30,
        seed: int = 0,
    ) -> "MLP":
        """Adam minibatch training with patience-5 early stopping (§6).

        ``min_epochs`` guards against stopping during warm-up when the
        validation split is tiny and noisy.
        """
        X = np.asarray(X, dtype=np.float64)
        self.mu = X.mean(axis=0)
        self.sd = np.where(X.std(axis=0) > 1e-12, X.std(axis=0), 1.0)
        Xs = self._standardize(X)
        if self.task == TASK_REGRESSION:
            self.y_mu = float(np.mean(y))
            sd = float(np.std(y))
            self.y_sd = sd if sd > 1e-12 else 1.0
        y = self._scale_y(y)
        g = np.random.default_rng(seed)
        best_val = np.inf
        best_params = [p.copy() for p in self._params()]
        bad = 0
        for epoch in range(epochs):
            order = g.permutation(len(Xs))
            ep_loss = 0.0
            nb = 0
            for lo in range(0, len(Xs), batch_size):
                idx = order[lo : lo + batch_size]
                xb, yb = Xs[idx], y[idx]
                a1, a2, z = self._forward(xb)
                loss, dz = self._loss_and_dz(z, yb)
                ep_loss += loss
                nb += 1
                dW3 = a2.T @ dz + self.weight_decay * self.W3
                db3 = dz.sum(axis=0)
                da2 = dz @ self.W3.T
                da2[a2 <= 0] = 0
                dW2 = a1.T @ da2 + self.weight_decay * self.W2
                db2 = da2.sum(axis=0)
                da1 = da2 @ self.W2.T
                da1[a1 <= 0] = 0
                dW1 = xb.T @ da1 + self.weight_decay * self.W1
                db1 = da1.sum(axis=0)
                self.opt.step(self._params(), [dW1, db1, dW2, db2, dW3, db3])
            self.history["train_loss"].append(ep_loss / max(nb, 1))
            if X_valid is not None and len(X_valid):
                vl = self.loss(np.asarray(X_valid, dtype=np.float64), y_valid)
                self.history["valid_loss"].append(vl)
                if vl < best_val - 1e-6:
                    best_val = vl
                    best_params = [p.copy() for p in self._params()]
                    bad = 0
                else:
                    bad += 1
                    if bad > patience and epoch >= min_epochs:
                        break
        if X_valid is not None and len(X_valid):
            for p, bp in zip(self._params(), best_params):
                p[...] = bp
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        """Labels (binary/multiclass), scores (regression), or 0/1 matrix
        (multilabel, threshold 0.5)."""
        _, _, z = self._forward(self._standardize(np.asarray(X, dtype=np.float64)))
        if self.task in (TASK_BINARY, TASK_MULTICLASS):
            return z.argmax(axis=1)
        if self.task == TASK_REGRESSION:
            return z[:, 0] * self.y_sd + self.y_mu
        return (_sigmoid(z) >= 0.5).astype(int)

    def predict_score(self, X: np.ndarray) -> np.ndarray:
        """Continuous score: P(class 1) for binary, raw output otherwise."""
        _, _, z = self._forward(self._standardize(np.asarray(X, dtype=np.float64)))
        if self.task == TASK_BINARY:
            return _softmax(z)[:, 1]
        if self.task == TASK_MULTICLASS:
            return _softmax(z).max(axis=1)
        if self.task == TASK_REGRESSION:
            return z[:, 0] * self.y_sd + self.y_mu
        return _sigmoid(z).max(axis=1)
