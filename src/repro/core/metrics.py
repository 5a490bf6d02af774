"""Evaluation metrics matching the paper's §6.1.2 choices.

* **weighted F1** for binary / multiclass classification (support-
  weighted average of per-class F1, scikit-learn's ``f1_score(...,
  average='weighted')`` semantics — the paper cites scikit-learn),
* **weighted F1 over labels** for multi-label classification,
* **R2** for regression.

Implemented in numpy (scikit-learn is not available offline).
"""
from __future__ import annotations

import numpy as np


def f1_per_class(y_true: np.ndarray, y_pred: np.ndarray, cls) -> float:
    tp = np.sum((y_pred == cls) & (y_true == cls))
    fp = np.sum((y_pred == cls) & (y_true != cls))
    fn = np.sum((y_pred != cls) & (y_true == cls))
    if tp == 0:
        return 0.0
    prec = tp / (tp + fp)
    rec = tp / (tp + fn)
    return float(2 * prec * rec / (prec + rec))


def weighted_f1(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    """Support-weighted mean of per-class F1 over classes present in y_true."""
    y_true = np.asarray(y_true)
    y_pred = np.asarray(y_pred)
    classes, counts = np.unique(y_true, return_counts=True)
    scores = np.array([f1_per_class(y_true, y_pred, c) for c in classes])
    return float(np.sum(scores * counts) / counts.sum())


def multilabel_weighted_f1(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    """Support-weighted mean of per-label binary F1 (labels with support)."""
    y_true = np.asarray(y_true)
    y_pred = np.asarray(y_pred)
    support = y_true.sum(axis=0)
    keep = support > 0
    if not keep.any():
        return 0.0
    scores = np.array(
        [f1_per_class(y_true[:, j], y_pred[:, j], 1) for j in np.where(keep)[0]]
    )
    return float(np.sum(scores * support[keep]) / support[keep].sum())


def r2_score(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    """Coefficient of determination; can be negative for bad fits."""
    y_true = np.asarray(y_true, dtype=np.float64)
    y_pred = np.asarray(y_pred, dtype=np.float64)
    ss_res = np.sum((y_true - y_pred) ** 2)
    ss_tot = np.sum((y_true - y_true.mean()) ** 2)
    if ss_tot == 0:
        return 0.0 if ss_res > 0 else 1.0
    return float(1.0 - ss_res / ss_tot)
