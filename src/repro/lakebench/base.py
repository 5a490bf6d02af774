"""Shared benchmark structure for LakeBench (§5).

Every benchmark builder returns a :class:`Benchmark`: the tables of its
little data lake (pandas; materialized into Spark by the harnesses), a
pair list with labels, and train/valid/test splits. Labels are floats
for regression, {0,1} ints for binary classification, and multi-hot
lists for multi-label classification.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

TASK_BINARY = "binary"
TASK_REGRESSION = "regression"
TASK_MULTILABEL = "multilabel"


@dataclass
class Benchmark:
    name: str
    task: str
    tables: dict[str, pd.DataFrame]
    pairs: pd.DataFrame  # columns: table1, table2, label, split
    descriptions: dict[str, str] = field(default_factory=dict)
    label_names: list[str] = field(default_factory=list)  # multilabel only

    def split(self, which: str) -> pd.DataFrame:
        return self.pairs[self.pairs["split"] == which].reset_index(drop=True)

    def stats(self) -> dict:
        """Table-1 row ingredients computable without Spark."""
        n_rows = [len(t) for t in self.tables.values()]
        n_cols = [len(t.columns) for t in self.tables.values()]
        return {
            "benchmark": self.name,
            "task": self.task,
            "n_tables": len(self.tables),
            "avg_rows": float(np.mean(n_rows)) if n_rows else 0.0,
            "avg_cols": float(np.mean(n_cols)) if n_cols else 0.0,
            "n_train": int((self.pairs["split"] == "train").sum()),
            "n_test": int((self.pairs["split"] == "test").sum()),
            "n_valid": int((self.pairs["split"] == "valid").sum()),
        }


def assign_splits(
    pairs: pd.DataFrame, seed: int, fracs: tuple[float, float, float] = (0.7, 0.1, 0.2)
) -> pd.DataFrame:
    """Random train/valid/test assignment (at least one pair per split)."""
    g = np.random.default_rng(seed)
    n = len(pairs)
    order = g.permutation(n)
    n_train = max(1, int(n * fracs[0]))
    n_valid = max(1, int(n * fracs[1]))
    split = np.empty(n, dtype=object)
    split[order[:n_train]] = "train"
    split[order[n_train : n_train + n_valid]] = "valid"
    split[order[n_train + n_valid :]] = "test"
    if (split == "test").sum() == 0:
        split[order[-1]] = "test"
    out = pairs.copy()
    out["split"] = split
    return out
