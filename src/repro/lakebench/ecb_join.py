"""ECB Join benchmark (§5.2.4): multi-label join-dimension prediction.

Datasets are ECB collections collapsed into single tables whose
dimension columns vary row-wise over a *subset* of each dimension's
code vocabulary. For every pair of datasets sharing ≥1 dimension, the
ground truth is computed by actually joining on each shared dimension:
the label set is the set of dimensions whose join returns rows, plus a
dedicated NO_JOIN label when none does — the paper's multi-label
formulation.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .base import TASK_MULTILABEL, Benchmark, assign_splits
from .corpus import ECB_DIM_NAMES, ECB_DIMENSIONS, ecb_collapsed_dataset

LABELS = ECB_DIM_NAMES + ["NO_JOIN"]


def build(scale: float = 1.0, seed: int = 0) -> Benchmark:
    g = np.random.default_rng(seed)
    n_datasets = max(6, int(34 * scale))
    tables: dict[str, pd.DataFrame] = {}
    dims_of: dict[str, list[str]] = {}
    for i in range(n_datasets):
        k = int(g.integers(3, 8))
        dims = sorted(g.choice(ECB_DIM_NAMES, size=k, replace=False))
        subsets = {}
        for d in dims:
            vocab = ECB_DIMENSIONS[d]
            m = int(g.integers(1, len(vocab) + 1))
            subsets[d] = sorted(g.choice(vocab, size=m, replace=False))
        tid = f"ecbj_{i}"
        tables[tid] = ecb_collapsed_dataset(dims, int(g.integers(300, 700)), g, subsets)
        dims_of[tid] = dims
    rows = []
    tids = list(tables)
    for i in range(len(tids)):
        for j in range(i + 1, len(tids)):
            a, b = tids[i], tids[j]
            shared = sorted(set(dims_of[a]) & set(dims_of[b]))
            if not shared:
                continue
            label = np.zeros(len(LABELS), dtype=int)
            any_join = False
            for d in shared:
                # exact per-dimension join emptiness check
                if set(tables[a][d]) & set(tables[b][d]):
                    label[LABELS.index(d)] = 1
                    any_join = True
            if not any_join:
                label[LABELS.index("NO_JOIN")] = 1
            rows.append({"table1": a, "table2": b, "label": label.tolist()})
    pairs = assign_splits(pd.DataFrame(rows), seed=seed + 1)
    return Benchmark(
        name="ecb_join", task=TASK_MULTILABEL, tables=tables, pairs=pairs,
        label_names=list(LABELS),
        descriptions={t: "ECB dataset " + " ".join(dims_of[t]) for t in tables},
    )
