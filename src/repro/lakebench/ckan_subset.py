"""CKAN Subset benchmark (§5.3): binary subset detection.

Each open-data-like base table (≥100 rows, row-ordered by a monotone id
column, as real open-data CSVs are) is partitioned into four contiguous
equal subsets S1..S4 (Fig. 6). A subset Si is paired with the union of
Si and two other subsets (positive) and with the union of the other
three subsets (negative) — both partners have the *same schema and the
same number of rows*, so row counts and headers carry no signal; only
the values (row containment, numeric ranges) can discriminate.
Partner row order is shuffled so row position carries no signal either.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .base import TASK_BINARY, Benchmark, assign_splits
from .corpus import opendata_table


def build(scale: float = 1.0, seed: int = 0) -> Benchmark:
    g = np.random.default_rng(seed)
    n_base = max(4, int(90 * scale))
    tables: dict[str, pd.DataFrame] = {}
    rows = []
    for bi in range(n_base):
        base = opendata_table(int(g.integers(100, 360)), int(g.integers(4, 9)), g,
                              start_id=int(g.integers(0, 100000)))
        quarter = len(base) // 4
        S = [base.iloc[i * quarter : (i + 1) * quarter] for i in range(4)]
        i = bi % 4
        others = [k for k in range(4) if k != i]
        pos_members = [i] + list(g.choice(others, size=2, replace=False))
        pos = pd.concat([S[k] for k in pos_members], ignore_index=True)
        neg = pd.concat([S[k] for k in others], ignore_index=True)
        pos = pos.iloc[g.permutation(len(pos))].reset_index(drop=True)
        neg = neg.iloc[g.permutation(len(neg))].reset_index(drop=True)
        si_id, pos_id, neg_id = f"cks_{bi}_s{i}", f"cks_{bi}_pos", f"cks_{bi}_neg"
        tables[si_id] = S[i].reset_index(drop=True)
        tables[pos_id] = pos
        tables[neg_id] = neg
        rows.append({"table1": si_id, "table2": pos_id, "label": 1})
        rows.append({"table1": si_id, "table2": neg_id, "label": 0})
    pairs = assign_splits(pd.DataFrame(rows), seed=seed + 1)
    return Benchmark(name="ckan_subset", task=TASK_BINARY, tables=tables, pairs=pairs)
