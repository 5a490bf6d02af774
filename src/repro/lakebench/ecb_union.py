"""ECB Union benchmark (§5.1.3): regression on dimension distance.

Pairs of ECB-style time-series tables (constant dimension-code columns +
a series) are labelled with the number of dimensions whose codes differ
(1..12); per the paper, the plausibility of a union decreases with that
count, which forms a regression task.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .base import TASK_REGRESSION, Benchmark, assign_splits
from .corpus import ECB_DIM_NAMES, ECB_DIMENSIONS, ecb_series_table

N_DIMS = len(ECB_DIM_NAMES)


def build(scale: float = 1.0, seed: int = 0) -> Benchmark:
    g = np.random.default_rng(seed)
    n_pairs = max(8, int(420 * scale))
    tables: dict[str, pd.DataFrame] = {}
    desc: dict[str, str] = {}
    rows = []
    for i in range(n_pairs):
        base = {d: ECB_DIMENSIONS[d][int(g.integers(len(ECB_DIMENSIONS[d])))] for d in ECB_DIM_NAMES}
        d_diff = int(g.integers(1, N_DIMS + 1))
        changed = g.choice(ECB_DIM_NAMES, size=d_diff, replace=False)
        other = dict(base)
        for d in changed:
            alts = [v for v in ECB_DIMENSIONS[d] if v != base[d]]
            other[d] = alts[int(g.integers(len(alts)))]
        t1, t2 = f"ecbu_{i}_a", f"ecbu_{i}_b"
        tables[t1] = ecb_series_table(base, int(g.integers(40, 120)), g)
        tables[t2] = ecb_series_table(other, int(g.integers(40, 120)), g)
        desc[t1] = "ECB series " + " ".join(base.values())
        desc[t2] = "ECB series " + " ".join(other.values())
        rows.append({"table1": t1, "table2": t2, "label": float(d_diff)})
    pairs = assign_splits(pd.DataFrame(rows), seed=seed + 1)
    return Benchmark(
        name="ecb_union", task=TASK_REGRESSION, tables=tables, pairs=pairs, descriptions=desc
    )
