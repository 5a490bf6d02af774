"""Spider-OpenData Join benchmark (§5.2.3): binary joinability.

Two sources, as in the paper:

* **Spider-like databases** — PK/FK pairs are positives; cross-database
  pairs are negatives.
* **Open-data quadrant splits** (Fig. 5b) — pick a join column (mostly
  unique, not float), sort the table by it, split rows into halves and
  the remaining columns into two groups; adjacent quadrants (same row
  half → same join-column values) are positives, diagonal quadrants
  (disjoint row halves → disjoint join values, verified) are negatives.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .base import TASK_BINARY, Benchmark, assign_splits
from .corpus import opendata_table, spider_database


def _quadrants(pdf: pd.DataFrame, join_col: str, g: np.random.Generator):
    s = pdf.sort_values(join_col).reset_index(drop=True)
    half = len(s) // 2
    other = [c for c in s.columns if c != join_col]
    g_idx = g.permutation(len(other))
    c1 = [join_col] + [other[i] for i in sorted(g_idx[: len(other) // 2])]
    c2 = [join_col] + [other[i] for i in sorted(g_idx[len(other) // 2 :])]
    tl, tr = s.iloc[:half][c1], s.iloc[:half][c2]
    bl, br = s.iloc[half:][c1], s.iloc[half:][c2]
    return [t.reset_index(drop=True) for t in (tl, tr, bl, br)]


def build(scale: float = 1.0, seed: int = 0) -> Benchmark:
    g = np.random.default_rng(seed)
    tables: dict[str, pd.DataFrame] = {}
    rows = []
    # -- open-data quadrants ------------------------------------------------
    n_base = max(2, int(55 * scale))
    for i in range(n_base):
        base = opendata_table(int(g.integers(120, 360)), int(g.integers(3, 7)), g,
                              start_id=int(g.integers(0, 50000)))
        join_col = "record_id" if g.random() < 0.6 else "code"
        # paper's rule: mostly-unique and not float
        if base[join_col].nunique() < 0.8 * len(base):
            join_col = "record_id"
        tl, tr, bl, br = _quadrants(base, join_col, g)
        names = [f"sod_{i}_{q}" for q in ("tl", "tr", "bl", "br")]
        for nm, t in zip(names, (tl, tr, bl, br)):
            tables[nm] = t
        rows.append({"table1": names[0], "table2": names[1], "label": 1})
        rows.append({"table1": names[2], "table2": names[3], "label": 1})
        # true negatives: verify no shared join values across the diagonal
        if not set(tl[join_col]) & set(br[join_col]):
            rows.append({"table1": names[0], "table2": names[3], "label": 0})
        if not set(bl[join_col]) & set(tr[join_col]):
            rows.append({"table1": names[2], "table2": names[1], "label": 0})
    # -- spider-like PK/FK --------------------------------------------------
    n_dbs = max(2, int(10 * scale))
    dbs = [spider_database(f"db{i}", g) for i in range(n_dbs)]
    for db in dbs:
        for tid, pdf in db.tables.items():
            tables[tid] = pdf
        for t1, _, t2, _ in db.joins:
            rows.append({"table1": t1, "table2": t2, "label": 1})
    for _ in range(2 * n_dbs):
        d1, d2 = g.choice(len(dbs), size=2, replace=False)
        t1 = list(dbs[d1].tables)[int(g.integers(len(dbs[d1].tables)))]
        t2 = list(dbs[d2].tables)[int(g.integers(len(dbs[d2].tables)))]
        rows.append({"table1": t1, "table2": t2, "label": 0})
    pairs = assign_splits(pd.DataFrame(rows).drop_duplicates(["table1", "table2"]), seed=seed + 1)
    return Benchmark(name="spider_opendata", task=TASK_BINARY, tables=tables, pairs=pairs)
