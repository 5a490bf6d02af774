"""TUS-SANTOS benchmark (§5.1.1): binary table-union classification.

Construction per Nargesian et al. / Khatiwada et al.: a few large seed
tables from *distinct domains* (distinct, informative header vocabulary
— which is why the paper finds the benchmark solvable from headers
alone), each split into many smaller tables by sampling rows and column
subsets. SANTOS-style splits always preserve the key entity column.
Positive pairs come from the same seed, negatives from different seeds.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .base import TASK_BINARY, Benchmark, assign_splits
from .corpus import _SCHOOLS, _STEMS

_DOMAINS = [
    ("schools", ["school name", "grade", "enrolment", "year"], _SCHOOLS),
    ("permits", ["permit id", "issue date", "fee", "status"], ["approved", "denied", "pending"]),
    ("parks", ["park name", "area ha", "trees", "district"], ["North", "South", "East", "West"]),
    ("budget", ["department", "fiscal year", "allocation", "spent"], None),
    ("traffic", ["intersection", "volume", "accidents", "speed limit"], None),
    ("water", ["station id", "ph", "turbidity", "sample date"], None),
    ("payroll", ["employee", "salary", "overtime", "union code"], None),
    ("housing", ["address", "assessed value", "land area", "ward"], None),
]


def _seed_table(domain_idx: int, n_rows: int, g: np.random.Generator) -> pd.DataFrame:
    name, headers, vocab = _DOMAINS[domain_idx]
    data: dict[str, object] = {}
    for hi, h in enumerate(headers):
        if hi == 0:
            pool = vocab or [f"{_STEMS[int(g.integers(len(_STEMS)))]}-{name}-{i}" for i in range(60)]
            data[h] = [str(pool[int(g.integers(len(pool)))]) + f" #{i}" for i in range(n_rows)]
        elif "date" in h or "year" in h:
            data[h] = pd.to_datetime("2010-01-01") + pd.to_timedelta(
                g.integers(0, 4000, n_rows), unit="D"
            )
        else:
            data[h] = np.round(g.gamma(2.0, 10 ** int(g.integers(1, 4)), n_rows), 2)
    return pd.DataFrame(data)


def build(scale: float = 1.0, seed: int = 0) -> Benchmark:
    g = np.random.default_rng(seed)
    per_seed = max(3, int(12 * scale))
    tables: dict[str, pd.DataFrame] = {}
    by_domain: dict[int, list[str]] = {}
    for di in range(len(_DOMAINS)):
        base = _seed_table(di, int(g.integers(120, 240)), g)
        by_domain[di] = []
        for k in range(per_seed):
            rows = np.sort(g.choice(len(base), size=int(len(base) * g.uniform(0.3, 0.7)), replace=False))
            # SANTOS-style: keep the key entity column (col 0), sample the rest.
            other = list(base.columns[1:])
            keep = [base.columns[0]] + [
                c for c in other if g.random() < 0.75
            ]
            if len(keep) < 2:
                keep = list(base.columns[:2])
            tid = f"tus_{di}_{k}"
            tables[tid] = base.iloc[rows][keep].reset_index(drop=True)
            by_domain[di].append(tid)
    n_pairs = max(8, int(480 * scale))
    rows = []
    seen = set()
    domains = list(by_domain)
    while len(rows) < n_pairs:
        if len(rows) % 2 == 0:  # positive
            d = domains[int(g.integers(len(domains)))]
            a, b = g.choice(by_domain[d], size=2, replace=False)
            label = 1
        else:  # negative
            d1, d2 = g.choice(len(domains), size=2, replace=False)
            a = by_domain[d1][int(g.integers(per_seed))]
            b = by_domain[d2][int(g.integers(per_seed))]
            label = 0
        if (a, b) in seen:
            continue
        seen.add((a, b))
        rows.append({"table1": a, "table2": b, "label": label})
    pairs = assign_splits(pd.DataFrame(rows), seed=seed + 1)
    return Benchmark(
        name="tus_santos", task=TASK_BINARY, tables=tables, pairs=pairs,
        descriptions={t: _DOMAINS[int(t.split("_")[1])][0] + " open data" for t in tables},
    )
