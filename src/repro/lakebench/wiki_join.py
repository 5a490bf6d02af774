"""Wiki Jaccard & Wiki Containment benchmarks (§5.2.1–2): regression.

Pairs of KB tables whose entity columns (col0) have controlled overlap
in their cell→entity (CE) mappings. Labels are computed *exactly* from
the generated entity-id sets: Jaccard = |∩|/|∪| for Wiki Jaccard, and
the minimum containment ratio min(|∩|/|A|, |∩|/|B|) for Wiki
Containment — matching the paper's definitions. Cross-concept pairs
give zero-overlap examples.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .base import TASK_REGRESSION, Benchmark, assign_splits
from .corpus import kb_table, make_kb


def _overlapping_sets(pool: list[str], g: np.random.Generator):
    n1 = int(g.integers(20, 100))
    n2 = int(g.integers(20, 100))
    max_ov = min(n1, n2)
    ov = int(round(g.uniform(0, 1.0) * max_ov))
    need = n1 + n2 - ov
    if need > len(pool):
        scalef = len(pool) / need
        n1, n2, ov = int(n1 * scalef), int(n2 * scalef), int(ov * scalef)
        n1, n2 = max(n1, 2), max(n2, 2)
        ov = min(ov, min(n1, n2))
    chosen = g.choice(len(pool), size=n1 + n2 - ov, replace=False)
    ids = [pool[i] for i in chosen]
    a = ids[:n1]
    b = ids[n1 - ov : n1 - ov + n2]
    return a, b


def _build(metric: str, scale: float, seed: int) -> Benchmark:
    g = np.random.default_rng(seed)
    kb = make_kb(n_concepts=10, entities_per_concept=500, seed=seed + 200)
    qids = list(kb.concepts)
    n_pairs = max(8, int(420 * scale))
    tables: dict[str, pd.DataFrame] = {}
    rows = []
    for i in range(n_pairs):
        if g.random() < 0.85:  # same-concept pair with controlled overlap
            qid = qids[int(g.integers(len(qids)))]
            pool = list(kb.concepts[qid].entities)
            ids_a, ids_b = _overlapping_sets(pool, g)
            qid_a = qid_b = qid
        else:  # cross-concept pair: zero CE overlap
            qid_a, qid_b = g.choice(qids, size=2, replace=False)
            ids_a = list(g.choice(list(kb.concepts[qid_a].entities), size=int(g.integers(20, 100)), replace=False))
            ids_b = list(g.choice(list(kb.concepts[qid_b].entities), size=int(g.integers(20, 100)), replace=False))
        sa, sb = set(ids_a), set(ids_b)
        inter = len(sa & sb)
        if metric == "jaccard":
            label = inter / len(sa | sb)
        else:
            label = inter / max(len(sa), len(sb))  # minimum containment ratio
        t1, t2 = f"wj_{i}_a", f"wj_{i}_b"
        ta = kb_table(kb, qid_a, t1, 0, g, entity_ids=ids_a)
        tb = kb_table(kb, qid_b, t2, 0, g, entity_ids=ids_b)
        tables[t1], tables[t2] = ta.df, tb.df
        rows.append({"table1": t1, "table2": t2, "label": float(label)})
    pairs = assign_splits(pd.DataFrame(rows), seed=seed + 1)
    return Benchmark(
        name=f"wiki_{metric}", task=TASK_REGRESSION, tables=tables, pairs=pairs
    )


def build_jaccard(scale: float = 1.0, seed: int = 0) -> Benchmark:
    return _build("jaccard", scale, seed)


def build_containment(scale: float = 1.0, seed: int = 7) -> Benchmark:
    return _build("containment", scale, seed)
