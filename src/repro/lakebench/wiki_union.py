"""Wiki Union benchmark (§5.1.2): binary unionability over KB tables.

Tables are generated from the synthetic KB with *generic* ``colN``
headers (Fig. 4), so headers carry no signal — the property the paper
uses to show Vanilla BERT failing (0.33 F1). Positive pairs: same
concept, all columns mapped to the same properties. Negatives, per the
paper: (a) columns map to the same properties but the tables are about
different concepts; (b) same number of columns but not all columns map
to the same properties.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .base import TASK_BINARY, Benchmark, assign_splits
from .corpus import KBTable, kb_table, make_kb


def build(scale: float = 1.0, seed: int = 0) -> Benchmark:
    g = np.random.default_rng(seed)
    kb = make_kb(n_concepts=12, entities_per_concept=400, props_per_concept=4, seed=seed + 100)
    qids = list(kb.concepts)
    shared = qids[:6]  # concepts sharing one property schema (negatives (a))
    per_concept = max(4, int(14 * scale))
    gen: list[KBTable] = []
    # Two fixed 3-subsets of each concept's 4 properties; tables drawn from
    # variant 0 or 1. Same-variant pairs are fully unionable; cross-variant
    # pairs of the same concept are negatives (b) (same #cols, mixed props).
    variants: dict[str, list[list[str]]] = {}
    for qid in qids:
        props = kb.concepts[qid].properties
        variants[qid] = [props[:3], [props[0]] + props[2:4]]
    by_cv: dict[tuple[str, int], list[str]] = {}
    for qid in qids:
        for k in range(per_concept):
            v = int(g.integers(2))
            t = kb_table(
                kb, qid, f"wu_{qid}_{k}", int(g.integers(20, 120)), g,
                properties=variants[qid][v],
            )
            gen.append(t)
            by_cv.setdefault((qid, v), []).append(t.table_id)
    tables = {t.table_id: t.df for t in gen}
    n_pairs = max(12, int(700 * scale))
    rows = []
    seen = set()
    kinds = ["pos", "neg_a", "neg_b"]
    ki = 0
    attempts = 0
    while len(rows) < n_pairs and attempts < n_pairs * 50:
        attempts += 1
        kind = kinds[ki % 3]
        ki += 1
        if kind == "pos":
            qid = qids[int(g.integers(len(qids)))]
            v = int(g.integers(2))
            pool = by_cv.get((qid, v), [])
            if len(pool) < 2:
                continue
            a, b = g.choice(pool, size=2, replace=False)
            label = 1
        elif kind == "neg_a":
            # same properties, different concept (shared-schema group)
            q1, q2 = g.choice(shared, size=2, replace=False)
            v = int(g.integers(2))
            p1, p2 = by_cv.get((q1, v), []), by_cv.get((q2, v), [])
            if not p1 or not p2:
                continue
            a, b = p1[int(g.integers(len(p1)))], p2[int(g.integers(len(p2)))]
            label = 0
        else:
            # same concept, same #cols, different property subset
            qid = qids[int(g.integers(len(qids)))]
            p0, p1 = by_cv.get((qid, 0), []), by_cv.get((qid, 1), [])
            if not p0 or not p1:
                continue
            a, b = p0[int(g.integers(len(p0)))], p1[int(g.integers(len(p1)))]
            label = 0
        if (a, b) in seen or a == b:
            continue
        seen.add((a, b))
        rows.append({"table1": a, "table2": b, "label": label})
    pairs = assign_splits(pd.DataFrame(rows), seed=seed + 1)
    return Benchmark(
        name="wiki_union", task=TASK_BINARY, tables=tables, pairs=pairs,
        descriptions={},
    )
