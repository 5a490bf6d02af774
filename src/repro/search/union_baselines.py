"""Union-search baselines (§6.3.2 substitutes): D3L-like, Starmie-like,
SANTOS-like header/value overlap.

Each produces, for a query table, a score against every lake table;
rankings are evaluated with the same F1@k harness as TabSketchFM.

* **D3L-like** (Bogatu et al.): an ensemble of five column-similarity
  evidence types — value overlap (MinHash Jaccard), token overlap
  (token-MinHash Jaccard), column-header similarity, numeric
  distribution similarity (percentile distance), and format/width
  similarity — aggregated over best-matching column pairs.
* **Starmie-like** (Fan et al.): per-column value-token embeddings
  (contextual-encoder stand-in) greedily matched across tables; the
  table score is the mean matched cosine.
* **Header-overlap** (SANTOS-flavoured floor): header token Jaccard
  with a value-overlap boost on the key (first) column.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ..core import minhash
from ..core import sketches as sk
from ..core.baselines import bag_embedding, lm_tokens
from ..core.features import SketchStore, _pctl_sim, _tok_set


def _cos(a, b):
    na, nb = np.linalg.norm(a), np.linalg.norm(b)
    return float(a @ b / (na * nb)) if na > 1e-12 and nb > 1e-12 else 0.0


def d3l_score(store: SketchStore, t1: str, t2: str) -> float:
    ca, cb = store.columns(t1), store.columns(t2)
    per_col = []
    for a in ca.to_dict("records"):
        best = 0.0
        for b in cb.to_dict("records"):
            ev = [
                minhash.jaccard_estimate(a["value_sig"], b["value_sig"]),
                minhash.jaccard_estimate(a["token_sig"], b["token_sig"]),
                1.0 if a["col_name"] == b["col_name"] else _name_sim(a["col_name"], b["col_name"]),
                _pctl_sim(a["num_sketch"], b["num_sketch"])
                if a["num_sketch"][sk.NS_IS_NUMERIC] and b["num_sketch"][sk.NS_IS_NUMERIC]
                else 0.0,
                _width_sim(a["num_sketch"], b["num_sketch"]),
            ]
            best = max(best, float(np.mean(ev)))
        per_col.append(best)
    return float(np.mean(per_col)) if per_col else 0.0


def _name_sim(n1: str, n2: str) -> float:
    s1, s2 = _tok_set([n1]), _tok_set([n2])
    return len(s1 & s2) / len(s1 | s2) if (s1 or s2) else 0.0


def _width_sim(a: np.ndarray, b: np.ndarray) -> float:
    wa, wb = a[sk.NS_MEAN_WIDTH], b[sk.NS_MEAN_WIDTH]
    if wa <= 0 and wb <= 0:
        return 1.0
    return 1.0 - abs(wa - wb) / max(wa, wb, 1.0)


class StarmieLike:
    """Greedy column matching over per-column value-token embeddings."""

    def __init__(self, tables: dict[str, pd.DataFrame], dim: int = 64):
        self._embs = {
            tid: np.vstack(
                [
                    bag_embedding(
                        lm_tokens([c]) + lm_tokens(pdf[c].dropna().astype(str).head(200).tolist(), limit=300),
                        dim=dim,
                    )
                    for c in pdf.columns
                ]
            )
            if len(pdf.columns)
            else np.zeros((0, dim))
            for tid, pdf in tables.items()
        }

    def score(self, t1: str, t2: str) -> float:
        a, b = self._embs[t1], self._embs[t2]
        if not len(a) or not len(b):
            return 0.0
        an = a / np.maximum(np.linalg.norm(a, axis=1, keepdims=True), 1e-12)
        bn = b / np.maximum(np.linalg.norm(b, axis=1, keepdims=True), 1e-12)
        m = an @ bn.T
        # greedy one-to-one matching
        total, used = 0.0, set()
        for i in np.argsort(-m.max(axis=1)):
            order = np.argsort(-m[i])
            for j in order:
                if j not in used:
                    total += m[i, j]
                    used.add(j)
                    break
        return total / len(a)


def header_overlap_score(tables: dict[str, pd.DataFrame], t1: str, t2: str) -> float:
    h1, h2 = _tok_set(tables[t1].columns), _tok_set(tables[t2].columns)
    base = len(h1 & h2) / len(h1 | h2) if (h1 or h2) else 0.0
    k1 = set(tables[t1].iloc[:, 0].dropna().astype(str))
    k2 = set(tables[t2].iloc[:, 0].dropna().astype(str))
    key = len(k1 & k2) / len(k1 | k2) if (k1 or k2) else 0.0
    return 0.7 * base + 0.3 * key


def rank_all(score_fn, query_ids: list[str], corpus_ids: list[str], k: int) -> pd.DataFrame:
    """Driver-side ranking helper for the pairwise-scored baselines."""
    rows = []
    for q in query_ids:
        scores = [(c, score_fn(q, c)) for c in corpus_ids if c != q]
        scores.sort(key=lambda t: (-t[1], t[0]))
        for rank, (c, s) in enumerate(scores[:k], 1):
            rows.append({"query_id": q, "id": c, "score": s, "rank": rank})
    return pd.DataFrame(rows)
