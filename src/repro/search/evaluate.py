"""Search evaluation: precision/recall/F1 at k (Figs. 8–13 metric)."""
from __future__ import annotations

import numpy as np
import pandas as pd


def f1_at_k(results: pd.DataFrame, ground_truth: dict[str, set], k: int) -> dict:
    """Mean P@k / R@k / F1@k over queries.

    ``results``: ``query_id, id, rank`` (rank 1-based). ``ground_truth``:
    query_id → set of relevant ids. Queries with empty ground truth are
    skipped (undefined recall), as is standard.
    """
    ps, rs, fs = [], [], []
    by_q = {q: grp for q, grp in results.groupby("query_id")}
    for q, gt in ground_truth.items():
        if not gt:
            continue
        grp = by_q.get(q)
        retrieved = (
            list(grp.sort_values("rank")["id"].head(k)) if grp is not None else []
        )
        hits = len(set(retrieved) & gt)
        p = hits / k
        r = hits / len(gt)
        f = 2 * p * r / (p + r) if (p + r) > 0 else 0.0
        ps.append(p)
        rs.append(r)
        fs.append(f)
    if not ps:
        return {"k": k, "precision": 0.0, "recall": 0.0, "f1": 0.0, "n_queries": 0}
    return {
        "k": k,
        "precision": float(np.mean(ps)),
        "recall": float(np.mean(rs)),
        "f1": float(np.mean(fs)),
        "n_queries": len(ps),
    }
