"""EmbedJoin — the WarpGate-style baseline (§6.3.1).

WarpGate embeds each column with pre-trained (Glove) word embeddings and
searches an HNSW index. The substitute embeds each column as the mean of
hash-derived token vectors over its values (the Glove stand-in, same as
the paper's reimplementation choice) and reuses the Spark NN-join kernel
for the index probe.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ..core.baselines import bag_embedding, lm_tokens

GLOVE_DIM = 64


def glove_column_embeddings(tables: dict[str, pd.DataFrame]) -> pd.DataFrame:
    """One row per column: ``table_id, col_idx, emb`` (token-bag vector)."""
    rows = []
    for tid, pdf in tables.items():
        for ci, col in enumerate(pdf.columns):
            toks = lm_tokens(pdf[col].dropna().astype(str).head(200).tolist(), limit=400)
            rows.append(
                {"table_id": tid, "col_idx": ci, "emb": bag_embedding(toks, dim=GLOVE_DIM)}
            )
    return pd.DataFrame(rows)
