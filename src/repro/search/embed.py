"""Search embeddings (§6.3).

The paper combines two vectors per column for search:

1. the finetuned TabSketchFM embedding of the column (contextual:
   sketches + headers + neighbours via attention), and
2. an off-the-shelf sentence embedding of the column's top-100 values
   concatenated as a sentence (all-MiniLM-L12-v2 in the paper; here the
   hashed bag-of-token embedding — see DESIGN.md),

normalized so the parts' means and variances are on the same scale,
then concatenated. Here each signal block (encoder context, value
text, MinHash-overlap pathway) is **centered across the corpus** —
removing the constant position/type components every table shares —
and unit-L2-normalized, so the cosine of the concatenation is the mean
of per-block cosines: every signal contributes equally, which is the
role finetuning plays for the paper's search embeddings.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ..core.baselines import bag_embedding, lm_tokens
from ..core.features import SketchStore
from ..core.model import SketchEncoder
from ..core.sketches import tokenize

VALUE_DIM = 64


def value_embedding(values, dim: int = VALUE_DIM) -> np.ndarray:
    """MiniLM substitute: embed the top-100 values as one token bag.

    Unlike the *classification baselines* (which bucket numeric tokens,
    mimicking wordpiece models losing number identity), the sentence
    embedder keeps tokens verbatim: MiniLM-class models retain short
    numeric/code identity well enough for §6.3's value signal.
    """
    vals = [str(v) for v in values[:100]]
    return bag_embedding(tokenize(vals), dim=dim)


def _center_unit(block: np.ndarray) -> np.ndarray:
    """Center a (n, d) block across the corpus, then unit-L2 each row."""
    b = block - block.mean(axis=0, keepdims=True)
    n = np.linalg.norm(b, axis=1, keepdims=True)
    return b / np.where(n > 1e-12, n, 1.0)


def _combine_blocks(*blocks: np.ndarray) -> list[np.ndarray]:
    out = np.concatenate([_center_unit(b) for b in blocks], axis=1)
    return [row for row in out]


def column_search_embeddings(
    store: SketchStore,
    tables: dict[str, pd.DataFrame],
    encoder: SketchEncoder,
    use_values: bool = True,
) -> pd.DataFrame:
    """One row per (table, column): ``table_id, col_idx, col_name, emb``.

    Blocks: contextual encoder column embedding, value-sentence
    embedding (optional), value-MinHash slot embedding, token-MinHash
    slot embedding (mirrors the value block for numeric columns).
    """
    meta, enc_b, val_b, mhv_b, mht_b = [], [], [], [], []
    for tid in tables:
        cols = store.columns(tid)
        _, col_embs = encoder.encode_table(
            cols, content_sig=store.content_sig(tid), description=store.descriptions.get(tid)
        )
        pdf = tables[tid]
        for i, r in enumerate(cols.to_dict("records")):
            mh_val = encoder.minhash_embedding(r["value_sig"], salt=1)
            mh_tok = encoder.minhash_embedding(r["token_sig"], salt=2)
            if np.all(mh_tok == 0):
                mh_tok = mh_val  # numeric columns: token block mirrors values
            meta.append(
                {"table_id": tid, "col_idx": int(r["col_idx"]), "col_name": r["col_name"]}
            )
            enc_b.append(col_embs[i])
            mhv_b.append(mh_val)
            mht_b.append(mh_tok)
            if use_values:
                col_vals = pdf.iloc[:, int(r["col_idx"])].dropna().astype(str).tolist()
                val_b.append(value_embedding(col_vals))
    blocks = [np.vstack(enc_b)]
    if use_values:
        blocks.append(np.vstack(val_b))
    blocks += [np.vstack(mhv_b), np.vstack(mht_b)]
    out = pd.DataFrame(meta)
    out["emb"] = _combine_blocks(*blocks)
    return out


def table_search_embeddings(
    store: SketchStore,
    tables: dict[str, pd.DataFrame],
    encoder: SketchEncoder,
    use_values: bool = True,
) -> pd.DataFrame:
    """One row per table: ``table_id, emb`` (union search).

    Blocks: contextual encoder table embedding, header+value token
    embedding (optional), content-snapshot slot embedding.
    """
    meta, enc_b, val_b, cnt_b = [], [], [], []
    for tid in tables:
        emb, _ = encoder.encode_table(
            store.columns(tid),
            content_sig=store.content_sig(tid),
            description=store.descriptions.get(tid),
        )
        meta.append({"table_id": tid})
        enc_b.append(emb)
        cnt_b.append(encoder.minhash_embedding(store.content_sig(tid), salt=3))
        if use_values:
            pdf = tables[tid]
            toks: list[str] = []
            for c in pdf.columns:
                toks += lm_tokens([c]) + lm_tokens(pdf[c].head(40).tolist(), limit=60)
            val_b.append(bag_embedding(toks, dim=VALUE_DIM))
    blocks = [np.vstack(enc_b)]
    if use_values:
        blocks.append(np.vstack(val_b))
    blocks.append(np.vstack(cnt_b))
    out = pd.DataFrame(meta)
    out["emb"] = _combine_blocks(*blocks)
    return out
