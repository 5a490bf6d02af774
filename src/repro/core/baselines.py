"""Value/serialization-based baseline models (§6.1.1 substitutes).

Each baseline mirrors the *input regime* of the corresponding published
model under the paper's dual-encoder adaptation (encode each table,
combine, feed a 2-layer MLP):

* ``VanillaBertFeatures``  — column headers (+ description) only.
* ``TapasFeatures``        — **frozen** embedding of a 512-token
  row-major serialization (headers + cell values), empty query.
* ``TabbieFeatures``       — **frozen** mean of per-row embeddings over
  the first 30 rows × 20 columns.
* ``TutaFeatures``         — trainable regime over the first 256
  rows/columns of the token stream; per-column value embeddings matched
  across tables.
* ``TabertFeatures``       — trainable regime over the top 10k (here
  1k) rows; per-column value-token embeddings + context (header)
  embeddings, matched across tables.

LM-style value handling: these models see cell values as *text*. Like
BERT wordpieces, pure-number tokens lose their identity — the paper's
own motivation ("treating numerical values in the table as text tends
to lose their semantics") — so numeric tokens are bucketed by magnitude
(``num3`` for a 3-digit number) before hashing into the embedding.
String tokens are kept verbatim. This is what makes the frozen/text
baselines blind to exact numeric overlap (e.g. CKAN Subset) while
remaining strong on string-token similarity (e.g. Wiki Union), the
qualitative pattern of Table 2.

"Frozen" baselines expose only pooled-embedding pair features (the
trainable head cannot re-weight per-column matches); "trainable"
regimes additionally expose column-match aggregates, mirroring the
extra capacity of finetuning the encoder.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from . import sketches as sk
from .hashing import hash_strings, signed_unit_components

EMB_DIM = 32
_POOL = 8  # chunk-pooled interaction features


def lm_tokens(values, limit: int | None = None) -> list[str]:
    """LM-style tokens: strings tokenized verbatim, numeric tokens
    replaced by magnitude buckets (see module docstring)."""
    out: list[str] = []
    for v in values:
        for t in sk.tokenize([str(v)]):
            if t.isdigit():
                out.append(f"num{len(t)}")
            else:
                out.append(t)
            if limit is not None and len(out) >= limit:
                return out
    return out


def bag_embedding(tokens: list[str], dim: int = EMB_DIM, seed: int = 77) -> np.ndarray:
    """Mean of hash-derived token vectors (an off-the-shelf-LM stand-in)."""
    if not tokens:
        return np.zeros(dim)
    return signed_unit_components(hash_strings(tokens), dim, seed=seed).mean(axis=0)


def _cos(a: np.ndarray, b: np.ndarray) -> float:
    na, nb = np.linalg.norm(a), np.linalg.norm(b)
    return float(a @ b / (na * nb)) if na > 1e-12 and nb > 1e-12 else 0.0


def _chunk_pool(v: np.ndarray, k: int = _POOL) -> np.ndarray:
    return v.reshape(k, -1).mean(axis=1)


def _interact(va: np.ndarray, vb: np.ndarray) -> np.ndarray:
    return np.concatenate([[_cos(va, vb)], _chunk_pool(va * vb), _chunk_pool(np.abs(va - vb))])


class _TableModel:
    """Base: per-table embedding cache + pair feature assembly."""

    name = "base"
    trainable = False
    sees_values = True

    def __init__(
        self,
        tables: dict[str, pd.DataFrame],
        descriptions: dict[str, str] | None = None,
        extra_names: list[str] | None = None,
    ):
        self.tables = tables
        self.descriptions = descriptions or {}
        # Named-column features for multi-label tasks (see
        # features.PairFeaturizer): only *trainable* regimes can route
        # per-column information to per-label outputs; frozen encoders
        # expose pooled embeddings only.
        self.extra_names = list(extra_names or [])
        self._tab_emb: dict[str, np.ndarray] = {}
        self._col_embs: dict[str, np.ndarray] = {}

    # subclasses implement
    def _embed_table(self, tid: str) -> np.ndarray:
        raise NotImplementedError

    def _embed_columns(self, tid: str) -> np.ndarray:
        return np.zeros((0, EMB_DIM))

    def table_embedding(self, tid: str) -> np.ndarray:
        if tid not in self._tab_emb:
            self._tab_emb[tid] = self._embed_table(tid)
        return self._tab_emb[tid]

    def column_embeddings(self, tid: str) -> np.ndarray:
        if tid not in self._col_embs:
            self._col_embs[tid] = self._embed_columns(tid)
        return self._col_embs[tid]

    def features(self, t1: str, t2: str) -> np.ndarray:
        va, vb = self.table_embedding(t1), self.table_embedding(t2)
        out = _interact(va, vb)
        if self.trainable:
            ca, cb = self.column_embeddings(t1), self.column_embeddings(t2)
            if len(ca) and len(cb):
                an = ca / np.maximum(np.linalg.norm(ca, axis=1, keepdims=True), 1e-12)
                bn = cb / np.maximum(np.linalg.norm(cb, axis=1, keepdims=True), 1e-12)
                m = an @ bn.T
                agg = np.array(
                    [m.max(axis=1).mean(), m.max(axis=0).mean(), m.max(),
                     float(np.mean(m.max(axis=1) > 0.7))]
                )
            else:
                agg = np.zeros(4)
            h1 = lm_tokens(self.tables[t1].columns)
            h2 = lm_tokens(self.tables[t2].columns)
            s1, s2 = set(h1), set(h2)
            hdr_j = len(s1 & s2) / len(s1 | s2) if (s1 or s2) else 0.0
            out = np.concatenate([out, agg, [hdr_j]])
            named = []
            for name in self.extra_names:
                p1, p2 = self.tables[t1], self.tables[t2]
                present = float(name in p1.columns and name in p2.columns)
                vcos = 0.0
                if present and self.sees_values:
                    vcos = _cos(
                        bag_embedding(lm_tokens(p1[name].head(400).tolist())),
                        bag_embedding(lm_tokens(p2[name].head(400).tolist())),
                    )
                named.extend([present, vcos])
            out = np.concatenate([out, named])
        return out

    def matrix(self, pairs: pd.DataFrame) -> np.ndarray:
        return np.vstack([self.features(r.table1, r.table2) for r in pairs.itertuples()])


class VanillaBertFeatures(_TableModel):
    """Column headers only, as two sentences — the paper's difficulty probe."""

    name = "vanilla_bert"
    trainable = True
    sees_values = False

    def _embed_table(self, tid):
        return bag_embedding(lm_tokens(self.tables[tid].columns))

    def _embed_columns(self, tid):
        cols = self.tables[tid].columns
        if not len(cols):
            return np.zeros((0, EMB_DIM))
        return np.vstack([bag_embedding(lm_tokens([c])) for c in cols])


class TapasFeatures(_TableModel):
    """Frozen 512-token row-serialization embedding, empty NL query."""

    name = "tapas"
    trainable = False

    def _embed_table(self, tid):
        pdf = self.tables[tid]
        toks = lm_tokens(pdf.columns)
        for _, row in pdf.iterrows():
            toks += lm_tokens(row.tolist(), limit=512)
            if len(toks) >= 512:
                break
        return bag_embedding(toks[:512])


class TabbieFeatures(_TableModel):
    """Frozen mean of row embeddings over first 30 rows × 20 columns."""

    name = "tabbie"
    trainable = False

    def _embed_table(self, tid):
        pdf = self.tables[tid].iloc[:30, :20]
        if not len(pdf):
            return np.zeros(EMB_DIM)
        rows = [bag_embedding(lm_tokens(r.tolist())) for _, r in pdf.iterrows()]
        return np.mean(rows, axis=0)


class TutaFeatures(_TableModel):
    """Trainable regime over first 256 rows/cols of the token tree."""

    name = "tuta"
    trainable = True

    def _embed_table(self, tid):
        pdf = self.tables[tid].iloc[:256, :256]
        toks = lm_tokens(pdf.columns)
        budget = max(1, 256 // max(len(pdf.columns), 1))
        for c in pdf.columns:
            toks += lm_tokens(pdf[c].head(budget).tolist())
        return bag_embedding(toks)

    def _embed_columns(self, tid):
        pdf = self.tables[tid].iloc[:256, :256]
        if not len(pdf.columns):
            return np.zeros((0, EMB_DIM))
        budget = max(1, 256 // max(len(pdf.columns), 1))
        return np.vstack(
            [
                bag_embedding(lm_tokens([c]) + lm_tokens(pdf[c].head(budget).tolist()))
                for c in pdf.columns
            ]
        )


class TabertFeatures(_TableModel):
    """Trainable regime over the top rows (content + column embeddings)."""

    name = "tabert"
    trainable = True
    max_rows = 1000

    def _embed_table(self, tid):
        pdf = self.tables[tid].head(self.max_rows)
        toks = lm_tokens(pdf.columns) + lm_tokens([self.descriptions.get(tid, "")])
        for c in pdf.columns:
            toks += lm_tokens(pdf[c].tolist(), limit=400)
        return bag_embedding(toks)

    def _embed_columns(self, tid):
        pdf = self.tables[tid].head(self.max_rows)
        if not len(pdf.columns):
            return np.zeros((0, EMB_DIM))
        return np.vstack(
            [
                bag_embedding(lm_tokens([c]) + lm_tokens(pdf[c].tolist(), limit=400))
                for c in pdf.columns
            ]
        )


BASELINES = {
    "vanilla_bert": VanillaBertFeatures,
    "tapas": TapasFeatures,
    "tabbie": TabbieFeatures,
    "tuta": TutaFeatures,
    "tabert": TabertFeatures,
}
