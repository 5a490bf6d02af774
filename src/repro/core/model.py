"""SketchEncoder — the Fig. 1 TabSketchFM architecture in numpy.

This is the documented substitution for the paper's 118M-parameter BERT
encoder (see DESIGN.md): the *input pathway* is identical —

* token embedding of column-name tokens (hash-derived embedding table,
  playing the role of BERT's pretrained token embeddings),
* token-position embedding (position of the token within a column name),
* column-position embedding (1..n_cols; 0 reserved for the description),
* column-type embedding (string / int / float / date),
* a **MinHash sketch linear layer** applied to the slot embedding of the
  value+token MinHash signatures,
* a **numerical sketch linear layer** applied to the standardized
  13-dim numerical sketch,

and per the paper all hidden states are **summed** per column, the
content snapshot is summed into the table-description representation,
and one softmax self-attention round contextualizes columns against
each other before pooling.

MinHash signatures are embedded by mapping each (slot, value) pair to a
pseudo-random unit vector (``hashing.signed_unit_components``); the
expected inner product of two signature embeddings is then proportional
to their slot-match rate, i.e. a Jaccard estimate, which is the
similarity structure the trained model exploits in the paper.

All weights are seeded deterministically; "pretraining" adjusts the
numerical-sketch standardizer and the MLM head (see ``pretrain.py``).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from . import sketches as sk
from .hashing import hash_strings, hash_with_seed, signed_unit_components

COL_TYPE_IDS = {"string": 0, "int": 1, "float": 2, "date": 3}
MAX_COL_POS = 64
MAX_TOK_POS = 16


@dataclass
class Scaler:
    """Per-dimension standardizer for the numerical sketch (fit on the
    pretraining corpus; z-scores clipped to ±5 so outlier magnitudes in
    unseen lakes cannot blow up the linear layer)."""

    mean: np.ndarray = field(default_factory=lambda: np.zeros(sk.NUM_SKETCH_DIM))
    std: np.ndarray = field(default_factory=lambda: np.ones(sk.NUM_SKETCH_DIM))

    def transform(self, x: np.ndarray) -> np.ndarray:
        z = (np.asarray(x, dtype=np.float64) - self.mean) / np.where(self.std > 1e-12, self.std, 1.0)
        return np.clip(z, -5.0, 5.0)

    @staticmethod
    def fit(rows: np.ndarray) -> "Scaler":
        rows = np.asarray(rows, dtype=np.float64)
        return Scaler(mean=rows.mean(axis=0), std=rows.std(axis=0))


class SketchEncoder:
    """Deterministic sketch-to-embedding encoder (see module docstring).

    Parameters
    ----------
    hidden:   embedding dimension (paper: 768; default here 128).
    num_perm: MinHash signature length the sketches were built with.
    seed:     weight seed — all linear layers / embedding tables derive
              from it, so two encoders with the same seed agree bit-for-bit.
    use_minhash / use_numerical / use_content: sketch-type toggles used
              by the Table 3/4 ablations; toggled-off sketches contribute
              a zero hidden state exactly as if the input were absent.
    """

    def __init__(
        self,
        hidden: int = 128,
        num_perm: int = 64,
        seed: int = 0,
        scaler: Scaler | None = None,
        use_minhash: bool = True,
        use_numerical: bool = True,
        use_content: bool = True,
    ):
        self.hidden = hidden
        self.num_perm = num_perm
        self.seed = seed
        self.scaler = scaler or Scaler()
        self.use_minhash = use_minhash
        self.use_numerical = use_numerical
        self.use_content = use_content
        g = np.random.default_rng(seed)
        d = hidden
        self.col_pos_emb = g.normal(0, 1 / np.sqrt(d), (MAX_COL_POS, d))
        self.tok_pos_emb = g.normal(0, 1 / np.sqrt(d), (MAX_TOK_POS, d))
        self.type_emb = g.normal(0, 1 / np.sqrt(d), (len(COL_TYPE_IDS), d))
        self.w_num = g.normal(0, 1 / np.sqrt(sk.NUM_SKETCH_DIM), (sk.NUM_SKETCH_DIM, d))
        self.w_mh = g.normal(0, 1 / np.sqrt(d), (d, d))
        self.w_content = g.normal(0, 1 / np.sqrt(d), (d, d))
        self.w_q = g.normal(0, 1 / np.sqrt(d), (d, d))
        self.w_k = g.normal(0, 1 / np.sqrt(d), (d, d))
        self.w_v = g.normal(0, 0.5 / np.sqrt(d), (d, d))

    # ---- embedding sub-layers -------------------------------------------
    def token_embedding(self, text: str) -> np.ndarray:
        """Mean of hash-derived token vectors + token-position embeddings."""
        toks = sk.tokenize([text]) if text else []
        if not toks:
            return np.zeros(self.hidden)
        vecs = signed_unit_components(hash_strings(toks), self.hidden, seed=self.seed + 11)
        pos = self.tok_pos_emb[np.minimum(np.arange(len(toks)), MAX_TOK_POS - 1)]
        return (vecs + pos).mean(axis=0)

    def minhash_embedding(self, sig: np.ndarray, salt: int) -> np.ndarray:
        """Slot embedding of one signature: mean over per-slot value vectors.

        E[dot(emb(A), emb(B))] ∝ slot-match rate ≈ Jaccard(A, B).
        """
        sig = np.asarray(sig, dtype=np.uint64)
        if np.all(sig == 0):
            return np.zeros(self.hidden)
        slot_salted = hash_with_seed(sig, self.seed * 7919 + salt) ^ np.arange(len(sig), dtype=np.uint64)
        vecs = signed_unit_components(slot_salted, self.hidden, seed=self.seed + 23)
        return vecs.mean(axis=0) * np.sqrt(len(sig))

    # ---- column / table encoding ----------------------------------------
    def column_hidden(self, row: pd.Series) -> np.ndarray:
        """Pre-attention hidden state of one column (sum of Fig. 1 inputs)."""
        h = self.token_embedding(str(row["col_name"]))
        h = h + self.col_pos_emb[min(int(row["col_idx"]) + 1, MAX_COL_POS - 1)]
        h = h + self.type_emb[COL_TYPE_IDS.get(row["col_type"], 0)]
        if self.use_minhash:
            mh = self.minhash_embedding(row["value_sig"], salt=1) + self.minhash_embedding(
                row["token_sig"], salt=2
            )
            h = h + mh @ self.w_mh
        if self.use_numerical:
            h = h + self.scaler.transform(row["num_sketch"]) @ self.w_num
        return h

    def contextualize(self, hiddens: np.ndarray) -> np.ndarray:
        """One residual softmax self-attention round over a table's columns."""
        if len(hiddens) == 0:
            return hiddens
        q = hiddens @ self.w_q
        k = hiddens @ self.w_k
        scores = q @ k.T / np.sqrt(self.hidden)
        scores -= scores.max(axis=1, keepdims=True)
        attn = np.exp(scores)
        attn /= attn.sum(axis=1, keepdims=True)
        return hiddens + attn @ (hiddens @ self.w_v)

    def encode_table(
        self,
        col_rows: pd.DataFrame,
        content_sig: np.ndarray | None = None,
        description: str | None = None,
        mask_col_idx: int | None = None,
    ) -> tuple[np.ndarray, np.ndarray]:
        """Encode one table.

        ``col_rows`` is the slice of the column-sketch frame for the table
        (one row per column). ``mask_col_idx`` drops that column's own
        name tokens (MLM-style whole-column masking in pretraining).

        Returns ``(table_embedding, per_column_embeddings)`` with
        per-column rows ordered as ``col_rows``.
        """
        hiddens = []
        for r in col_rows.to_dict("records"):
            if mask_col_idx is not None and int(r["col_idx"]) == mask_col_idx:
                r = dict(r, col_name="")
            hiddens.append(self.column_hidden(pd.Series(r)))
        H = np.vstack(hiddens) if hiddens else np.zeros((0, self.hidden))
        # Description token (column position 0) + content snapshot summed in,
        # as in Fig. 1 where the snapshot joins the table-description tokens.
        desc = self.token_embedding(description or "") + self.col_pos_emb[0]
        if self.use_content and content_sig is not None:
            desc = desc + self.minhash_embedding(content_sig, salt=3) @ self.w_content
        full = np.vstack([desc[None, :], H]) if len(H) else desc[None, :]
        ctx = self.contextualize(full)
        table_emb = ctx.mean(axis=0)
        col_embs = ctx[1:] if len(H) else np.zeros((0, self.hidden))
        return table_emb, col_embs
