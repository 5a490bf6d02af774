"""Pretraining substitute for §4 of the paper.

The paper pretrains a BERT encoder for 2 GPU-days with masked-column-name
MLM over 197k open-data tables, with column-order data augmentation.
Offline and CPU-only, we keep every *mechanism* of §4 at reduced scale:

* **corpus → sketches**: pretraining consumes the same column/table
  sketch frames the finetuning stack uses;
* **column-order augmentation**: each table contributes ``n_aug``
  column permutations (the paper uses 3 orders per table);
* **whole-column masking**: per table, up to 5 columns are masked one
  at a time (all columns if the table has ≤5, a sample of 5 otherwise —
  the paper's §4 rule), and the model predicts the masked column's
  header token from the masked column's contextual embedding;
* **cross-entropy MLM loss** with patience-5 early stopping.

What pretraining *learns* here: the numerical-sketch standardizer
(corpus statistics) and the MLM head. The encoder weights themselves are
hash-derived and fixed — DESIGN.md documents this capacity substitution.
The MLM loss decreasing (tested) demonstrates that sketch embeddings
carry header-predictive signal, which is the premise of §4.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from . import sketches as sk
from .mlp import MLP, TASK_MULTICLASS
from .model import Scaler, SketchEncoder


@dataclass
class PretrainedTabSketchFM:
    """Everything downstream stages need from pretraining."""

    scaler: Scaler
    vocab: list[str]
    head: MLP | None
    hidden: int = 128
    num_perm: int = 64
    encoder_seed: int = 0
    history: dict = field(default_factory=dict)

    def encoder(self, **toggles) -> SketchEncoder:
        """A SketchEncoder wired with the pretrained scaler.

        ``toggles`` forward to the ablation switches
        (use_minhash / use_numerical / use_content).
        """
        return SketchEncoder(
            hidden=self.hidden,
            num_perm=self.num_perm,
            seed=self.encoder_seed,
            scaler=self.scaler,
            **toggles,
        )


def build_vocab(col_sk: pd.DataFrame, size: int = 256) -> list[str]:
    """Most frequent header tokens across the corpus (MLM label space)."""
    counts: dict[str, int] = {}
    for name in col_sk["col_name"]:
        for t in sk.tokenize([str(name)]):
            counts[t] = counts.get(t, 0) + 1
    return [t for t, _ in sorted(counts.items(), key=lambda kv: (-kv[1], kv[0]))[:size]]


def _mask_examples(
    enc: SketchEncoder,
    col_sk: pd.DataFrame,
    tab_sk: pd.DataFrame,
    vocab: list[str],
    descriptions: dict[str, str] | None,
    n_aug: int,
    max_mask: int,
    seed: int,
) -> tuple[np.ndarray, np.ndarray]:
    """(embedding, label) pairs for masked-column-name prediction."""
    tok_to_id = {t: i for i, t in enumerate(vocab)}
    content = tab_sk.set_index("table_id")["content_sig"] if len(tab_sk) else pd.Series(dtype=object)
    descriptions = descriptions or {}
    g = np.random.default_rng(seed)
    xs, ys = [], []
    for tid, rows in col_sk.groupby("table_id", sort=True):
        rows = rows.sort_values("col_idx").reset_index(drop=True)
        csig = content.get(tid)
        for aug in range(n_aug):
            if aug == 0:
                perm_rows = rows
            else:
                perm = g.permutation(len(rows))
                perm_rows = rows.iloc[perm].reset_index(drop=True)
                perm_rows = perm_rows.assign(col_idx=np.arange(len(rows), dtype=np.int32))
            idxs = np.arange(len(perm_rows))
            if len(idxs) > max_mask:
                idxs = g.choice(idxs, size=max_mask, replace=False)
            for mi in idxs:
                name_toks = sk.tokenize([str(perm_rows["col_name"].iloc[mi])])
                label = next((tok_to_id[t] for t in name_toks if t in tok_to_id), None)
                if label is None:
                    continue
                _, col_embs = enc.encode_table(
                    perm_rows,
                    content_sig=csig,
                    description=descriptions.get(tid),
                    mask_col_idx=int(perm_rows["col_idx"].iloc[mi]),
                )
                xs.append(col_embs[mi])
                ys.append(label)
    if not xs:
        return np.zeros((0, enc.hidden)), np.zeros(0, dtype=int)
    return np.vstack(xs), np.asarray(ys, dtype=int)


def pretrain(
    col_sk: pd.DataFrame,
    tab_sk: pd.DataFrame,
    descriptions: dict[str, str] | None = None,
    hidden: int = 128,
    num_perm: int = 64,
    encoder_seed: int = 0,
    vocab_size: int = 256,
    n_aug: int = 3,
    max_mask: int = 5,
    valid_frac: float = 0.1,
    epochs: int = 60,
    seed: int = 0,
) -> PretrainedTabSketchFM:
    """Run the §4 substitute over a sketched corpus (pandas frames from
    ``sketches.sketches_to_pandas``)."""
    scaler = Scaler.fit(np.vstack(col_sk["num_sketch"].to_numpy()))
    vocab = build_vocab(col_sk, size=vocab_size)
    pre = PretrainedTabSketchFM(
        scaler=scaler,
        vocab=vocab,
        head=None,
        hidden=hidden,
        num_perm=num_perm,
        encoder_seed=encoder_seed,
    )
    enc = pre.encoder()
    X, y = _mask_examples(
        enc, col_sk, tab_sk, vocab, descriptions, n_aug=n_aug, max_mask=max_mask, seed=seed
    )
    if len(X) == 0:
        pre.history = {"n_examples": 0}
        return pre
    g = np.random.default_rng(seed + 1)
    order = g.permutation(len(X))
    n_valid = max(1, int(len(X) * valid_frac))
    vi, ti = order[:n_valid], order[n_valid:]
    head = MLP(in_dim=X.shape[1], out_dim=len(vocab), task=TASK_MULTICLASS, seed=seed, lr=3e-3)
    head.fit(X[ti], y[ti], X[vi], y[vi], epochs=epochs, patience=5, seed=seed)
    pre.head = head
    pre.history = {
        "n_examples": int(len(X)),
        "train_loss": head.history["train_loss"],
        "valid_loss": head.history["valid_loss"],
        "final_train_loss": head.history["train_loss"][-1],
        "chance_loss": float(np.log(len(vocab))),
    }
    return pre
