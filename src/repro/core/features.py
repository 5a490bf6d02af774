"""Cross-encoder pair features for TabSketchFM (§6 finetuning).

A finetuned cross-encoder in the paper scores a *pair* of tables from
the pretrained sketch representation. Here the encoder's view of a pair
is assembled into a fixed-length feature vector with one group per
input pathway of Fig. 1:

* **base** — header/token/type/position information (always on; the
  Table 3/4 ablations only toggle the three sketch types, never the
  token inputs),
* **minhash** — best-match slot statistics between the two tables'
  value/token signatures (value overlap, containment, token-domain
  similarity),
* **numerical** — distribution-overlap statistics between numerical
  sketches (range IoU, range containment — the subset signal —
  percentile distances, NaN/unique/width deltas),
* **content** — content-snapshot (whole-row MinHash) Jaccard and
  directional containment estimates,
* **encoder** — cosine similarities of SketchEncoder table and
  best-matching column embeddings, computed with the same sketch
  toggles, so the contextualizing attention contributes to the score.

Toggled-off groups are zeroed (the feature length never changes), which
is exactly "that sketch's hidden state is absent" in the neural model.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from . import minhash
from . import sketches as sk
from .model import SketchEncoder

N_BASE, N_MH, N_NUM, N_CONTENT, N_ENC = 7, 12, 11, 3, 3
FEATURE_DIM = N_BASE + N_MH + N_NUM + N_CONTENT + N_ENC


class SketchStore:
    """Driver-side view of the Spark-computed sketch frames, indexed by
    table id (built via ``sketches.sketches_to_pandas``)."""

    def __init__(
        self,
        col_sk: pd.DataFrame,
        tab_sk: pd.DataFrame,
        descriptions: dict[str, str] | None = None,
    ):
        self.cols = {
            tid: grp.sort_values("col_idx").reset_index(drop=True)
            for tid, grp in col_sk.groupby("table_id")
        }
        self.tabs = tab_sk.set_index("table_id")
        self.descriptions = descriptions or {}

    def columns(self, tid: str) -> pd.DataFrame:
        return self.cols[tid]

    def content_sig(self, tid: str) -> np.ndarray:
        return self.tabs.loc[tid, "content_sig"]

    def n_rows(self, tid: str) -> int:
        return int(self.tabs.loc[tid, "n_rows"])


def _tok_set(names) -> set[str]:
    out: set[str] = set()
    for n in names:
        out.update(sk.tokenize([str(n)]))
    return out


def _jac(a: set, b: set) -> float:
    return len(a & b) / len(a | b) if (a or b) else 0.0


def _type_hist(cols: pd.DataFrame) -> np.ndarray:
    h = np.zeros(4)
    order = ["string", "int", "float", "date"]
    for t in cols["col_type"]:
        h[order.index(t)] += 1
    return h / max(h.sum(), 1)


def _base_features(ca: pd.DataFrame, cb: pd.DataFrame, store: SketchStore, t1, t2) -> np.ndarray:
    ta, tb = _tok_set(ca["col_name"]), _tok_set(cb["col_name"])
    na, nb = len(ca), len(cb)
    names_a, names_b = list(ca["col_name"]), list(cb["col_name"])
    same_schema = float(sorted(names_a) == sorted(names_b))
    shared_names = len(set(names_a) & set(names_b)) / max(min(na, nb), 1)
    rows_a, rows_b = max(store.n_rows(t1), 1), max(store.n_rows(t2), 1)
    return np.array(
        [
            _jac(ta, tb),
            same_schema,
            shared_names,
            abs(na - nb) / max(na, nb, 1),
            min(na, nb) / max(na, nb, 1),
            abs(np.log(rows_a / rows_b)),
            float(np.abs(_type_hist(ca) - _type_hist(cb)).sum() / 2),
        ]
    )


def _best_pairs(ca, cb, score_fn) -> tuple[np.ndarray, np.ndarray]:
    """Per-column best match scores, both directions (A→B, B→A)."""
    m = np.zeros((len(ca), len(cb)))
    for i, a in enumerate(ca.to_dict("records")):
        for j, b in enumerate(cb.to_dict("records")):
            m[i, j] = score_fn(a, b)
    if m.size == 0:
        return np.zeros(0), np.zeros(0)
    return m.max(axis=1), m.max(axis=0)


def _mh_features(ca: pd.DataFrame, cb: pd.DataFrame) -> np.ndarray:
    val_j = lambda a, b: minhash.jaccard_estimate(a["value_sig"], b["value_sig"])
    tok_j = lambda a, b: minhash.jaccard_estimate(a["token_sig"], b["token_sig"])

    def cont_ab(a, b):
        return minhash.containment_estimate(
            a["value_sig"], b["value_sig"], int(a["n_distinct"]), int(b["n_distinct"])
        )

    vj_a, vj_b = _best_pairs(ca, cb, val_j)
    tj_a, tj_b = _best_pairs(ca, cb, tok_j)
    ct_a, ct_b = _best_pairs(ca, cb, cont_ab)

    def mm(x):
        return (float(x.mean()), float(x.max())) if len(x) else (0.0, 0.0)

    vj_mean = (mm(vj_a)[0] + mm(vj_b)[0]) / 2
    vj_max = max(mm(vj_a)[1], mm(vj_b)[1])
    tj_mean = (mm(tj_a)[0] + mm(tj_b)[0]) / 2
    tj_max = max(mm(tj_a)[1], mm(tj_b)[1])
    frac_hi = float(np.mean(vj_a > 0.5)) if len(vj_a) else 0.0
    frac_lo = float(np.mean(vj_a < 0.05)) if len(vj_a) else 0.0
    frac_tok_hi = float(np.mean(tj_a > 0.5)) if len(tj_a) else 0.0
    return np.array(
        [
            vj_mean, vj_max, tj_mean, tj_max,
            mm(ct_a)[0], mm(ct_a)[1], mm(ct_b)[0], mm(ct_b)[1],
            frac_hi, frac_lo, frac_tok_hi,
            float(np.mean(ct_a > 0.5)) if len(ct_a) else 0.0,
        ]
    )


def _num_cols(cols: pd.DataFrame) -> pd.DataFrame:
    keep = [bool(ns[sk.NS_IS_NUMERIC]) for ns in cols["num_sketch"]]
    return cols[np.asarray(keep, dtype=bool)]


def _range_iou(a: np.ndarray, b: np.ndarray) -> float:
    lo = max(a[sk.NS_MIN], b[sk.NS_MIN])
    hi = min(a[sk.NS_MAX], b[sk.NS_MAX])
    u_lo = min(a[sk.NS_MIN], b[sk.NS_MIN])
    u_hi = max(a[sk.NS_MAX], b[sk.NS_MAX])
    if u_hi <= u_lo:
        return 1.0 if hi >= lo else 0.0
    return max(hi - lo, 0.0) / (u_hi - u_lo)


def _range_contained(a: np.ndarray, b: np.ndarray) -> float:
    """1 if [min_a, max_a] ⊆ [min_b, max_b] (tolerance-padded)."""
    span = max(b[sk.NS_MAX] - b[sk.NS_MIN], 1e-9)
    eps = 1e-6 * span
    return float(a[sk.NS_MIN] >= b[sk.NS_MIN] - eps and a[sk.NS_MAX] <= b[sk.NS_MAX] + eps)


def _pctl_sim(a: np.ndarray, b: np.ndarray) -> float:
    scale = max(a[sk.NS_STD], b[sk.NS_STD], 1e-9)
    d = np.mean(np.abs(a[sk.NS_P10 : sk.NS_P90 + 1] - b[sk.NS_P10 : sk.NS_P90 + 1])) / scale
    return 1.0 / (1.0 + d)


def _num_features(ca: pd.DataFrame, cb: pd.DataFrame) -> np.ndarray:
    na_, nb_ = _num_cols(ca), _num_cols(cb)
    iou = lambda a, b: _range_iou(a["num_sketch"], b["num_sketch"])
    cont = lambda a, b: _range_contained(a["num_sketch"], b["num_sketch"])
    psim = lambda a, b: _pctl_sim(a["num_sketch"], b["num_sketch"])
    iou_a, iou_b = _best_pairs(na_, nb_, iou)
    cont_a, cont_b = _best_pairs(na_, nb_, cont)
    ps_a, ps_b = _best_pairs(na_, nb_, psim)

    def mean0(x):
        return float(x.mean()) if len(x) else 0.0

    def max0(x):
        return float(x.max()) if len(x) else 0.0

    # NaN / unique / width deltas over name-position-aligned columns
    k = min(len(ca), len(cb))
    if k:
        nsa = np.vstack(ca["num_sketch"].to_numpy()[:k])
        nsb = np.vstack(cb["num_sketch"].to_numpy()[:k])
        d_nan = float(np.mean(np.abs(nsa[:, sk.NS_FRAC_NAN] - nsb[:, sk.NS_FRAC_NAN])))
        d_uni = float(np.mean(np.abs(nsa[:, sk.NS_FRAC_UNIQUE] - nsb[:, sk.NS_FRAC_UNIQUE])))
        w_a, w_b = nsa[:, sk.NS_MEAN_WIDTH], nsb[:, sk.NS_MEAN_WIDTH]
        d_width = float(np.mean(np.abs(w_a - w_b) / np.maximum(np.maximum(w_a, w_b), 1.0)))
    else:
        d_nan = d_uni = d_width = 0.0
    return np.array(
        [
            (mean0(iou_a) + mean0(iou_b)) / 2, max(max0(iou_a), max0(iou_b)),
            mean0(cont_a),  # frac of A's numeric cols range-contained in B — subset signal
            mean0(cont_b),
            (mean0(ps_a) + mean0(ps_b)) / 2, max(max0(ps_a), max0(ps_b)),
            float(np.mean(iou_a > 0.8)) if len(iou_a) else 0.0,
            float(len(na_) / max(len(ca), 1)),
            d_nan, d_uni, d_width,
        ]
    )


def _content_features(store: SketchStore, t1: str, t2: str) -> np.ndarray:
    sa, sb = store.content_sig(t1), store.content_sig(t2)
    ra, rb = store.n_rows(t1), store.n_rows(t2)
    return np.array(
        [
            minhash.jaccard_estimate(sa, sb),
            minhash.containment_estimate(sa, sb, ra, rb),
            minhash.containment_estimate(sb, sa, rb, ra),
        ]
    )


def _cos(a: np.ndarray, b: np.ndarray) -> float:
    na, nb = np.linalg.norm(a), np.linalg.norm(b)
    if na < 1e-12 or nb < 1e-12:
        return 0.0
    return float(a @ b / (na * nb))


class PairFeaturizer:
    """Feature assembly with per-sketch toggles and an embedding cache.

    One instance per (ablation config); table embeddings are encoded
    once and cached across the pair list.
    """

    def __init__(
        self,
        store: SketchStore,
        encoder: SketchEncoder | None = None,
        use_minhash: bool = True,
        use_numerical: bool = True,
        use_content: bool = True,
        extra_names: list[str] | None = None,
    ):
        self.store = store
        self.use_minhash = use_minhash
        self.use_numerical = use_numerical
        self.use_content = use_content
        self.encoder = encoder
        # Named-column features for multi-label tasks: the cross-encoder's
        # attention can route a specific column (e.g. the FREQ dimension)
        # to a specific output logit; the fixed-length substitute is a
        # (presence, value-overlap) pair per label-relevant column name.
        self.extra_names = list(extra_names or [])
        self._emb: dict[str, tuple[np.ndarray, np.ndarray]] = {}

    def _embed(self, tid: str) -> tuple[np.ndarray, np.ndarray]:
        if tid not in self._emb:
            self._emb[tid] = self.encoder.encode_table(
                self.store.columns(tid),
                content_sig=self.store.content_sig(tid),
                description=self.store.descriptions.get(tid),
            )
        return self._emb[tid]

    def features(self, t1: str, t2: str) -> np.ndarray:
        ca, cb = self.store.columns(t1), self.store.columns(t2)
        base = _base_features(ca, cb, self.store, t1, t2)
        mh = _mh_features(ca, cb) if self.use_minhash else np.zeros(N_MH)
        num = _num_features(ca, cb) if self.use_numerical else np.zeros(N_NUM)
        content = _content_features(self.store, t1, t2) if self.use_content else np.zeros(N_CONTENT)
        if self.encoder is not None:
            ea, cols_a = self._embed(t1)
            eb, cols_b = self._embed(t2)
            tab_cos = _cos(ea, eb)
            if len(cols_a) and len(cols_b):
                an = cols_a / np.maximum(np.linalg.norm(cols_a, axis=1, keepdims=True), 1e-12)
                bn = cols_b / np.maximum(np.linalg.norm(cols_b, axis=1, keepdims=True), 1e-12)
                m = an @ bn.T
                col_best = (m.max(axis=1).mean() + m.max(axis=0).mean()) / 2
                col_max = m.max()
            else:
                col_best = col_max = 0.0
            enc = np.array([tab_cos, col_best, col_max])
        else:
            enc = np.zeros(N_ENC)
        named = []
        for name in self.extra_names:
            ra = ca[ca["col_name"] == name]
            rb = cb[cb["col_name"] == name]
            present = float(len(ra) > 0 and len(rb) > 0)
            jacc = 0.0
            if present and self.use_minhash:
                jacc = minhash.jaccard_estimate(
                    ra.iloc[0]["value_sig"], rb.iloc[0]["value_sig"]
                )
            named.extend([present, jacc])
        out = np.concatenate([base, mh, num, content, enc, named])
        assert out.shape == (FEATURE_DIM + 2 * len(self.extra_names),)
        return out

    def matrix(self, pairs: pd.DataFrame) -> np.ndarray:
        return np.vstack([self.features(r.table1, r.table2) for r in pairs.itertuples()])
