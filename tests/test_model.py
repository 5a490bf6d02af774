"""Tests for the SketchEncoder (Fig. 1 architecture substitute)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import minhash, sketches
from repro.core.model import COL_TYPE_IDS, Scaler, SketchEncoder


def _col_row(name="price", idx=0, ctype="float", values=None, tokens=None, nums=None):
    values = values if values is not None else [f"v{i}" for i in range(20)]
    ns = np.zeros(sketches.NUM_SKETCH_DIM)
    if nums is not None:
        ns = sketches.numerical_sketch(pd.Series(nums), pd.Series(nums), ctype, len(nums))
    vsig = minhash.minhash_signature(values)
    tsig = (
        minhash.minhash_signature(tokens)
        if tokens is not None
        else np.zeros(minhash.DEFAULT_NUM_PERM, dtype=np.uint64)
    )
    return {
        "col_name": name,
        "col_idx": idx,
        "col_type": ctype,
        "num_sketch": ns,
        "value_sig": vsig,
        "token_sig": tsig,
    }


def _table(cols):
    return pd.DataFrame(cols)


class TestScaler:
    def test_identity_default(self):
        s = Scaler()
        x = np.arange(sketches.NUM_SKETCH_DIM, dtype=float)
        np.testing.assert_allclose(s.transform(x), np.clip(x, -5, 5))

    def test_fit_standardizes(self):
        rows = np.random.default_rng(0).normal(10, 3, (500, sketches.NUM_SKETCH_DIM))
        s = Scaler.fit(rows)
        z = np.vstack([s.transform(r) for r in rows])
        assert abs(z.mean()) < 0.05
        assert abs(z.std() - 1) < 0.1

    def test_clip(self):
        s = Scaler(mean=np.zeros(13), std=np.ones(13))
        assert s.transform(np.full(13, 1e9)).max() == 5.0

    def test_zero_std_safe(self):
        s = Scaler.fit(np.ones((10, 13)))
        assert np.isfinite(s.transform(np.ones(13))).all()


class TestEncoderDeterminism:
    def test_same_seed_same_weights(self):
        a, b = SketchEncoder(seed=3), SketchEncoder(seed=3)
        np.testing.assert_array_equal(a.w_num, b.w_num)

    def test_different_seed_different_weights(self):
        assert not np.array_equal(SketchEncoder(seed=0).w_num, SketchEncoder(seed=1).w_num)

    def test_encode_deterministic(self):
        t = _table([_col_row()])
        e1, c1 = SketchEncoder(seed=0).encode_table(t)
        e2, c2 = SketchEncoder(seed=0).encode_table(t)
        np.testing.assert_array_equal(e1, e2)
        np.testing.assert_array_equal(c1, c2)


class TestMinhashEmbedding:
    def test_similarity_tracks_jaccard(self):
        enc = SketchEncoder(hidden=256)
        shared = [f"s{i}" for i in range(80)]
        a = minhash.minhash_signature(shared + [f"a{i}" for i in range(20)], num_perm=128)
        b = minhash.minhash_signature(shared + [f"b{i}" for i in range(20)], num_perm=128)
        c = minhash.minhash_signature([f"c{i}" for i in range(100)], num_perm=128)
        ea, eb, ec = (enc.minhash_embedding(s, salt=1) for s in (a, b, c))
        sim_ab = ea @ eb / (np.linalg.norm(ea) * np.linalg.norm(eb))
        sim_ac = ea @ ec / (np.linalg.norm(ea) * np.linalg.norm(ec))
        assert sim_ab > sim_ac + 0.2

    def test_empty_sig_zero(self):
        enc = SketchEncoder()
        z = enc.minhash_embedding(np.zeros(64, dtype=np.uint64), salt=1)
        assert np.all(z == 0)

    def test_salt_decorrelates(self):
        enc = SketchEncoder()
        s = minhash.minhash_signature([f"x{i}" for i in range(50)])
        a = enc.minhash_embedding(s, salt=1)
        b = enc.minhash_embedding(s, salt=2)
        cos = a @ b / (np.linalg.norm(a) * np.linalg.norm(b))
        assert abs(cos) < 0.3


class TestColumnHidden:
    def test_type_embedding_distinguishes(self):
        enc = SketchEncoder()
        r_f = pd.Series(_col_row(ctype="float"))
        r_s = pd.Series({**_col_row(ctype="float"), "col_type": "string"})
        assert not np.allclose(enc.column_hidden(r_f), enc.column_hidden(r_s))

    def test_position_embedding_distinguishes(self):
        enc = SketchEncoder()
        assert not np.allclose(
            enc.column_hidden(pd.Series(_col_row(idx=0))),
            enc.column_hidden(pd.Series(_col_row(idx=1))),
        )

    def test_minhash_toggle(self):
        on = SketchEncoder(use_minhash=True)
        off = SketchEncoder(use_minhash=False)
        r = pd.Series(_col_row())
        assert not np.allclose(on.column_hidden(r), off.column_hidden(r))

    def test_numerical_toggle(self):
        on = SketchEncoder(use_numerical=True)
        off = SketchEncoder(use_numerical=False)
        r = pd.Series(_col_row(nums=np.arange(20.0)))
        assert not np.allclose(on.column_hidden(r), off.column_hidden(r))

    def test_all_types_have_embeddings(self):
        enc = SketchEncoder()
        for t in COL_TYPE_IDS:
            h = enc.column_hidden(pd.Series({**_col_row(), "col_type": t}))
            assert np.isfinite(h).all()


class TestEncodeTable:
    def test_shapes(self):
        enc = SketchEncoder(hidden=64)
        t = _table([_col_row(idx=0), _col_row(name="city", idx=1, ctype="string")])
        emb, cols = enc.encode_table(t)
        assert emb.shape == (64,)
        assert cols.shape == (2, 64)

    def test_empty_table(self):
        enc = SketchEncoder(hidden=32)
        emb, cols = enc.encode_table(_table([]).reindex(columns=list(_col_row().keys())))
        assert emb.shape == (32,)
        assert cols.shape == (0, 32)

    def test_mask_col_changes_embedding(self):
        enc = SketchEncoder()
        t = _table([_col_row(idx=0), _col_row(name="city", idx=1, ctype="string")])
        e1, _ = enc.encode_table(t)
        e2, _ = enc.encode_table(t, mask_col_idx=1)
        assert not np.allclose(e1, e2)

    def test_description_changes_embedding(self):
        enc = SketchEncoder()
        t = _table([_col_row()])
        e1, _ = enc.encode_table(t, description="residential property prices")
        e2, _ = enc.encode_table(t, description=None)
        assert not np.allclose(e1, e2)

    def test_content_snapshot_toggle(self):
        sig = minhash.minhash_signature([f"row{i}" for i in range(10)])
        t = _table([_col_row()])
        e_on, _ = SketchEncoder(use_content=True).encode_table(t, content_sig=sig)
        e_off, _ = SketchEncoder(use_content=False).encode_table(t, content_sig=sig)
        assert not np.allclose(e_on, e_off)

    def test_attention_contextualizes(self):
        # The same column embeds differently depending on its neighbours.
        enc = SketchEncoder()
        shared = _col_row(name="price", idx=0)
        t1 = _table([shared, _col_row(name="city", idx=1, ctype="string")])
        t2 = _table([shared, _col_row(name="building age", idx=1, ctype="int", nums=np.arange(20.0))])
        _, c1 = enc.encode_table(t1)
        _, c2 = enc.encode_table(t2)
        assert not np.allclose(c1[0], c2[0])

    def test_similar_tables_closer_than_dissimilar(self):
        enc = SketchEncoder(hidden=256)
        vals = [f"muni{i}" for i in range(60)]
        a = _table([_col_row(name="col0", idx=0, ctype="string", values=vals[:40], tokens=vals[:40])])
        b = _table([_col_row(name="col0", idx=0, ctype="string", values=vals[20:], tokens=vals[20:])])
        c = _table([_col_row(name="col0", idx=0, ctype="string", values=[f"x{i}" for i in range(40)])])
        ea, _ = enc.encode_table(a)
        eb, _ = enc.encode_table(b)
        ec, _ = enc.encode_table(c)
        cos = lambda u, v: u @ v / (np.linalg.norm(u) * np.linalg.norm(v))
        assert cos(ea, eb) > cos(ea, ec)
