"""Tests for the §4 pretraining substitute (repro.core.pretrain)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import pretrain as pt
from repro.core import sketches as sks
from repro.lake import format as lf
from repro.lakebench import corpus


@pytest.fixture(scope="module")
def corpus_sketches(spark):
    tables, desc = corpus.pretrain_corpus(spark, n_tables=15, seed=42)
    cells, _ = lf.build_lake(spark, tables, desc)
    col_sk, tab_sk = sks.sketches_to_pandas(
        sks.column_sketches(cells), sks.table_sketches(cells)
    )
    return col_sk, tab_sk, desc


class TestVocab:
    def test_vocab_from_headers(self, corpus_sketches):
        col_sk, _, _ = corpus_sketches
        vocab = pt.build_vocab(col_sk, size=50)
        assert 0 < len(vocab) <= 50
        assert all(v == v.lower() for v in vocab)

    def test_vocab_frequency_ordered(self, corpus_sketches):
        col_sk, _, _ = corpus_sketches
        vocab = pt.build_vocab(col_sk, size=5)
        # 'col' headers from KB tables and ECB dims dominate the corpus
        assert len(vocab) == 5


class TestPretrain:
    @pytest.fixture(scope="class")
    def pre(self, corpus_sketches):
        col_sk, tab_sk, desc = corpus_sketches
        return pt.pretrain(col_sk, tab_sk, desc, epochs=15, n_aug=2)

    def test_scaler_fit(self, pre, corpus_sketches):
        col_sk, _, _ = corpus_sketches
        rows = np.vstack(col_sk["num_sketch"].to_numpy())
        np.testing.assert_allclose(pre.scaler.mean, rows.mean(axis=0))

    def test_mlm_loss_below_chance(self, pre):
        # The central §4 claim at our scale: sketch embeddings predict
        # masked column-name tokens far better than chance.
        assert pre.history["final_train_loss"] < pre.history["chance_loss"] * 0.5

    def test_mlm_loss_decreases(self, pre):
        h = pre.history["train_loss"]
        assert h[-1] < h[0]

    def test_examples_generated(self, pre):
        assert pre.history["n_examples"] > 50

    def test_encoder_uses_scaler(self, pre):
        enc = pre.encoder()
        assert enc.scaler is pre.scaler

    def test_encoder_toggles_forwarded(self, pre):
        enc = pre.encoder(use_minhash=False)
        assert enc.use_minhash is False and enc.use_numerical is True

    def test_empty_corpus(self):
        empty = pd.DataFrame(
            columns=["table_id", "col_idx", "col_name", "col_type", "num_sketch", "value_sig", "token_sig", "n_rows", "n_distinct"]
        )
        empty["num_sketch"] = empty["num_sketch"].astype(object)
        # no columns → no examples → head stays None
        with pytest.raises(ValueError):
            pt.pretrain(empty, empty.iloc[:0], epochs=1)
