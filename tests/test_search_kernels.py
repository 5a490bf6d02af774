"""Tests for the Spark search kernels: NN-join, JOSIE, LSHForest."""
import numpy as np
import pandas as pd
import pytest

from repro.core import sketches as sks
from repro.lake import format as lf
from repro.search import josie, lshforest, nnjoin


@pytest.fixture(scope="module")
def join_lake(spark):
    g = np.random.default_rng(0)
    shared = [f"city{i}" for i in range(60)]
    tables = {
        "q": pd.DataFrame({"name": shared[:40], "x": g.random(40)}),
        "hi": pd.DataFrame({"name": shared[10:50], "y": g.random(40)}),  # 30 overlap
        "lo": pd.DataFrame({"name": shared[35:60] + [f"z{i}" for i in range(15)], "y": g.random(40)}),  # 5 overlap
        "none": pd.DataFrame({"name": [f"w{i}" for i in range(40)], "y": g.random(40)}),
    }
    cells, _ = lf.build_lake(spark, tables)
    cells.cache()
    return tables, cells


class TestTopkCosine:
    def _mk(self, spark, vecs):
        pdf = pd.DataFrame({"id": list(vecs), "emb": [np.array(v, float) for v in vecs.values()]})
        return nnjoin.to_spark_embeddings(spark, pdf, ["id"])

    def test_ranking_matches_numpy(self, spark):
        vecs = {"q": [1, 0, 0], "a": [0.9, 0.1, 0], "b": [0.5, 0.5, 0], "c": [0, 1, 0]}
        df = self._mk(spark, vecs)
        res = nnjoin.topk_cosine(df.filter(df.id == "q"), df, k=3).toPandas()
        assert list(res.sort_values("rank")["id"]) == ["a", "b", "c"]

    def test_excludes_self(self, spark):
        vecs = {"q": [1.0, 0.0], "a": [1.0, 0.0]}
        df = self._mk(spark, vecs)
        res = nnjoin.topk_cosine(df.filter(df.id == "q"), df, k=5).toPandas()
        assert "q" not in set(res["id"])

    def test_include_self_option(self, spark):
        vecs = {"q": [1.0, 0.0], "a": [1.0, 0.0]}
        df = self._mk(spark, vecs)
        res = nnjoin.topk_cosine(df.filter(df.id == "q"), df, k=5, exclude_self=False).toPandas()
        assert "q" in set(res["id"])

    def test_k_respected(self, spark):
        vecs = {f"v{i}": list(np.eye(5)[i % 5]) for i in range(10)}
        df = self._mk(spark, vecs)
        res = nnjoin.topk_cosine(df.filter(df.id == "v0"), df, k=3).toPandas()
        assert len(res) == 3

    def test_scores_in_range(self, spark):
        g = np.random.default_rng(1)
        vecs = {f"v{i}": g.normal(0, 1, 8).tolist() for i in range(12)}
        df = self._mk(spark, vecs)
        res = nnjoin.topk_cosine(df, df, k=4).toPandas()
        assert (res["score"] <= 1.0 + 1e-9).all() and (res["score"] >= -1.0 - 1e-9).all()

    def test_zero_vector_safe(self, spark):
        vecs = {"q": [0.0, 0.0], "a": [1.0, 0.0]}
        df = self._mk(spark, vecs)
        res = nnjoin.topk_cosine(df.filter(df.id == "q"), df, k=2).toPandas()
        assert np.isfinite(res["score"]).all()


class TestJosie:
    def test_ordering_by_overlap(self, spark, join_lake):
        _, cells = join_lake
        res = josie.topk_containment(cells, ["q:0"], k=3).toPandas()
        ids = list(res.sort_values("rank")["id"])
        assert ids[0] == "hi:0"
        assert ids[1] == "lo:0"

    def test_no_overlap_not_returned(self, spark, join_lake):
        _, cells = join_lake
        res = josie.topk_containment(cells, ["q:0"], k=10).toPandas()
        assert "none:0" not in set(res["id"])

    def test_oracle_overlap_counts(self, spark, join_lake):
        from repro.oracle import assert_equivalent
        from pyspark.sql import functions as F

        _, cells = join_lake
        res = (
            josie.topk_containment(cells, ["q:0"], k=10)
            .select("query_id", "id", F.col("overlap").cast("long").alias("overlap"))
        )
        assert_equivalent(
            res,
            """
            WITH post AS (
              SELECT DISTINCT table_id, col_idx, value FROM cells WHERE value IS NOT NULL
            ), q AS (
              SELECT value FROM post WHERE table_id = 'q' AND col_idx = 0
            )
            SELECT 'q:0' AS query_id,
                   table_id || ':' || col_idx AS id,
                   count(*) AS overlap
            FROM post JOIN q USING (value)
            WHERE table_id <> 'q'
            GROUP BY 2
            """,
            cells=cells.toPandas(),
        )

    def test_containment_bounded(self, spark, join_lake):
        _, cells = join_lake
        res = josie.topk_containment(cells, ["q:0"], k=10).toPandas()
        assert (res["containment"] <= 1.0).all() and (res["containment"] > 0).all()


class TestLshForest:
    def test_finds_high_jaccard(self, spark, join_lake):
        _, cells = join_lake
        col_sk = sks.column_sketches(cells)
        res = lshforest.topk_lsh(col_sk, ["q:0"], k=5).toPandas()
        assert "hi:0" in set(res["id"])
        top = res.sort_values("rank").iloc[0]
        assert top["id"] == "hi:0"

    def test_scores_are_jaccard_estimates(self, spark, join_lake):
        _, cells = join_lake
        col_sk = sks.column_sketches(cells)
        res = lshforest.topk_lsh(col_sk, ["q:0"], k=5).toPandas()
        hi = res[res["id"] == "hi:0"]["score"].iloc[0]
        # true J(q, hi) = 30 / 50 = 0.6
        assert 0.35 < hi < 0.85

    def test_disjoint_not_candidate(self, spark, join_lake):
        _, cells = join_lake
        col_sk = sks.column_sketches(cells)
        res = lshforest.topk_lsh(col_sk, ["q:0"], k=10).toPandas()
        assert "none:0" not in set(res["id"])


class TestBandPrefilter:
    def test_candidates_contain_similar(self, spark, join_lake):
        _, cells = join_lake
        col_sk = sks.column_sketches(cells)
        from pyspark.sql import functions as F

        sigs = col_sk.select(
            F.concat_ws(":", "table_id", "col_idx").alias("id"), F.col("value_sig").alias("sig")
        )
        cand = nnjoin.band_prefilter(sigs.filter(F.col("id") == "q:0"), sigs, n_bands=32).toPandas()
        assert "hi:0" in set(cand["id"])
