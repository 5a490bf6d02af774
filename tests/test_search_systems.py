"""Tests for embeddings, union baselines, evaluation, and the search harnesses."""
import numpy as np
import pandas as pd
import pytest

from repro.core.model import SketchEncoder
from repro.experiments import finetune, search as se
from repro.lakebench import registry
from repro.search import embed, embedjoin, evaluate, union_baselines as ub


@pytest.fixture(scope="module")
def union_lake_env(spark):
    tables, domains = se.build_union_lake("santos", scale=0.15, seed=0)
    from repro.core import sketches as sks
    from repro.core.features import SketchStore
    from repro.lake import format as lf

    cells, _ = lf.build_lake(spark, tables)
    col_sk, tab_sk = sks.sketches_to_pandas(
        sks.column_sketches(cells), sks.table_sketches(cells)
    )
    return tables, domains, SketchStore(col_sk, tab_sk)


class TestValueEmbedding:
    def test_numeric_identity_kept(self):
        a = embed.value_embedding(["123", "456"])
        b = embed.value_embedding(["123", "456"])
        c = embed.value_embedding(["789", "555"])
        np.testing.assert_array_equal(a, b)
        assert not np.allclose(a, c)

    def test_top100_cap(self):
        a = embed.value_embedding([f"v{i}" for i in range(100)])
        b = embed.value_embedding([f"v{i}" for i in range(100)] + ["extra"])
        np.testing.assert_array_equal(a, b)


class TestSearchEmbeddings:
    def test_column_embeddings_one_per_column(self, union_lake_env):
        tables, _, store = union_lake_env
        enc = SketchEncoder(hidden=64)
        pdf = embed.column_search_embeddings(store, tables, enc)
        assert len(pdf) == sum(len(t.columns) for t in tables.values())

    def test_blocks_unit_normalized(self, union_lake_env):
        tables, _, store = union_lake_env
        enc = SketchEncoder(hidden=64)
        pdf = embed.table_search_embeddings(store, tables, enc)
        norms = np.array([np.linalg.norm(e) for e in pdf["emb"]])
        # 3 unit blocks → ||emb|| ≈ sqrt(3) (centering makes it approximate)
        assert np.all(norms < 2.5) and np.median(norms) > 0.8

    def test_same_domain_tables_closer(self, union_lake_env):
        tables, domains, store = union_lake_env
        enc = SketchEncoder(hidden=64)
        pdf = embed.table_search_embeddings(store, tables, enc).set_index("table_id")
        tids = list(tables)
        q = tids[0]
        same = next(t for t in tids[1:] if domains[t] == domains[q])
        diff = next(t for t in tids[1:] if domains[t] != domains[q])
        cos = lambda a, b: a @ b / (np.linalg.norm(a) * np.linalg.norm(b))
        assert cos(pdf.loc[q, "emb"], pdf.loc[same, "emb"]) > cos(pdf.loc[q, "emb"], pdf.loc[diff, "emb"])

    def test_use_values_false_changes_dim(self, union_lake_env):
        tables, _, store = union_lake_env
        enc = SketchEncoder(hidden=64)
        with_v = embed.table_search_embeddings(store, tables, enc, use_values=True)
        without = embed.table_search_embeddings(store, tables, enc, use_values=False)
        assert len(with_v["emb"].iloc[0]) > len(without["emb"].iloc[0])


class TestEmbedJoin:
    def test_one_row_per_column(self):
        tables = {"a": pd.DataFrame({"x": ["u", "v"], "y": [1, 2]})}
        pdf = embedjoin.glove_column_embeddings(tables)
        assert len(pdf) == 2
        assert pdf["emb"].iloc[0].shape == (embedjoin.GLOVE_DIM,)


class TestUnionBaselines:
    def test_d3l_same_domain_higher(self, union_lake_env):
        tables, domains, store = union_lake_env
        tids = list(tables)
        q = tids[0]
        same = next(t for t in tids[1:] if domains[t] == domains[q])
        diff = next(t for t in tids[1:] if domains[t] != domains[q])
        assert ub.d3l_score(store, q, same) > ub.d3l_score(store, q, diff)

    def test_starmie_same_domain_higher(self, union_lake_env):
        tables, domains, _ = union_lake_env
        sm = ub.StarmieLike(tables)
        tids = list(tables)
        q = tids[0]
        same = next(t for t in tids[1:] if domains[t] == domains[q])
        diff = next(t for t in tids[1:] if domains[t] != domains[q])
        assert sm.score(q, same) > sm.score(q, diff)

    def test_rank_all_shape(self, union_lake_env):
        tables, _, store = union_lake_env
        tids = list(tables)[:6]
        res = ub.rank_all(lambda a, b: ub.d3l_score(store, a, b), tids[:2], tids, k=3)
        assert set(res["query_id"]) == set(tids[:2])
        assert res.groupby("query_id")["rank"].max().max() <= 3

    def test_header_overlap_score_bounds(self, union_lake_env):
        tables, _, _ = union_lake_env
        tids = list(tables)
        s = ub.header_overlap_score(tables, tids[0], tids[1])
        assert 0.0 <= s <= 1.0


class TestEvaluate:
    def test_perfect_retrieval(self):
        res = pd.DataFrame({"query_id": ["q"] * 2, "id": ["a", "b"], "rank": [1, 2]})
        m = evaluate.f1_at_k(res, {"q": {"a", "b"}}, k=2)
        assert m["precision"] == 1.0 and m["recall"] == 1.0 and m["f1"] == 1.0

    def test_half_precision(self):
        res = pd.DataFrame({"query_id": ["q"] * 2, "id": ["a", "x"], "rank": [1, 2]})
        m = evaluate.f1_at_k(res, {"q": {"a", "b"}}, k=2)
        assert m["precision"] == 0.5 and m["recall"] == 0.5

    def test_empty_gt_skipped(self):
        res = pd.DataFrame({"query_id": ["q"], "id": ["a"], "rank": [1]})
        m = evaluate.f1_at_k(res, {"q": set()}, k=1)
        assert m["n_queries"] == 0

    def test_missing_query_counts_zero(self):
        res = pd.DataFrame({"query_id": ["q1"], "id": ["a"], "rank": [1]})
        m = evaluate.f1_at_k(res, {"q1": {"a"}, "q2": {"b"}}, k=1)
        assert m["n_queries"] == 2
        assert m["recall"] == 0.5

    def test_k_truncates(self):
        res = pd.DataFrame({"query_id": ["q"] * 3, "id": ["x", "y", "a"], "rank": [1, 2, 3]})
        m = evaluate.f1_at_k(res, {"q": {"a"}}, k=2)
        assert m["recall"] == 0.0


class TestJoinSearchHarness:
    def test_ground_truth_symmetric_concept(self):
        tables, es, cc = se.build_wiki_join_lake(scale=0.1, seed=0)
        gt = se.join_ground_truth(es, cc, list(tables)[:5])
        for q, rel in gt.items():
            qt = q.split(":")[0]
            for r in rel:
                rt = r.split(":")[0]
                assert cc[rt] == cc[qt]
                inter = es[qt] & es[rt]
                union = es[qt] | es[rt]
                assert len(inter) / len(union) >= se.GT_JACCARD

    def test_conventions_change_rendering(self):
        assert se._render_label("Brzes Piase County 17", "lower") == "brzes piase county 17"
        assert se._render_label("Brzespiase County 17", "abbrev").startswith("Brze.")
        assert se._render_label("A B C", "dropword") == "A C"
        assert se._render_label("X Y", "identity") == "X Y"

    def test_join_search_end_to_end(self, spark):
        df = se.run_wiki_join_search(spark, scale=0.12, ks=(3,), n_queries=6)
        assert set(df["system"]) == {"tabsketchfm", "josie", "lshforest", "embedjoin"}
        assert (df["f1"] >= 0).all() and (df["f1"] <= 1).all()

    def test_union_search_end_to_end(self, spark):
        df = se.run_union_search(spark, which="santos", scale=0.12, ks=(3,))
        assert set(df["system"]) == {"tabsketchfm", "d3l", "starmie", "header_overlap"}
        assert (df["f1"] > 0).any()
