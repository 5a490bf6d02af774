"""Tests for the 8 LakeBench benchmark builders (§5) and the registry."""
import numpy as np
import pandas as pd
import pytest

from repro.lakebench import (
    base,
    ckan_subset,
    corpus,
    ecb_join,
    ecb_union,
    registry,
    spider_opendata,
    tus_santos,
    wiki_join,
    wiki_union,
)

SCALE = 0.12  # tiny builds for unit tests


@pytest.fixture(scope="module")
def benches():
    return {name: registry.build(name, scale=SCALE, seed=0) for name in registry.PAPER_ORDER}


class TestKB:
    def test_deterministic(self):
        kb1 = corpus.make_kb(seed=5)
        kb2 = corpus.make_kb(seed=5)
        q = list(kb1.concepts)[0]
        assert kb1.concepts[q].entities == kb2.concepts[q].entities

    def test_shared_schema_group(self):
        kb = corpus.make_kb(n_concepts=12, seed=0)
        qids = list(kb.concepts)
        schemas = {tuple(kb.concepts[q].properties) for q in qids[:6]}
        assert len(schemas) == 1  # first half shares one property schema

    def test_concept_token_signature(self):
        kb = corpus.make_kb(seed=0)
        c = list(kb.concepts.values())[0]
        labels = list(c.entities.values())
        sfx = c.suffixes[0]
        assert sum(sfx in l.lower() for l in labels) > len(labels) * 0.5

    def test_kb_table_generic_headers(self):
        kb = corpus.make_kb(seed=0)
        g = np.random.default_rng(0)
        t = corpus.kb_table(kb, list(kb.concepts)[0], "x", 30, g)
        assert list(t.df.columns) == [f"col{i}" for i in range(len(t.df.columns))]
        assert len(t.entity_ids) == len(t.df)


class TestCorpusGenerators:
    def test_ecb_series_constant_dims(self):
        g = np.random.default_rng(0)
        t = corpus.ecb_series_table({"FREQ": "M", "REF_AREA": "AT"}, 50, g)
        assert t["FREQ"].nunique() == 1 and t["REF_AREA"].nunique() == 1
        assert len(t) == 50

    def test_ecb_collapsed_varies(self):
        g = np.random.default_rng(0)
        t = corpus.ecb_collapsed_dataset(["FREQ", "SECTOR"], 200, g)
        assert t["FREQ"].nunique() > 1

    def test_opendata_monotone_id(self):
        g = np.random.default_rng(0)
        t = corpus.opendata_table(100, 4, g, start_id=500)
        assert (np.diff(t["record_id"]) > 0).all()
        assert t["record_id"].iloc[0] == 500

    def test_opendata_denormalized_categories(self):
        g = np.random.default_rng(0)
        t = corpus.opendata_table(200, 4, g)
        assert t["category_0"].nunique() < 15

    def test_spider_fk_join_nonempty(self):
        g = np.random.default_rng(0)
        db = corpus.spider_database("d0", g)
        t1, c1, t2, c2 = db.joins[0]
        assert set(db.tables[t2][c2]) & set(db.tables[t1][c1])

    def test_pretrain_corpus(self, spark):
        tables, desc = corpus.pretrain_corpus(spark, n_tables=12, seed=1)
        assert len(tables) >= 12
        assert all(isinstance(t, pd.DataFrame) for t in tables.values())
        assert set(desc) <= set(tables) or set(tables) >= set(desc)


class TestSplits:
    def test_assign_splits_partition(self):
        pairs = pd.DataFrame({"table1": [f"a{i}" for i in range(50)], "table2": "b", "label": 1})
        out = base.assign_splits(pairs, seed=0)
        assert set(out["split"]) == {"train", "valid", "test"}
        assert len(out) == 50

    def test_split_accessor(self):
        pairs = pd.DataFrame({"table1": list("abcdefghij"), "table2": "x", "label": 0})
        b = base.Benchmark("t", base.TASK_BINARY, {}, base.assign_splits(pairs, 0))
        total = sum(len(b.split(s)) for s in ("train", "valid", "test"))
        assert total == 10


@pytest.mark.parametrize("name", registry.PAPER_ORDER)
class TestAllBenchmarks:
    def test_pairs_reference_existing_tables(self, benches, name):
        b = benches[name]
        refs = set(b.pairs["table1"]) | set(b.pairs["table2"])
        assert refs <= set(b.tables)

    def test_all_splits_present(self, benches, name):
        assert set(benches[name].pairs["split"]) == {"train", "valid", "test"}

    def test_deterministic(self, name):
        b1 = registry.build(name, scale=0.05, seed=3)
        b2 = registry.build(name, scale=0.05, seed=3)
        pd.testing.assert_frame_equal(b1.pairs, b2.pairs)
        assert set(b1.tables) == set(b2.tables)

    def test_task_type_valid(self, benches, name):
        assert benches[name].task in (base.TASK_BINARY, base.TASK_REGRESSION, base.TASK_MULTILABEL)


class TestTusSantos:
    def test_binary_balanced(self, benches):
        b = benches["tus_santos"]
        frac_pos = b.pairs["label"].mean()
        assert 0.3 < frac_pos < 0.7

    def test_positive_pairs_same_domain(self, benches):
        b = benches["tus_santos"]
        for _, r in b.pairs[b.pairs.label == 1].iterrows():
            assert r.table1.split("_")[1] == r.table2.split("_")[1]

    def test_headers_informative(self, benches):
        b = benches["tus_santos"]
        r = b.pairs[b.pairs.label == 1].iloc[0]
        h1 = set(b.tables[r.table1].columns)
        h2 = set(b.tables[r.table2].columns)
        assert h1 & h2  # same-domain tables share header vocabulary


class TestWikiUnion:
    def test_generic_headers(self, benches):
        b = benches["wiki_union"]
        for t in list(b.tables.values())[:5]:
            assert all(c.startswith("col") for c in t.columns)

    def test_has_both_negative_kinds(self):
        b = registry.build("wiki_union", scale=0.3, seed=0)
        negs = b.pairs[b.pairs.label == 0]
        cross_concept = sum(
            r.table1.split("_")[1] != r.table2.split("_")[1] for _, r in negs.iterrows()
        )
        same_concept = len(negs) - cross_concept
        assert cross_concept > 0 and same_concept > 0

    def test_positive_same_concept(self, benches):
        b = benches["wiki_union"]
        for _, r in b.pairs[b.pairs.label == 1].iterrows():
            assert r.table1.split("_")[1] == r.table2.split("_")[1]


class TestEcbUnion:
    def test_labels_in_range(self, benches):
        lab = benches["ecb_union"].pairs["label"]
        assert lab.min() >= 1 and lab.max() <= ecb_union.N_DIMS

    def test_label_matches_dim_difference(self, benches):
        b = benches["ecb_union"]
        r = b.pairs.iloc[0]
        t1, t2 = b.tables[r.table1], b.tables[r.table2]
        dims = [c for c in t1.columns if c in corpus.ECB_DIMENSIONS]
        diff = sum(t1[d].iloc[0] != t2[d].iloc[0] for d in dims)
        assert diff == r.label


class TestWikiJoin:
    def test_jaccard_labels_bounded(self, benches):
        lab = benches["wiki_jaccard"].pairs["label"]
        assert (lab >= 0).all() and (lab <= 1).all()

    def test_label_spread(self, benches):
        lab = benches["wiki_jaccard"].pairs["label"]
        assert lab.std() > 0.1

    def test_containment_ge_jaccard_for_same_sets(self):
        # containment (|∩|/max) ≥ jaccard (|∩|/|∪|) always
        bj = registry.build("wiki_jaccard", scale=0.05, seed=9)
        bc = registry.build("wiki_containment", scale=0.05, seed=9)
        # builders share seed → same sets; compare labels pairwise
        assert (bc.pairs["label"].to_numpy() >= bj.pairs["label"].to_numpy() - 1e-12).all()


class TestSpiderOpenData:
    def test_negatives_disjoint_join_values(self, benches):
        b = benches["spider_opendata"]
        sod_negs = b.pairs[(b.pairs.label == 0) & b.pairs.table1.str.startswith("sod")]
        for _, r in sod_negs.head(5).iterrows():
            t1, t2 = b.tables[r.table1], b.tables[r.table2]
            shared = set(t1.columns) & set(t2.columns)
            jc = next(c for c in shared if c in ("record_id", "code"))
            assert not set(t1[jc]) & set(t2[jc])

    def test_positives_share_join_values(self, benches):
        b = benches["spider_opendata"]
        sod_pos = b.pairs[(b.pairs.label == 1) & b.pairs.table1.str.startswith("sod")]
        r = sod_pos.iloc[0]
        t1, t2 = b.tables[r.table1], b.tables[r.table2]
        shared = set(t1.columns) & set(t2.columns)
        assert any(set(t1[c]) & set(t2[c]) for c in shared)


class TestEcbJoin:
    def test_multilabel_shape(self, benches):
        b = benches["ecb_join"]
        assert b.task == base.TASK_MULTILABEL
        assert len(b.label_names) == len(corpus.ECB_DIM_NAMES) + 1
        for lab in b.pairs["label"]:
            assert len(lab) == len(b.label_names)

    def test_labels_match_actual_joins(self, benches):
        b = benches["ecb_join"]
        r = b.pairs.iloc[0]
        t1, t2 = b.tables[r.table1], b.tables[r.table2]
        shared = [c for c in t1.columns if c in t2.columns and c in corpus.ECB_DIMENSIONS]
        for d in shared:
            expected = 1 if set(t1[d]) & set(t2[d]) else 0
            assert r.label[ecb_join.LABELS.index(d)] == expected

    def test_oracle_join_emptiness(self, spark, benches):
        # DuckDB oracle check of the per-dimension join-emptiness GT.
        import duckdb

        b = benches["ecb_join"]
        r = b.pairs.iloc[0]
        t1, t2 = b.tables[r.table1], b.tables[r.table2]
        shared = [c for c in t1.columns if c in t2.columns and c in corpus.ECB_DIMENSIONS]
        con = duckdb.connect()
        con.register("t1", t1)
        con.register("t2", t2)
        for d in shared:
            n = con.execute(
                f'SELECT count(*) FROM t1 JOIN t2 ON t1."{d}" = t2."{d}"'
            ).fetchone()[0]
            assert (n > 0) == bool(r.label[ecb_join.LABELS.index(d)])
        con.close()


class TestCkanSubset:
    def test_schemas_identical(self, benches):
        b = benches["ckan_subset"]
        for _, r in b.pairs.head(6).iterrows():
            assert list(b.tables[r.table1].columns) == list(b.tables[r.table2].columns)

    def test_positive_rows_contained(self, benches):
        b = benches["ckan_subset"]
        r = b.pairs[b.pairs.label == 1].iloc[0]
        sub, sup = b.tables[r.table1], b.tables[r.table2]
        assert set(sub["record_id"]) <= set(sup["record_id"])

    def test_negative_rows_disjoint(self, benches):
        b = benches["ckan_subset"]
        r = b.pairs[b.pairs.label == 0].iloc[0]
        sub, neg = b.tables[r.table1], b.tables[r.table2]
        assert not set(sub["record_id"]) & set(neg["record_id"])

    def test_partner_sizes_equal(self, benches):
        # positive and negative partners have the same number of rows (Fig. 6)
        b = benches["ckan_subset"]
        pos = b.pairs[b.pairs.label == 1].set_index("table1")["table2"]
        neg = b.pairs[b.pairs.label == 0].set_index("table1")["table2"]
        for si in list(pos.index)[:5]:
            if si in neg.index:
                assert len(b.tables[pos[si]]) == len(b.tables[neg[si]])


class TestRegistry:
    def test_unknown_raises(self):
        with pytest.raises(KeyError):
            registry.build("nope")

    def test_table1_stats_row(self, spark):
        b = registry.build("ecb_union", scale=0.03, seed=0)
        row = registry.table1_stats(spark, b)
        assert row["n_tables"] == len(b.tables)
        assert row["avg_cols"] > 10  # 12 dims + date + value
        total_pct = sum(row[f"pct_{t}"] for t in ("string", "int", "float", "date"))
        assert abs(total_pct - 100) < 0.5
