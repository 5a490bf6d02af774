"""Search experiments (§6.3): join search, union search, transfer.

The paper's Figs. 8–13 evaluate F1@k of finetuned-TabSketchFM
embeddings against join-search systems (JOSIE, LSHForest, EmbedJoin)
and union-search systems (D3L, SANTOS, Starmie), plus transfer of cross
encoders across lakes/tasks. Figures are out of scope; these harnesses
produce the same quantities as tables at fixed k.

**Wiki Join search lake.** KB tables with two paper-faithful hazards:
(a) numeric property columns are rounded to integers in overlapping
ranges, so *cross-concept value overlap exists where a join is not
sensible* (the paper's Age-vs-marks example) — exact-overlap systems
rank such columns; and (b) entity labels appear under surface variants
(abbreviations, case — §2's fuzzy-join motivation, and the ambiguous-
label knob of the Fig. 3 generator), so exact-overlap systems
*underestimate* true entity joins while token/embedding systems do not.
Ground truth is relevance by shared concept annotation + entity-id
overlap, exactly the cell-entity-mapping recipe of §6.3.1.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core import sketches as sks
from ..core.features import PairFeaturizer, SketchStore
from ..core.mlp import MLP, TASK_REGRESSION
from ..lake import format as lf
from ..lakebench import corpus, registry
from ..lakebench.tus_santos import _DOMAINS, _seed_table
from ..search import embed, embedjoin, evaluate, josie, lshforest, nnjoin, union_baselines
from . import finetune


CONVENTIONS = ("identity", "lower", "abbrev", "dropword")


def _render_label(label: str, convention: str) -> str:
    """Apply a data source's rendering convention to an entity label.

    Real portals render the same entity differently (casing,
    abbreviations, dropped qualifiers — §2's fuzzy-join motivation), so
    conventions are per *table*: exact-overlap systems see zero overlap
    across differently-conventioned sources, while token/semantic
    representations survive.
    """
    parts = label.split()
    if convention == "lower":
        return label.lower()
    if convention == "abbrev" and len(parts[0]) > 4:
        return " ".join([parts[0][:4] + "."] + parts[1:])
    if convention == "dropword" and len(parts) >= 3:
        return " ".join(parts[:1] + parts[2:])
    return label


GT_JACCARD = 0.1  # relevance threshold on entity-annotation Jaccard


def build_wiki_join_lake(scale: float = 1.0, seed: int = 0):
    """Lake + ground truth for Wiki Join search.

    Each concept's entity pool is split into 3 disjoint subpools and a
    table samples entities from one subpool: same-subpool table pairs
    have substantial entity overlap (relevant), cross-subpool same-
    concept pairs look alike (same concept, same value-token
    distribution) but share few entities — the distractors that
    concept-similarity-only systems over-retrieve.

    Returns (tables, entity_sets, concepts): entity_sets maps table_id
    to the set of entity ids in col0 (the CE mapping ground truth).
    """
    g = np.random.default_rng(seed)
    kb = corpus.make_kb(n_concepts=10, entities_per_concept=750, seed=seed + 300)
    qids = list(kb.concepts)
    n_tables = max(10, int(150 * scale))
    tables: dict[str, pd.DataFrame] = {}
    entity_sets: dict[str, set] = {}
    concepts: dict[str, str] = {}
    for i in range(n_tables):
        qid = qids[int(g.integers(len(qids)))]
        pool = list(kb.concepts[qid].entities)
        sub = int(g.integers(3))
        subpool = pool[sub * 250 : (sub + 1) * 250]
        n_rows = int(g.integers(40, 120))
        ids = [subpool[j] for j in g.choice(len(subpool), size=min(n_rows, len(subpool)), replace=False)]
        t = corpus.kb_table(kb, qid, f"wjs_{i}", 0, g, entity_ids=ids)
        df = t.df.copy()
        convention = CONVENTIONS[int(g.integers(len(CONVENTIONS)))]
        df["col0"] = [_render_label(l, convention) for l in df["col0"]]
        for c in df.columns[1:]:
            df[c] = np.round(df[c]).astype(int) % 997  # overlapping int ranges
        tables[t.table_id] = df
        entity_sets[t.table_id] = set(t.entity_ids)
        concepts[t.table_id] = qid
    return tables, entity_sets, concepts


def join_ground_truth(entity_sets, concepts, query_tables) -> dict[str, set]:
    """query column id → set of sensible joinable column ids: same concept
    annotation + entity-annotation Jaccard ≥ GT_JACCARD (§6.3.1)."""
    gt = {}
    for q in query_tables:
        rel = set()
        for t in entity_sets:
            if t == q or concepts[t] != concepts[q]:
                continue
            inter = len(entity_sets[t] & entity_sets[q])
            union = len(entity_sets[t] | entity_sets[q])
            if union and inter / union >= GT_JACCARD:
                rel.add(f"{t}:0")
        gt[f"{q}:0"] = rel
    return gt


def run_wiki_join_search(
    spark: SparkSession,
    scale: float = 1.0,
    seed: int = 0,
    ks: tuple[int, ...] = (5, 10, 20),
    n_queries: int | None = None,
    pre=None,
) -> pd.DataFrame:
    """Fig.-8-as-a-table: F1@k per join-search system."""
    tables, entity_sets, concepts = build_wiki_join_lake(scale, seed)
    g = np.random.default_rng(seed + 1)
    nq = n_queries or max(5, int(40 * scale))
    query_tables = list(g.choice(list(tables), size=min(nq, len(tables)), replace=False))
    gt = join_ground_truth(entity_sets, concepts, query_tables)
    query_ids = list(gt)

    cells, _ = lf.build_lake(spark, tables)
    cells.cache()
    col_sk_spark = sks.column_sketches(cells)
    col_sk_spark.cache()
    col_sk, tab_sk = sks.sketches_to_pandas(col_sk_spark, sks.table_sketches(cells))
    store = SketchStore(col_sk, tab_sk)

    results = {}
    # --- TabSketchFM embeddings + Spark NN join
    enc = (pre.encoder() if pre is not None else finetune.PretrainedTabSketchFM(
        scaler=_corpus_scaler(col_sk), vocab=[], head=None).encoder())
    emb_pdf = embed.column_search_embeddings(store, tables, enc)
    emb_pdf["id"] = emb_pdf["table_id"] + ":" + emb_pdf["col_idx"].astype(str)
    emb_df = nnjoin.to_spark_embeddings(spark, emb_pdf, ["id"])
    q_df = emb_df.filter(emb_df.id.isin(query_ids))
    results["tabsketchfm"] = nnjoin.topk_cosine(q_df, emb_df, k=max(ks)).toPandas()
    # --- JOSIE (exact containment)
    results["josie"] = josie.topk_containment(cells, query_ids, k=max(ks)).toPandas()
    # --- LSHForest (MinHash banding)
    results["lshforest"] = lshforest.topk_lsh(col_sk_spark, query_ids, k=max(ks)).toPandas()
    # --- EmbedJoin (Glove-like)
    ej = embedjoin.glove_column_embeddings(tables)
    ej["id"] = ej["table_id"] + ":" + ej["col_idx"].astype(str)
    ej_df = nnjoin.to_spark_embeddings(spark, ej, ["id"])
    results["embedjoin"] = nnjoin.topk_cosine(
        ej_df.filter(ej_df.id.isin(query_ids)), ej_df, k=max(ks)
    ).toPandas()

    rows = []
    for system, res in results.items():
        # restrict to cross-table candidates (self-table columns are trivial)
        res = res[res["id"].str.split(":").str[0] != res["query_id"].str.split(":").str[0]]
        res = res.sort_values(["query_id", "rank"])
        res["rank"] = res.groupby("query_id").cumcount() + 1
        for k in ks:
            m = evaluate.f1_at_k(res, gt, k)
            rows.append({"system": system, **m})
    cells.unpersist()
    col_sk_spark.unpersist()
    return pd.DataFrame(rows)


def _corpus_scaler(col_sk: pd.DataFrame):
    from ..core.model import Scaler

    return Scaler.fit(np.vstack(col_sk["num_sketch"].to_numpy()))


def build_union_lake(which: str, scale: float = 1.0, seed: int = 0):
    """TUS-like or SANTOS-like union-search lake: domains → derived tables.

    ``which='santos'`` preserves the key (first) column in every derived
    table; ``which='tus'`` samples arbitrary column subsets.
    """
    g = np.random.default_rng(seed)
    per_seed = max(4, int(22 * scale))
    tables: dict[str, pd.DataFrame] = {}
    domains: dict[str, int] = {}
    generic = ["name", "type", "value", "total", "date", "count", "id", "status"]
    for di in range(len(_DOMAINS)):
        base = _seed_table(di, int(g.integers(120, 240)), g)
        # Open-data headers are frequently generic; rename ~60% of the
        # seed's columns (consistently for all its derived tables) to a
        # shared generic vocabulary so cross-domain header collisions
        # exist and header overlap alone cannot solve the search.
        renames = {
            c: generic[(di + j) % len(generic)]
            for j, c in enumerate(base.columns)
            if g.random() < 0.6
        }
        base = base.rename(columns=renames)
        for k in range(per_seed):
            rows = np.sort(
                g.choice(len(base), size=int(len(base) * g.uniform(0.3, 0.7)), replace=False)
            )
            cols = list(base.columns)
            if which == "santos":
                keep = [cols[0]] + [c for c in cols[1:] if g.random() < 0.7]
            else:
                keep = [c for c in cols if g.random() < 0.7]
                if len(keep) < 2:
                    keep = cols[:2]
            tid = f"{which}_{di}_{k}"
            tables[tid] = base.iloc[rows][keep].reset_index(drop=True)
            domains[tid] = di
    return tables, domains


def run_union_search(
    spark: SparkSession,
    which: str = "santos",
    scale: float = 1.0,
    seed: int = 0,
    ks: tuple[int, ...] = (5, 10, 20),
    pre=None,
) -> pd.DataFrame:
    """Figs. 9/10-as-tables: F1@k per union-search system."""
    tables, domains = build_union_lake(which, scale, seed)
    g = np.random.default_rng(seed + 1)
    nq = max(5, int(40 * scale))
    queries = list(g.choice(list(tables), size=min(nq, len(tables)), replace=False))
    gt = {
        q: {t for t in tables if t != q and domains[t] == domains[q]} for q in queries
    }
    cells, _ = lf.build_lake(spark, tables)
    col_sk, tab_sk = sks.sketches_to_pandas(
        sks.column_sketches(cells), sks.table_sketches(cells)
    )
    store = SketchStore(col_sk, tab_sk)
    results = {}
    enc = (pre.encoder() if pre is not None else finetune.PretrainedTabSketchFM(
        scaler=_corpus_scaler(col_sk), vocab=[], head=None).encoder())
    emb_pdf = embed.table_search_embeddings(store, tables, enc)
    emb_pdf = emb_pdf.rename(columns={"table_id": "id"})
    emb_df = nnjoin.to_spark_embeddings(spark, emb_pdf, ["id"])
    results["tabsketchfm"] = nnjoin.topk_cosine(
        emb_df.filter(emb_df.id.isin(queries)), emb_df, k=max(ks)
    ).toPandas()
    all_ids = list(tables)
    results["d3l"] = union_baselines.rank_all(
        lambda a, b: union_baselines.d3l_score(store, a, b), queries, all_ids, max(ks)
    )
    sm = union_baselines.StarmieLike(tables)
    results["starmie"] = union_baselines.rank_all(sm.score, queries, all_ids, max(ks))
    results["header_overlap"] = union_baselines.rank_all(
        lambda a, b: union_baselines.header_overlap_score(tables, a, b),
        queries, all_ids, max(ks),
    )
    rows = []
    for system, res in results.items():
        for k in ks:
            m = evaluate.f1_at_k(res, gt, k)
            rows.append({"lake": which, "system": system, **m})
    return pd.DataFrame(rows)


def run_transfer(
    spark: SparkSession,
    scale: float = 1.0,
    seed: int = 0,
    k: int = 10,
    pre=None,
) -> pd.DataFrame:
    """Figs. 11–13-as-a-table: cross-task/cross-lake transfer.

    A TabSketchFM cross-encoder finetuned on Wiki Jaccard (join
    regression over the KB lake) reranks the top-2k embedding candidates
    of the SANTOS-like *union* lake — a different task on a different
    data lake. Reported: F1@k of the raw embedding ranking vs the
    transferred reranking.
    """
    pre = pre or finetune.default_pretrained(spark, n_tables=30)
    # finetune a cross encoder on wiki_jaccard
    bench = registry.build("wiki_jaccard", scale=min(scale, 0.5), seed=seed)
    bstore = finetune.sketch_benchmark(spark, bench)
    fz = PairFeaturizer(bstore, encoder=pre.encoder())
    feats = finetune.featurize_splits(bench, fz)
    head = MLP(feats["train"].shape[1], 1, TASK_REGRESSION, seed=seed, lr=3e-3)
    head.fit(
        feats["train"], finetune.labels_for(bench, bench.split("train")),
        feats["valid"], finetune.labels_for(bench, bench.split("valid")),
        epochs=120, seed=seed,
    )
    # union lake + raw embedding ranking
    tables, domains = build_union_lake("santos", scale, seed)
    g = np.random.default_rng(seed + 1)
    queries = list(g.choice(list(tables), size=min(max(5, int(30 * scale)), len(tables)), replace=False))
    gt = {q: {t for t in tables if t != q and domains[t] == domains[q]} for q in queries}
    cells, _ = lf.build_lake(spark, tables)
    col_sk, tab_sk = sks.sketches_to_pandas(
        sks.column_sketches(cells), sks.table_sketches(cells)
    )
    store = SketchStore(col_sk, tab_sk)
    enc = pre.encoder()
    emb_pdf = embed.table_search_embeddings(store, tables, enc).rename(columns={"table_id": "id"})
    emb_df = nnjoin.to_spark_embeddings(spark, emb_pdf, ["id"])
    base_res = nnjoin.topk_cosine(
        emb_df.filter(emb_df.id.isin(queries)), emb_df, k=2 * k
    ).toPandas()
    # rerank candidates with the transferred cross encoder
    cand_fz = PairFeaturizer(store, encoder=enc)
    rows = []
    for q, grp in base_res.groupby("query_id"):
        cands = list(grp.sort_values("rank")["id"])
        X = np.vstack([cand_fz.features(q, c) for c in cands])
        scores = head.predict_score(X)
        order = np.argsort(-scores)
        for rank, idx in enumerate(order, 1):
            rows.append({"query_id": q, "id": cands[idx], "rank": rank})
    rerank_res = pd.DataFrame(rows)
    out = []
    m0 = evaluate.f1_at_k(base_res, gt, k)
    m1 = evaluate.f1_at_k(rerank_res, gt, k)
    out.append({"ranking": "embedding_nn", "trained_on": "-", **m0})
    out.append({"ranking": "cross_encoder_rerank", "trained_on": "wiki_jaccard", **m1})
    return pd.DataFrame(out)
