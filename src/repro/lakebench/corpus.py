"""Synthetic data sources for LakeBench (§5) — substitutes for Wikidata,
ECB Statistical Data Warehouse, CKAN/Socrata open data and Spider.

Each generator copies the *construction procedure* of the corresponding
paper section at reduced scale (see DESIGN.md, "Dataset substitutions"):

* ``SyntheticKB`` / ``make_kb`` — a knowledge base of concepts, each with
  entities (labels drawn from concept-specific token distributions, so
  same-concept values share vocabulary even with zero entity overlap —
  the property §6.1.2 credits TaBERT with exploiting) and numeric
  properties with concept-specific value ranges. Several concepts share
  property *schemas* (e.g. area+population) so that "same properties,
  different concept" negatives exist, exactly as in Fig. 4.
* ``kb_table`` — a Fig. 3/4-style table: generic ``colN`` headers,
  ``col0`` holding entity labels, other columns numeric properties;
  returns ground-truth cell→entity and column→concept/property mappings.
* ``ecb_series_table`` — ECB-style table: dimension columns carrying
  constant codes (AT, AT130, M, …), a TIME_PERIOD date column and an
  OBS_VALUE float column (Fig. 5a).
* ``ecb_collapsed_dataset`` — a whole ECB dataset collapsed into one
  table (dimension columns now vary row-wise), used by ECB Join.
* ``opendata_table`` — CKAN/Socrata-style table: a monotone id column
  (real CSVs are row-ordered), a monotone date column, denormalized
  categorical columns with heavy value repetition, cryptic code
  columns, and several numeric columns — 10s of columns, 100s–1000s of
  rows, mostly non-string, per §4's corpus description.
* ``opendata_from_tpch`` — open-data-like tables sliced out of the
  TPC-H-lite generators in ``repro.synth_data`` (orders grouped by
  priority), linking the provided generators into the corpus.
* ``spider_database`` — a Spider-style database: parent/child tables
  with a PK/FK join column.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

# Token pools for entity-label synthesis. Stems are shared across
# concepts; suffix/prefix tokens are concept-specific, giving each
# concept a recognizable value-token distribution.
_STEMS = [
    "brzes", "piase", "zambr", "belcha", "lutila", "horny", "vysna", "slaska",
    "prochot", "mnisek", "nova", "velke", "mala", "sirkov", "acadia", "brook",
    "carber", "deerwo", "junipe", "willow", "spring", "river", "parker", "monte",
    "gorna", "dolna", "stara", "krasna", "biala", "czarna", "zielona", "jasna",
]
_SUFFIX_POOL = [
    ["county"], ["municipality"], ["school"], ["district"], ["village", "nad"],
    ["station"], ["parish"], ["canton"], ["borough"], ["commune"], ["ward"],
    ["prefecture"], ["township"], ["oblast"], ["shire"], ["settlement"],
]
_PROPERTY_POOL = [
    ("P2046_area", (1.0, 60.0)),
    ("P1082_population", (100.0, 5000.0)),
    ("P2044_elevation", (50.0, 2500.0)),
    ("P2047_duration", (10.0, 400.0)),
    ("P2048_height", (2.0, 150.0)),
    ("P2049_width", (1.0, 80.0)),
    ("P2120_radius", (0.5, 40.0)),
    ("P2234_volume", (10.0, 9000.0)),
]


@dataclass
class Concept:
    qid: str
    name: str
    suffixes: list[str]
    entities: dict[str, str]  # entity_id -> label
    properties: list[str]  # property ids (schema)
    prop_ranges: dict[str, tuple[float, float]] = field(default_factory=dict)


@dataclass
class SyntheticKB:
    concepts: dict[str, Concept]

    def concept_with_schema(self, schema: tuple[str, ...]) -> list[Concept]:
        return [c for c in self.concepts.values() if tuple(c.properties) == schema]


def make_kb(
    n_concepts: int = 12,
    entities_per_concept: int = 400,
    props_per_concept: int = 3,
    seed: int = 0,
) -> SyntheticKB:
    """Build the synthetic knowledge base (Wikidata substitute)."""
    g = np.random.default_rng(seed)
    concepts: dict[str, Concept] = {}
    # Half the concepts share one property schema (area+population+…)
    # so Wiki-Union's "same properties, different concept" negatives exist.
    shared_schema = [p for p, _ in _PROPERTY_POOL[:props_per_concept]]
    for ci in range(n_concepts):
        qid = f"Q{1000 + ci}"
        suffixes = _SUFFIX_POOL[ci % len(_SUFFIX_POOL)]
        if ci < n_concepts // 2:
            props = list(shared_schema)
        else:
            idx = g.choice(len(_PROPERTY_POOL), size=props_per_concept, replace=False)
            props = [_PROPERTY_POOL[i][0] for i in sorted(idx)]
        ranges = {}
        for p in props:
            lo, hi = dict(_PROPERTY_POOL)[p]
            # Concept-specific sub-range → numeric sketches carry concept signal.
            a = g.uniform(lo, (lo + hi) / 2)
            b = g.uniform(a + (hi - lo) * 0.2, hi * (1 + 0.2 * ci))
            ranges[p] = (a, b)
        entities = {}
        for ei in range(entities_per_concept):
            stem = _STEMS[int(g.integers(len(_STEMS)))]
            stem2 = _STEMS[int(g.integers(len(_STEMS)))]
            suffix = suffixes[int(g.integers(len(suffixes)))]
            label = f"{stem.capitalize()}{stem2} {suffix.capitalize()} {ei}"
            entities[f"{qid}E{ei}"] = label
        concepts[qid] = Concept(
            qid=qid,
            name=f"concept {qid}",
            suffixes=suffixes,
            entities=entities,
            properties=props,
            prop_ranges=ranges,
        )
    return SyntheticKB(concepts=concepts)


@dataclass
class KBTable:
    """A generated table plus its ground-truth KB mappings (Fig. 4)."""

    table_id: str
    df: pd.DataFrame
    concept: str
    entity_ids: list[str]  # CE mappings of col0, row-aligned
    col_properties: list[str]  # property id per non-entity column


def kb_table(
    kb: SyntheticKB,
    concept_qid: str,
    table_id: str,
    n_rows: int,
    rng: np.random.Generator,
    properties: list[str] | None = None,
    entity_ids: list[str] | None = None,
) -> KBTable:
    """Generate one Fig. 4-style table (generic headers, col0 = entities)."""
    c = kb.concepts[concept_qid]
    props = properties if properties is not None else list(c.properties)
    if entity_ids is None:
        pool = list(c.entities)
        n_rows = min(n_rows, len(pool))
        entity_ids = [pool[i] for i in rng.choice(len(pool), size=n_rows, replace=False)]
    data = {"col0": [c.entities[e] for e in entity_ids]}
    for pi, p in enumerate(props):
        lo, hi = c.prop_ranges.get(p, (0.0, 1.0))
        data[f"col{pi + 1}"] = np.round(rng.uniform(lo, hi, len(entity_ids)), 2)
    return KBTable(
        table_id=table_id,
        df=pd.DataFrame(data),
        concept=concept_qid,
        entity_ids=list(entity_ids),
        col_properties=list(props),
    )


# --------------------------------------------------------------------------
# ECB-like generators (Fig. 5a)
# --------------------------------------------------------------------------
ECB_DIMENSIONS: dict[str, list[str]] = {
    "FREQ": ["A", "Q", "M", "W"],
    "REF_AREA": ["AT", "AT130", "DE", "FR", "IT", "ES", "NL", "BE"],
    "PROPERTY_TYPE": ["NF", "AF", "EC", "ALL"],
    "UNIT": ["EUR", "PC", "IX", "PTS"],
    "ADJUSTMENT": ["N", "S", "W", "C"],
    "SOURCE": ["ECB", "NCB", "EST", "OECD"],
    "VALUATION": ["MV", "BV", "NV", "FV"],
    "MATURITY": ["ST", "LT", "MT", "TOT"],
    "SECTOR": ["HH", "NFC", "GOV", "MFI"],
    "INSTRUMENT": ["LOAN", "DEBT", "EQ", "DEP"],
    "CURRENCY": ["EUR", "USD", "GBP", "CHF"],
    "COLLECTION": ["E", "A", "B", "S"],
}
ECB_DIM_NAMES = list(ECB_DIMENSIONS)


def ecb_series_table(
    dims: dict[str, str], n_rows: int, rng: np.random.Generator
) -> pd.DataFrame:
    """One ECB time-series table: constant dimension codes + a series."""
    data: dict[str, object] = {d: [v] * n_rows for d, v in dims.items()}
    data["TIME_PERIOD"] = pd.to_datetime("2015-01-01") + pd.to_timedelta(
        np.arange(n_rows) * 30, unit="D"
    )
    # Several numeric observation columns, matching the paper's ECB data
    # where roughly half the columns are non-string (Table 1).
    data["OBS_VALUE"] = np.round(rng.normal(100, 25, n_rows), 2)
    data["OBS_PRE"] = np.round(rng.normal(100, 25, n_rows), 2)
    data["OBS_COM"] = np.round(rng.gamma(2.0, 10.0, n_rows), 2)
    data["OBS_CONF"] = rng.integers(0, 5, n_rows)
    return pd.DataFrame(data)


def ecb_collapsed_dataset(
    dim_names: list[str],
    n_rows: int,
    rng: np.random.Generator,
    value_subsets: dict[str, list[str]] | None = None,
) -> pd.DataFrame:
    """An ECB dataset collapsed to one table: dimension columns vary
    row-wise over (a subset of) their code vocabulary (§5.2 ECB Join)."""
    value_subsets = value_subsets or {}
    data = {}
    for d in dim_names:
        vocab = value_subsets.get(d, ECB_DIMENSIONS[d])
        data[d] = [vocab[i] for i in rng.integers(0, len(vocab), n_rows)]
    data["TIME_PERIOD"] = pd.to_datetime("2010-01-01") + pd.to_timedelta(
        rng.integers(0, 4000, n_rows), unit="D"
    )
    data["OBS_VALUE"] = np.round(rng.normal(100, 25, n_rows), 2)
    return pd.DataFrame(data)


# --------------------------------------------------------------------------
# CKAN/Socrata-like open data (§4, §5.3)
# --------------------------------------------------------------------------
_DEPARTMENTS = [
    "Education", "Transport", "Health", "Finance", "Parks", "Housing",
    "Water", "Energy", "Justice", "Culture",
]
_SCHOOLS = [
    "R. D. Parker Collegiate", "Riverside School", "Springwell School",
    "Willow Grove School", "Winnipeg Montessori School", "Acadia Colony School",
    "Brookdale School", "Carberry Collegiate", "Deerwood School", "Juniper School",
]


def opendata_table(
    n_rows: int,
    n_numeric: int,
    rng: np.random.Generator,
    start_id: int = 0,
    id_col: str = "record_id",
) -> pd.DataFrame:
    """One open-data-like table with a monotone id column and denormalized
    categorical columns (see module docstring)."""
    n_cat = 3
    data: dict[str, object] = {
        id_col: np.arange(start_id, start_id + n_rows),
        "report_date": pd.to_datetime("2008-01-01")
        + pd.to_timedelta(np.sort(rng.integers(0, 5000, n_rows)), unit="D"),
        "code": [
            f"{rng.choice(['ukha','ify','qz','mx'])}-{int(rng.integers(1000, 9999))}"
            for _ in range(n_rows)
        ],
    }
    for ci in range(n_cat):
        pool = _DEPARTMENTS if ci % 2 == 0 else _SCHOOLS
        k = int(rng.integers(2, len(pool)))
        sub = [pool[i] for i in rng.choice(len(pool), size=k, replace=False)]
        data[f"category_{ci}"] = [sub[i] for i in rng.integers(0, k, n_rows)]
    for ni in range(n_numeric):
        scale = 10.0 ** int(rng.integers(0, 4))
        data[f"metric_{ni}"] = np.round(rng.gamma(2.0, scale, n_rows), 2)
    return pd.DataFrame(data)


def opendata_from_tpch(spark, sf: float = 0.002, seed: int = 0) -> dict[str, pd.DataFrame]:
    """Open-data-like tables sliced from the TPC-H-lite ``orders``
    generator: one table per order priority, row-ordered by key (so the
    monotone-id property holds). Extends ``repro.synth_data`` into the
    pretraining corpus."""
    from repro import synth_data

    pdf = synth_data.orders(spark, sf=sf, seed=seed).toPandas()
    out = {}
    for prio, grp in pdf.groupby("o_orderpriority"):
        tid = f"tpch_orders_{prio.split('-')[0]}"
        out[tid] = grp.sort_values("o_orderkey").reset_index(drop=True)
    return out


# --------------------------------------------------------------------------
# Spider-like databases (§5.2)
# --------------------------------------------------------------------------
@dataclass
class SpiderDB:
    db_id: str
    tables: dict[str, pd.DataFrame]
    joins: list[tuple[str, str, str, str]]  # (table1, col1, table2, col2)


def spider_database(db_id: str, rng: np.random.Generator, n_children: int = 2) -> SpiderDB:
    """A small database with PK/FK joins: one parent, n child tables."""
    n_parent = int(rng.integers(40, 120))
    parent = pd.DataFrame(
        {
            "id": np.arange(1, n_parent + 1),
            "name": [
                f"{_STEMS[int(rng.integers(len(_STEMS)))].capitalize()} {db_id}-{i}"
                for i in range(n_parent)
            ],
            "score": np.round(rng.uniform(0, 100, n_parent), 1),
        }
    )
    tables = {f"{db_id}_main": parent}
    joins = []
    for ci in range(n_children):
        n_child = int(rng.integers(80, 240))
        child = pd.DataFrame(
            {
                f"{db_id}_fk": rng.integers(1, n_parent + 1, n_child),
                "amount": np.round(rng.gamma(2.0, 50.0, n_child), 2),
                "status": [
                    ["open", "closed", "pending"][i] for i in rng.integers(0, 3, n_child)
                ],
            }
        )
        name = f"{db_id}_child{ci}"
        tables[name] = child
        joins.append((f"{db_id}_main", "id", name, f"{db_id}_fk"))
    return SpiderDB(db_id=db_id, tables=tables, joins=joins)


def pretrain_corpus(
    spark, n_tables: int = 120, seed: int = 999
) -> tuple[dict[str, pd.DataFrame], dict[str, str]]:
    """A mixed corpus for §4 pretraining, disjoint (by seed) from every
    finetuning benchmark, per the paper's no-leakage rule."""
    g = np.random.default_rng(seed)
    kb = make_kb(n_concepts=8, entities_per_concept=200, seed=seed)
    tables: dict[str, pd.DataFrame] = {}
    desc: dict[str, str] = {}
    qids = list(kb.concepts)
    for i in range(n_tables // 3):
        qid = qids[int(g.integers(len(qids)))]
        t = kb_table(kb, qid, f"pre_kb_{i}", int(g.integers(20, 120)), g)
        tables[t.table_id] = t.df
        desc[t.table_id] = f"entities of {kb.concepts[qid].name}"
    for i in range(n_tables // 3):
        dims = {
            d: ECB_DIMENSIONS[d][int(g.integers(len(ECB_DIMENSIONS[d])))]
            for d in ECB_DIM_NAMES[: int(g.integers(3, 8))]
        }
        tables[f"pre_ecb_{i}"] = ecb_series_table(dims, int(g.integers(40, 160)), g)
        desc[f"pre_ecb_{i}"] = "economic time series " + " ".join(dims.values())
    for i in range(n_tables - 2 * (n_tables // 3)):
        tables[f"pre_open_{i}"] = opendata_table(
            int(g.integers(80, 300)), int(g.integers(3, 8)), g, start_id=int(g.integers(0, 10000))
        )
        desc[f"pre_open_{i}"] = "open government data report"
    for tid, pdf in opendata_from_tpch(spark, seed=seed).items():
        tables[tid] = pdf
        desc[tid] = "tpch orders slice"
    return tables, desc
