"""Registry of the 8 LakeBench benchmarks + the Table-1 statistics job."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from ..core import sketches
from ..lake import format as lake_format
from . import (
    ckan_subset,
    ecb_join,
    ecb_union,
    spider_opendata,
    tus_santos,
    wiki_join,
    wiki_union,
)
from .base import Benchmark

BUILDERS = {
    "tus_santos": tus_santos.build,
    "wiki_union": wiki_union.build,
    "ecb_union": ecb_union.build,
    "wiki_jaccard": wiki_join.build_jaccard,
    "wiki_containment": wiki_join.build_containment,
    "spider_opendata": spider_opendata.build,
    "ecb_join": ecb_join.build,
    "ckan_subset": ckan_subset.build,
}

# Paper Table 1 ordering and task names.
PAPER_ORDER = [
    "tus_santos",
    "wiki_union",
    "ecb_union",
    "wiki_jaccard",
    "wiki_containment",
    "spider_opendata",
    "ecb_join",
    "ckan_subset",
]


def build(name: str, scale: float = 1.0, seed: int = 0) -> Benchmark:
    if name not in BUILDERS:
        raise KeyError(f"unknown benchmark {name!r}; have {sorted(BUILDERS)}")
    return BUILDERS[name](scale=scale, seed=seed)


def table1_stats(spark: SparkSession, bench: Benchmark) -> dict:
    """One Table-1 row: pair-split sizes plus Spark-computed lake stats
    (avg rows/cols and column data-type distribution)."""
    cells, meta = lake_format.build_lake(spark, bench.tables, bench.descriptions)
    sizes = meta.groupBy().avg("n_rows", "n_cols").collect()[0]
    dist = sketches.lake_type_distribution(cells).toPandas().set_index("col_type")["pct"]
    row = bench.stats()
    row["avg_rows"] = round(float(sizes["avg(n_rows)"]), 2)
    row["avg_cols"] = round(float(sizes["avg(n_cols)"]), 2)
    for t in ("string", "int", "float", "date"):
        row[f"pct_{t}"] = float(dist.get(t, 0.0))
    return row


def table1(spark: SparkSession, scale: float = 1.0, seed: int = 0) -> pd.DataFrame:
    """The full Table-1 reproduction over all 8 benchmarks."""
    rows = [table1_stats(spark, build(n, scale=scale, seed=seed)) for n in PAPER_ORDER]
    return pd.DataFrame(rows)
