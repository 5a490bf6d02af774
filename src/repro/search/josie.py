"""JOSIE-style join search: exact set-containment top-k (Zhu et al. 2019).

JOSIE finds the data-lake columns with the largest *exact* value overlap
with a query column. The reimplementation is the classic inverted-index
plan in the DataFrame API over the cell-long lake:

1. distinct (column, value) posting list,
2. self-join postings on value against the query columns' postings,
3. group by (query column, candidate column), count the overlap,
4. per-query top-k by overlap (ties broken by smaller candidate set —
   higher containment first, as in JOSIE's ranking).

Being exact, its counts are oracle-checkable against DuckDB (tested).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def column_postings(cells: DataFrame) -> DataFrame:
    """Distinct (table_id, col_idx, value) postings + per-column set size."""
    return (
        cells.filter(F.col("value").isNotNull())
        .select("table_id", "col_idx", "value")
        .distinct()
    )


def topk_containment(
    cells: DataFrame,
    query_ids: list[str],
    k: int = 10,
) -> DataFrame:
    """Top-k joinable columns per query column by exact overlap.

    ``query_ids``: ``"table_id:col_idx"`` strings naming query columns
    (their values are read from ``cells``). Returns
    ``query_id, id, overlap, containment, rank`` with ids rendered as
    ``table_id:col_idx``.
    """
    post = column_postings(cells).withColumn(
        "id", F.concat_ws(":", "table_id", "col_idx")
    )
    sizes = post.groupBy("table_id", "col_idx").agg(F.count("*").alias("set_size"))
    qpost = post.filter(F.col("id").isin(query_ids)).select(
        F.col("id").alias("query_id"), F.col("table_id").alias("q_table"), "value"
    )
    qsizes = qpost.groupBy("query_id").agg(F.count("*").alias("q_size"))
    cand = (
        qpost.join(post, on="value")
        .filter(F.col("table_id") != F.col("q_table"))
        .groupBy("query_id", "table_id", "col_idx")
        .agg(F.count("*").alias("overlap"))
        .join(sizes, on=["table_id", "col_idx"])
        .join(qsizes, on="query_id")
        .withColumn("containment", F.col("overlap") / F.col("q_size"))
        .select(
            "query_id",
            F.concat_ws(":", "table_id", "col_idx").alias("id"),
            "overlap",
            "containment",
        )
    )
    w = Window.partitionBy("query_id").orderBy(F.desc("overlap"), F.desc("containment"), F.asc("id"))
    return cand.withColumn("rank", F.row_number().over(w)).filter(F.col("rank") <= k)
