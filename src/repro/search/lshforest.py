"""LSHForest/LSH-Ensemble-style join search (Zhu et al. 2016).

MinHash-LSH banding over the §3 column value signatures: signatures are
split into bands, band hashes are joined to generate candidates (the
index probe), and candidates are ranked by estimated Jaccard (fraction
of matching signature slots) — all in the DataFrame API over the sketch
DataFrame produced by ``sketches.column_sketches``.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def _with_id(col_sk: DataFrame) -> DataFrame:
    return col_sk.withColumn("id", F.concat_ws(":", "table_id", "col_idx"))


def topk_lsh(
    col_sk: DataFrame,
    query_ids: list[str],
    k: int = 10,
    n_bands: int = 32,
) -> DataFrame:
    """Top-k per query column via LSH banding + Jaccard-estimate ranking.

    ``col_sk``: output of ``sketches.column_sketches``. ``query_ids``:
    ``"table_id:col_idx"`` strings. Returns ``query_id, id, score, rank``.
    """
    sk = _with_id(col_sk).select("id", "table_id", "col_idx", "value_sig")
    sig_len = len(sk.select("value_sig").first()[0])
    r = max(1, sig_len // n_bands)
    band_arr = F.array(
        *[
            F.xxhash64(F.lit(b), F.concat_ws(",", F.slice("value_sig", b * r + 1, r).cast("array<string>")))
            for b in range(n_bands)
        ]
    )
    banded = sk.select("id", "table_id", F.posexplode(band_arr).alias("band", "band_hash"))
    qb = banded.filter(F.col("id").isin(query_ids)).select(
        F.col("id").alias("query_id"),
        F.col("table_id").alias("q_table"),
        "band",
        "band_hash",
    )
    cand = (
        qb.join(banded, on=["band", "band_hash"])
        .filter(F.col("q_table") != F.col("table_id"))
        .select("query_id", "id")
        .distinct()
    )
    sigs = sk.select("id", "value_sig")
    scored = (
        cand.join(sigs.withColumnRenamed("id", "query_id").withColumnRenamed("value_sig", "q_sig"),
                  on="query_id")
        .join(sigs, on="id")
        .withColumn(
            "score",
            F.aggregate(
                F.zip_with("q_sig", "value_sig", lambda a, b: F.when(a == b, 1.0).otherwise(0.0)),
                F.lit(0.0),
                lambda acc, x: acc + x,
            ) / F.lit(float(sig_len)),
        )
        .select("query_id", "id", "score")
    )
    w = Window.partitionBy("query_id").orderBy(F.desc("score"), F.asc("id"))
    return scored.withColumn("rank", F.row_number().over(w)).filter(F.col("rank") <= k)
