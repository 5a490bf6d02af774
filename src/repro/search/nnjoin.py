"""Nearest-neighbour join over embeddings — the Spark search kernel.

``topk_cosine`` takes a query embedding DataFrame and a corpus embedding
DataFrame (both ``id: string, emb: array<double>``) and returns the
top-k corpus ids per query by cosine similarity, computed distributedly:
queries are broadcast-joined against the corpus, similarities evaluated
in an Arrow ``mapInPandas`` pass, and per-query top-k selected with a
window rank — all DataFrame API, no driver-side scoring.

An optional LSH-banded prefilter (``band_prefilter``) cuts the candidate
set before exact scoring, the WarpGate/HNSW trade-off at lake scale.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql import types as T


def to_spark_embeddings(spark: SparkSession, pdf: pd.DataFrame, id_cols: list[str]) -> DataFrame:
    """Materialize a pandas embedding frame (``emb`` holds np arrays)."""
    out = pdf.copy()
    out["emb"] = out["emb"].apply(lambda v: [float(x) for x in v])
    schema = T.StructType(
        [T.StructField(c, T.StringType() if out[c].dtype == object else T.LongType(), False)
         for c in id_cols]
        + [T.StructField("emb", T.ArrayType(T.DoubleType()), False)]
    )
    for c in id_cols:
        if out[c].dtype != object:
            out[c] = out[c].astype("int64")
    return spark.createDataFrame(out[id_cols + ["emb"]], schema=schema)


def _normalize(df: DataFrame, col: str = "emb") -> DataFrame:
    norm = F.sqrt(F.aggregate(col, F.lit(0.0), lambda acc, x: acc + x * x))
    return df.withColumn(
        col, F.transform(col, lambda x: x / F.when(norm > 1e-12, norm).otherwise(F.lit(1.0)))
    )


def topk_cosine(
    queries: DataFrame,
    corpus: DataFrame,
    k: int = 10,
    exclude_self: bool = True,
) -> DataFrame:
    """Top-k corpus rows per query by cosine similarity.

    Inputs must have columns ``id`` (string) and ``emb``; returns
    ``query_id, id, score, rank``.
    """
    q = _normalize(queries).select(F.col("id").alias("query_id"), F.col("emb").alias("q_emb"))
    c = _normalize(corpus).select("id", "emb")
    joined = q.join(c, F.lit(True))
    if exclude_self:
        joined = joined.filter(F.col("query_id") != F.col("id"))
    scored = joined.withColumn(
        "score",
        F.aggregate(
            F.zip_with("q_emb", "emb", lambda a, b: a * b), F.lit(0.0), lambda acc, x: acc + x
        ),
    ).select("query_id", "id", "score")
    w = Window.partitionBy("query_id").orderBy(F.desc("score"), F.asc("id"))
    return scored.withColumn("rank", F.row_number().over(w)).filter(F.col("rank") <= k)


def band_prefilter(
    queries: DataFrame, corpus: DataFrame, sig_col: str = "sig", n_bands: int = 16
) -> DataFrame:
    """LSH banding candidate generation on int64 MinHash signature columns.

    Splits the signature into ``n_bands`` contiguous bands, hashes each
    band (xxhash64 over the band slice), and joins queries to corpus on
    (band index, band hash). Returns distinct (query_id, id) candidates.
    """
    def explode_bands(df: DataFrame, out_id: str) -> DataFrame:
        sig_len = len(df.select(sig_col).first()[0])
        r = max(1, sig_len // n_bands)
        band_arr = F.array(
            *[
                F.xxhash64(F.lit(b), F.concat_ws(",", F.slice(sig_col, b * r + 1, r).cast("array<string>")))
                for b in range(n_bands)
            ]
        )
        return df.select(F.col("id").alias(out_id), F.posexplode(band_arr).alias("band", "band_hash"))

    qb = explode_bands(queries, "query_id")
    cb = explode_bands(corpus, "id")
    return (
        qb.join(cb, on=["band", "band_hash"])
        .filter(F.col("query_id") != F.col("id"))
        .select("query_id", "id")
        .distinct()
    )
