"""The paper's §3 sketches, computed as Spark jobs over the cell-long lake.

Three sketch kinds per the paper:

1. **Numerical sketch** (13-dim vector per column): NaN fraction, unique
   fraction, mean cell width in bytes (string columns), an is-numeric
   flag, and for numeric/date columns min, max, mean, std and a
   percentile sketch (p10/p25/p50/p75/p90). Dates are converted to
   timestamps and treated as numeric (§3.1).
2. **MinHash sketches**: a signature over whole cell values for every
   column, plus a signature over cell-value *tokens* for string columns
   (§3.2) — numeric/date columns get only the value signature, with the
   token part left empty, exactly as in the paper.
3. **Content snapshot**: a MinHash signature over whole rows rendered
   as concatenated strings (§3.3).

``column_sketches`` and ``table_sketches`` are DataFrame→DataFrame
transformations built on ``groupBy().applyInPandas`` (Arrow), so the
sketching scales out over the lake; nothing is collected to the driver.

MinHash slots are uint64 in numpy; Spark has no unsigned type, so
signatures are stored bit-reinterpreted as int64 (equality — all the
estimators need — is preserved).
"""
from __future__ import annotations

import re

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from .minhash import DEFAULT_NUM_PERM, minhash_signature

NUM_SKETCH_DIM = 13
# Named indices into the numerical sketch vector.
NS_FRAC_NAN = 0
NS_FRAC_UNIQUE = 1
NS_MEAN_WIDTH = 2
NS_IS_NUMERIC = 3
NS_MIN, NS_MAX, NS_MEAN, NS_STD = 4, 5, 6, 7
NS_P10, NS_P25, NS_P50, NS_P75, NS_P90 = 8, 9, 10, 11, 12

_TOKEN_RE = re.compile(r"[^0-9A-Za-z]+")

COLUMN_SKETCH_SCHEMA = T.StructType(
    [
        T.StructField("table_id", T.StringType(), False),
        T.StructField("col_idx", T.IntegerType(), False),
        T.StructField("col_name", T.StringType(), False),
        T.StructField("col_type", T.StringType(), False),
        T.StructField("n_rows", T.IntegerType(), False),
        T.StructField("n_distinct", T.IntegerType(), False),
        T.StructField("num_sketch", T.ArrayType(T.DoubleType()), False),
        T.StructField("value_sig", T.ArrayType(T.LongType()), False),
        T.StructField("token_sig", T.ArrayType(T.LongType()), False),
    ]
)

TABLE_SKETCH_SCHEMA = T.StructType(
    [
        T.StructField("table_id", T.StringType(), False),
        T.StructField("n_rows", T.IntegerType(), False),
        T.StructField("n_cols", T.IntegerType(), False),
        T.StructField("content_sig", T.ArrayType(T.LongType()), False),
    ]
)


def tokenize(values: "list[str] | np.ndarray") -> list[str]:
    """Split cell values into alphanumeric tokens, lowercased (§3.2)."""
    out: list[str] = []
    for v in values:
        out.extend(t for t in _TOKEN_RE.split(str(v).lower()) if t)
    return out


def numerical_sketch(
    values: pd.Series, num_values: pd.Series, col_type: str, n_rows: int
) -> np.ndarray:
    """13-dim numerical sketch of one column (see module docstring)."""
    s = np.zeros(NUM_SKETCH_DIM, dtype=np.float64)
    n_rows = max(int(n_rows), 1)
    nonnull = values.dropna()
    s[NS_FRAC_NAN] = 1.0 - len(nonnull) / n_rows
    s[NS_FRAC_UNIQUE] = nonnull.nunique() / n_rows
    if col_type == "string" and len(nonnull):
        s[NS_MEAN_WIDTH] = float(
            np.mean([len(str(v).encode("utf-8", "surrogatepass")) for v in nonnull])
        )
    nums = pd.to_numeric(num_values, errors="coerce").dropna().to_numpy(dtype=np.float64)
    if col_type in ("int", "float", "date") and len(nums):
        s[NS_IS_NUMERIC] = 1.0
        s[NS_MIN] = nums.min()
        s[NS_MAX] = nums.max()
        s[NS_MEAN] = nums.mean()
        s[NS_STD] = nums.std()
        s[NS_P10:NS_P90 + 1] = np.percentile(nums, [10, 25, 50, 75, 90])
    return s


def sketch_column_pdf(pdf: pd.DataFrame, num_perm: int = DEFAULT_NUM_PERM) -> pd.DataFrame:
    """applyInPandas worker: cells of one (table_id, col_idx) → one sketch row."""
    tid = pdf["table_id"].iloc[0]
    ci = int(pdf["col_idx"].iloc[0])
    cname = pdf["col_name"].iloc[0]
    ctype = pdf["col_type"].iloc[0]
    n_rows = len(pdf)
    vals = pdf["value"]
    nonnull = vals.dropna().astype(str)
    ns = numerical_sketch(vals, pdf["num_value"], ctype, n_rows)
    value_sig = minhash_signature(nonnull.to_numpy(), num_perm=num_perm)
    if ctype == "string":
        token_sig = minhash_signature(tokenize(nonnull.to_numpy()), num_perm=num_perm)
    else:
        token_sig = np.zeros(num_perm, dtype=np.uint64)  # empty sentinel (§3.2)
    return pd.DataFrame(
        {
            "table_id": [tid],
            "col_idx": [np.int32(ci)],
            "col_name": [cname],
            "col_type": [ctype],
            "n_rows": [np.int32(n_rows)],
            "n_distinct": [np.int32(nonnull.nunique())],
            "num_sketch": [ns.tolist()],
            "value_sig": [value_sig.view(np.int64).tolist()],
            "token_sig": [token_sig.view(np.int64).tolist()],
        }
    )


def sketch_table_pdf(pdf: pd.DataFrame, num_perm: int = DEFAULT_NUM_PERM) -> pd.DataFrame:
    """applyInPandas worker: cells of one table → content snapshot row."""
    tid = pdf["table_id"].iloc[0]
    n_rows = int(pdf["row_idx"].max()) + 1 if len(pdf) else 0
    n_cols = int(pdf["col_idx"].max()) + 1 if len(pdf) else 0
    p = pdf.sort_values(["row_idx", "col_idx"])
    rows = (
        p.assign(value=p["value"].fillna(""))
        .groupby("row_idx", sort=True)["value"]
        .agg(" ".join)
        .to_numpy()
    )
    sig = minhash_signature(rows, num_perm=num_perm)
    return pd.DataFrame(
        {
            "table_id": [tid],
            "n_rows": [np.int32(n_rows)],
            "n_cols": [np.int32(n_cols)],
            "content_sig": [sig.view(np.int64).tolist()],
        }
    )


def column_sketches(cells: DataFrame, num_perm: int = DEFAULT_NUM_PERM) -> DataFrame:
    """Distributed per-column sketching over the whole lake."""
    return cells.groupBy("table_id", "col_idx").applyInPandas(
        lambda pdf: sketch_column_pdf(pdf, num_perm=num_perm), COLUMN_SKETCH_SCHEMA
    )


def table_sketches(cells: DataFrame, num_perm: int = DEFAULT_NUM_PERM) -> DataFrame:
    """Distributed per-table content snapshots over the whole lake."""
    return cells.groupBy("table_id").applyInPandas(
        lambda pdf: sketch_table_pdf(pdf, num_perm=num_perm), TABLE_SKETCH_SCHEMA
    )


def lake_type_distribution(cells: DataFrame) -> DataFrame:
    """Data-type distribution over *columns* (Table 1's rightmost block)."""
    cols = cells.select("table_id", "col_idx", "col_type").distinct()
    total = cols.count()
    return (
        cols.groupBy("col_type")
        .agg(F.count("*").alias("n"))
        .withColumn("pct", F.round(F.col("n") * 100.0 / F.lit(total), 2))
        .orderBy("col_type")
    )


def sketches_to_pandas(col_sk: DataFrame, tab_sk: DataFrame) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Collect sketch DataFrames to the driver with uint64 signatures restored."""
    cp = col_sk.toPandas()
    tp = tab_sk.toPandas()
    for frame, cols in ((cp, ("value_sig", "token_sig")), (tp, ("content_sig",))):
        for c in cols:
            frame[c] = frame[c].apply(lambda a: np.asarray(a, dtype=np.int64).view(np.uint64))
    cp["num_sketch"] = cp["num_sketch"].apply(lambda a: np.asarray(a, dtype=np.float64))
    return cp, tp
