"""Data-lake substrate: tables as a cell-long Spark DataFrame.

The paper operates over data lakes of CSV tables. Here a lake is a pair
of DataFrames:

* **cells** — one row per table cell:
  ``table_id, col_idx, col_name, col_type, row_idx, value, num_value``
  where ``value`` is the string rendering and ``num_value`` the parsed
  double (ints/floats as-is, dates as epoch seconds, else null).
* **meta** — one row per table:
  ``table_id, n_rows, n_cols, description``.

This long format is what makes per-column sketching a plain
``groupBy(table_id, col_idx).applyInPandas`` job and Table-1 style
statistics plain aggregations. Lakes round-trip through Parquet
(``write_lake`` / ``read_lake``).

Column types follow the paper's rule (§3, Column Type Embedding): try to
parse the first 10 values as date / int / float and default to string.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

CELL_SCHEMA = T.StructType(
    [
        T.StructField("table_id", T.StringType(), False),
        T.StructField("col_idx", T.IntegerType(), False),
        T.StructField("col_name", T.StringType(), False),
        T.StructField("col_type", T.StringType(), False),
        T.StructField("row_idx", T.IntegerType(), False),
        T.StructField("value", T.StringType(), True),
        T.StructField("num_value", T.DoubleType(), True),
    ]
)

META_SCHEMA = T.StructType(
    [
        T.StructField("table_id", T.StringType(), False),
        T.StructField("n_rows", T.IntegerType(), False),
        T.StructField("n_cols", T.IntegerType(), False),
        T.StructField("description", T.StringType(), True),
    ]
)

COL_TYPES = ("string", "int", "float", "date")


def infer_col_type(series: pd.Series) -> str:
    """Paper's first-10-values type sniffing: date > int > float > string."""
    if pd.api.types.is_datetime64_any_dtype(series):
        return "date"
    if pd.api.types.is_integer_dtype(series):
        return "int"
    if pd.api.types.is_float_dtype(series):
        return "float"
    head = series.dropna().head(10)
    if head.empty:
        return "string"
    vals = head.astype(str)
    as_num = pd.to_numeric(vals, errors="coerce")
    if as_num.notna().all():
        return "int" if (as_num == as_num.round()).all() and not vals.str.contains(r"\.").any() else "float"
    try:
        parsed = pd.to_datetime(vals, errors="coerce", format="mixed")
    except (ValueError, TypeError):
        parsed = pd.Series([pd.NaT] * len(vals))
    if parsed.notna().all():
        return "date"
    return "string"


def _numify(series: pd.Series, col_type: str) -> pd.Series:
    """Parsed double per the inferred type (dates → epoch seconds)."""
    if col_type == "date":
        dt = pd.to_datetime(series, errors="coerce", format="mixed")
        # numpy (not pandas) int64 view: NaT becomes INT64_MIN, masked below.
        ns = dt.to_numpy(dtype="datetime64[ns]").astype("int64")
        return pd.Series(ns / 1e9, index=series.index).where(dt.notna())
    if col_type in ("int", "float"):
        return pd.to_numeric(series, errors="coerce").astype("float64")
    return pd.Series(np.nan, index=series.index, dtype="float64")


def table_to_cells(table_id: str, pdf: pd.DataFrame) -> pd.DataFrame:
    """Melt one pandas table into the cell-long layout."""
    n = len(pdf)
    parts = []
    for ci, col in enumerate(pdf.columns):
        s = pdf[col]
        ctype = infer_col_type(s)
        sval = s.astype(object).where(s.notna(), None)
        sval = pd.Series(
            [None if v is None else str(v) for v in sval], dtype=object
        )
        parts.append(
            pd.DataFrame(
                {
                    "table_id": table_id,
                    "col_idx": np.int32(ci),
                    "col_name": str(col),
                    "col_type": ctype,
                    "row_idx": np.arange(n, dtype=np.int32),
                    "value": sval,
                    "num_value": _numify(s, ctype).to_numpy(),
                }
            )
        )
    if not parts:
        return pd.DataFrame(columns=[f.name for f in CELL_SCHEMA.fields])
    out = pd.concat(parts, ignore_index=True)
    out["col_idx"] = out["col_idx"].astype("int32")
    out["row_idx"] = out["row_idx"].astype("int32")
    return out


def build_lake(
    spark: SparkSession,
    tables: dict[str, pd.DataFrame],
    descriptions: dict[str, str] | None = None,
) -> tuple[DataFrame, DataFrame]:
    """Materialize a dict of pandas tables as (cells, meta) Spark DataFrames."""
    descriptions = descriptions or {}
    cell_parts = [table_to_cells(tid, pdf) for tid, pdf in tables.items()]
    cells_pdf = (
        pd.concat(cell_parts, ignore_index=True)
        if cell_parts
        else pd.DataFrame(columns=[f.name for f in CELL_SCHEMA.fields])
    )
    meta_pdf = pd.DataFrame(
        {
            "table_id": list(tables),
            "n_rows": [np.int32(len(p)) for p in tables.values()],
            "n_cols": [np.int32(len(p.columns)) for p in tables.values()],
            "description": [descriptions.get(tid) for tid in tables],
        }
    )
    cells = spark.createDataFrame(cells_pdf, schema=CELL_SCHEMA)
    meta = spark.createDataFrame(meta_pdf, schema=META_SCHEMA)
    return cells, meta


def write_lake(cells: DataFrame, meta: DataFrame, path: str) -> None:
    """Persist a lake as Parquet (overwrite)."""
    cells.write.mode("overwrite").parquet(f"{path}/cells")
    meta.write.mode("overwrite").parquet(f"{path}/meta")


def read_lake(spark: SparkSession, path: str) -> tuple[DataFrame, DataFrame]:
    """Load a lake written by ``write_lake``."""
    return spark.read.parquet(f"{path}/cells"), spark.read.parquet(f"{path}/meta")
