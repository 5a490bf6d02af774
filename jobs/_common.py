"""Shared glue for spark-submit job entrypoints.

Each job is a thin wrapper over a harness function in
``repro.experiments`` that takes a SparkSession and returns a pandas
DataFrame (the table). Run as ``spark-submit jobs/<name>.py [args]`` or
plain ``python jobs/<name>.py`` (the session is created either way).
"""
from __future__ import annotations

import argparse
import os
import sys


def session(app: str):
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "32"))
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def arg_parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--scale", type=float, default=1.0, help="benchmark scale factor")
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--out", type=str, default=None, help="optional CSV output path")
    return p


def emit(df, out: str | None, title: str) -> None:
    print(f"\n=== {title} ===")
    print(df.to_string(index=False))
    if out:
        df.to_csv(out, index=False)
        print(f"[written {out}]", file=sys.stderr)
