"""Shared SparkSession + context setup for spark-submit entrypoints.

Jobs can run standalone (``python jobs/table2_runtime.py``) or via
``spark-submit jobs/table2_runtime.py``; either way the session mirrors
the test fixture's configuration (shuffle partitions sized for lite
data, Arrow on, auto-broadcast off so the shuffle path is exercised —
query-side dimension frames use explicit broadcast hints instead).
"""
from __future__ import annotations

import argparse
import os
import sys

from pyspark.sql import SparkSession

sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))


def get_spark(app_name: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '24g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    return (
        SparkSession.builder.appName(app_name)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "16"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def standard_parser(description: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--scale", type=float, default=1.0, help="corpus scale factor")
    p.add_argument("--k", type=int, default=10, help="top-k")
    p.add_argument("--n-queries", type=int, default=None,
                   help="query tables per set (default: set spec)")
    p.add_argument("--no-cache", action="store_true", help="disable parquet/result cache")
    return p


def make_context(spark, args):
    from repro.eval.harness import ExperimentContext

    return ExperimentContext(
        spark,
        scale=args.scale,
        k=args.k,
        use_disk_cache=not args.no_cache,
        n_queries=args.n_queries,
    )


def save_and_print(df, name: str, title: str) -> None:
    """Write a job's tidy results CSV under the cache and pretty-print."""
    from repro.index.cache import cache_root

    out = cache_root() / "results"
    out.mkdir(parents=True, exist_ok=True)
    path = out / f"{name}.csv"
    df.to_csv(path, index=False)
    import pandas as pd

    with pd.option_context("display.width", 200, "display.max_columns", 50):
        print(f"\n=== {title} ===")
        print(df.to_string(index=False))
        print(f"[saved {path}]")
