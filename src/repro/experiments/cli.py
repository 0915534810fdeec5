"""spark-submit plumbing shared by the ``jobs/`` entrypoints.

Each job wraps one experiment harness: parses the common flags, builds
(or reuses, under spark-submit) the session, runs the harness, prints
the table and optionally writes it to CSV.
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession

from repro.experiments import common


def build_session(app: str) -> SparkSession:
    """Session with the same per-session configs as conftest.py."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )


def run_job(title: str, harness, extra_args: dict | None = None) -> None:
    """Parse flags, run ``harness(spark, **kwargs)``, print the table."""
    ap = argparse.ArgumentParser(description=title)
    ap.add_argument("--dataset", choices=["cab", "sm"], default="cab")
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--csv", help="also write the table to this CSV path")
    for flag, kw in (extra_args or {}).items():
        ap.add_argument(flag, **kw)
    ns = ap.parse_args()
    spark = build_session(title)
    spark.sparkContext.setLogLevel("ERROR")
    kwargs = {k: v for k, v in vars(ns).items() if k != "csv" and v is not None}
    df = harness(spark, **kwargs)
    common.print_table(df, title)
    if ns.csv:
        df.to_csv(ns.csv, index=False)
    spark.stop()
