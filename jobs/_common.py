"""Shared CLI plumbing for the per-table spark-submit jobs.

Each ``jobs/tableN_*.py`` builds (or reuses) a SparkSession, runs the
matching harness from ``repro.experiments.tables`` and prints the
reproduced table as markdown. ``--scale`` trades runtime for lake size
(1.0 ~ tests, 3.0 ~ benchmarks).
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def parse_args(description: str) -> argparse.Namespace:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--scale", type=float, default=1.0)
    p.add_argument("--seed", type=int, default=0)
    return p.parse_args()


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def run_job(title: str, rows_fn, **kwargs) -> None:
    from repro.experiments.tables import format_rows

    args = parse_args(title)
    spark = get_spark(title)
    spark.sparkContext.setLogLevel("ERROR")
    rows = rows_fn(spark, scale=args.scale, seed=args.seed, **kwargs)
    print(f"\n## {title} (scale={args.scale}, seed={args.seed})\n")
    print(format_rows(rows))
    spark.stop()
