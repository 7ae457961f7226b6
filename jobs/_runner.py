"""Shared spark-submit entry glue for the per-table jobs.

Each ``jobs/<name>.py`` wraps one ``repro.experiments.<name>.run`` function:
it owns the SparkSession lifecycle (``getOrCreate`` — under spark-submit the
session comes from the submit conf) and forwards a small common CLI
(``--scale``, ``--codes``).
"""
from __future__ import annotations

import argparse


def main(run_fn, description: str) -> None:
    parser = argparse.ArgumentParser(description=description)
    parser.add_argument("--scale", type=float, default=0.5, help="dataset scale factor")
    parser.add_argument(
        "--codes", type=str, default=None, help="comma-separated dataset codes (default: experiment's own)"
    )
    args = parser.parse_args()
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName(description)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    codes = args.codes.split(",") if args.codes else None
    try:
        run_fn(spark, codes=codes, scale=args.scale)
    finally:
        spark.stop()
