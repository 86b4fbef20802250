"""Shared plumbing for the spark-submit entrypoints.

Jobs are thin wrappers: the experiment logic lives in
``repro.experiments.tables`` as functions taking a SparkSession, so
tests drive them through the session fixture and ``spark-submit``
drives them through :func:`main_for_table`.
"""
from __future__ import annotations

import argparse
import sys

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def main_for_table(table: str) -> None:
    """Run one table driver and print its markdown output."""
    from repro.experiments import tables

    parser = argparse.ArgumentParser(description=f"Reproduce {table}")
    parser.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = parser.parse_args()
    spark = get_spark(f"repro-{table}")
    try:
        tables.ALL_TABLES[table](spark, scale=args.scale)
        import os

        for name in ([f"{table}.md"] if table != "table45" else ["table4.md", "table5.md"]):
            path = os.path.join(tables.RESULTS_DIR, name)
            if os.path.isfile(path):
                sys.stdout.write(open(path).read() + "\n")
    finally:
        spark.stop()
