"""Shared glue for the spark-submit entrypoints.

Each job builds (or reuses, under spark-submit) a local SparkSession with
the same session-level settings as ``conftest.py`` — broadcast joins off so
the similarity joins exercise the shuffle path — runs one table harness,
and prints paper-vs-measured rows.
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master("local[*]")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .config("spark.driver.host", "127.0.0.1")
        .getOrCreate()
    )


def table_main(table: str, *, default_pairs: int = 300) -> None:
    """CLI for one table job: ``--pairs`` sets the benchmark scale."""
    parser = argparse.ArgumentParser(description=f"Reproduce paper Table {table}")
    parser.add_argument("--pairs", type=int, default=default_pairs,
                        help="aligned pairs per dataset (scale factor)")
    parser.add_argument("--no-spark-features", action="store_true",
                        help="use NumPy reference dataflows instead of Spark")
    args = parser.parse_args()

    from repro.evalx.tables import Harness, format_rows

    spark = get_spark(f"ceaff-table{table}")
    try:
        h = Harness(spark, n_pairs=args.pairs, use_spark=not args.no_spark_features)
        rows = getattr(h, f"table{table}")()
        pivot = "dataset" if table in {"3", "4", "5"} else None
        print(f"== Paper Table {table.upper()} (scale: {args.pairs} pairs/dataset) ==")
        print(format_rows(rows, pivot=pivot) if pivot else format_rows(rows, pivot=None))
    finally:
        spark.stop()
