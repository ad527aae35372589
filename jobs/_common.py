"""Shared scaffolding for the spark-submit job entrypoints.

Each ``jobs/tN_*.py`` wraps one experiment-table function from
``repro.experiments.tables``: it obtains (or reuses) a SparkSession,
runs the sweep at the benchmark scale, and prints the result rows.
Run as ``spark-submit jobs/t1_similarity.py`` or plain
``python jobs/t1_similarity.py``.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.experiments.harness import format_rows


def get_spark(app: str) -> SparkSession:
    """A session configured like the test fixture (broadcast joins off so
    shuffle paths are exercised; modest shuffle parallelism)."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def run_job(app: str, fn, columns: list[str] | None = None) -> list[dict]:
    """Execute ``fn(spark) -> rows``, print the table, return the rows."""
    spark = get_spark(app)
    spark.sparkContext.setLogLevel("ERROR")
    rows = fn(spark)
    print(f"\n=== {app} ===")
    print(format_rows(rows, columns))
    return rows
