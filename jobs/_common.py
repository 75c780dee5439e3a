"""Shared spark-submit bootstrap for experiment jobs.

Each job builds (or reuses) a local SparkSession configured like the
test fixture: shuffle path exercised (no auto-broadcast), Arrow on,
modest shuffle partitions.  Results print as a markdown table on
stdout — the rows that EXPERIMENTS.md records next to the paper's
numbers.
"""
from __future__ import annotations

import os


def get_spark(app: str):
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


def emit(rows) -> None:
    from repro.bench.harness import fmt_table

    print(fmt_table(rows), flush=True)
