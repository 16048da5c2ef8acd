"""Shared spark-submit entrypoint plumbing for the table jobs.

Each job builds (or reuses) a local SparkSession, runs its table harness,
and prints the resulting frame(s). Usage: ``spark-submit jobs/tableN_*.py``
or plain ``python jobs/tableN_*.py`` (the session is created either way).
"""
import sys

import pandas as pd
from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    """Local SparkSession mirroring the conftest fixture's settings."""
    return (
        SparkSession.builder.appName(app)
        .master("local[*]")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def emit(title: str, df: pd.DataFrame) -> None:
    """Print one table in full width."""
    with pd.option_context("display.width", 250, "display.max_columns", 100):
        print(f"\n== {title} ==", file=sys.stdout)
        print(df.to_string(index=False))
