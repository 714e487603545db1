"""Shared helpers for the spark-submit entrypoints.

Each job exposes ``run(spark) -> pandas.DataFrame`` and a ``__main__``
that builds a local session (same knobs as conftest.py), prints the
paper-style table, and exits. Scale/repeats come from ``REPRO_SCALE`` /
``REPRO_REPEATS`` env vars so one flag drives the whole suite.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def scale() -> float:
    return float(os.environ.get("REPRO_SCALE", "1.0"))


def repeats() -> int:
    return int(os.environ.get("REPRO_REPEATS", "1"))


def show(title: str, pdf) -> None:
    import pandas as pd

    with pd.option_context("display.width", 250, "display.max_columns", 50):
        print(f"\n=== {title} ===")
        print(pdf.round(3).to_string())
