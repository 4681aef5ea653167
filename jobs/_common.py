"""Shared bootstrap for the spark-submit job entrypoints.

Each job builds (or reuses) a local SparkSession configured like the
test fixture in ``conftest.py`` and pretty-prints the experiment's tidy
DataFrame. Run as ``python jobs/<name>.py`` or via ``spark-submit``.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
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


def show(title: str, df: pd.DataFrame) -> None:
    print(f"\n== {title} ==")
    print(df.to_string(index=False))
