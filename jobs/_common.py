"""Shared bits for spark-submit job entrypoints.

Each job builds (or reuses) a SparkSession, runs one experiment table,
and prints it as markdown so the output can be pasted into
EXPERIMENTS.md. Run as ``spark-submit jobs/<name>.py``.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )


def emit(title: str, df: pd.DataFrame) -> None:
    print(f"\n## {title}\n")
    print(df.to_string(index=False, float_format=lambda x: f"{x:.3f}"))
