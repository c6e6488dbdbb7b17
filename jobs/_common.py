"""Shared bootstrap for spark-submit job entrypoints.

Jobs wrap functions from ``repro.experiments`` that take (or don't need)
a SparkSession; under spark-submit the session already exists, standalone
``python jobs/<name>.py`` creates a local one.
"""
from __future__ import annotations

import sys
from pathlib import Path

import pandas as pd

# Allow `python jobs/<name>.py` from a source checkout without install.
sys.path.insert(0, str(Path(__file__).resolve().parent.parent / "src"))


def get_spark():
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName("repro-job")
        .master("local[*]")
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


def emit(title: str, df: pd.DataFrame) -> None:
    pd.set_option("display.width", 200)
    print(f"\n== {title} ==")
    print(df.to_string(index=False))
