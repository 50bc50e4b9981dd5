"""Shared spark-submit plumbing for the per-table jobs.

Each ``jobs/figN_*.py`` wraps one ``repro.experiments.*.run`` function:
it builds (or reuses) a local SparkSession configured like ``conftest.py``
and prints the resulting table(s).  Usage: ``spark-submit jobs/<name>.py``
or plain ``python jobs/<name>.py``.
"""
from __future__ import annotations

import os
import sys

import pandas as pd

sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))


def get_spark():
    os.environ.setdefault("SPARK_DRIVER_MEM", "8g")
    import conftest  # noqa: F401  (sets PYSPARK_SUBMIT_ARGS pre-JVM)
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName("repro-job")
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


def emit(title: str, result) -> None:
    pd.set_option("display.width", 200)
    pd.set_option("display.max_columns", 50)
    pd.set_option("display.max_rows", 200)
    if isinstance(result, dict):
        for name, frame in result.items():
            print(f"\n=== {title} :: {name} ===")
            print(frame.to_string(index=False))
    else:
        print(f"\n=== {title} ===")
        print(result.to_string(index=False))
