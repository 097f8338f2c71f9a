"""Shared spark-submit plumbing for the experiment jobs.

Each job module exposes ``run(spark, ...) -> pandas.DataFrame`` (used by
tests and benchmarks through the session fixture) and a ``main()`` that
builds its own local session when launched via ``spark-submit jobs/<x>.py``.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "16"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def show(df) -> None:
    import pandas as pd

    with pd.option_context("display.width", 200, "display.max_columns", 50):
        print(df.to_string(index=False))
