"""Shared SparkSession setup for the spark-submit entrypoints.

Tests use the ``spark`` fixture from ``conftest.py``; these jobs are
standalone scripts, so they build an equivalent session themselves
(same shuffle/broadcast settings, so job runs match test behaviour).
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
