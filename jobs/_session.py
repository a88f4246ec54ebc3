"""Shared SparkSession bootstrap for spark-submit entrypoints.

``spark-submit jobs/<name>.py`` provides its own session config; when a
job is run directly with ``python jobs/<name>.py`` we fall back to the
same local settings the pytest fixture uses.
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
