"""Shared plumbing for the spark-submit job entrypoints.

Each job is a thin wrapper over a library function that takes a
SparkSession and returns/prints results, so the same code path is
exercised by pytest (via the ``spark`` fixture) and by
``spark-submit jobs/<name>.py``.
"""
from __future__ import annotations

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
