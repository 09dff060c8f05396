"""Shared SparkSession builder for the spark-submit entrypoints.

Jobs are thin wrappers over ``repro.experiments``: each ``run(spark,...)``
takes the session, runs one table/figure harness at job scale, prints
the resulting table and writes it under ``results/``.
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
