"""Shared spark-submit plumbing for the jobs/ entrypoints.

Each job exposes ``run(spark, ...) -> DataFrame`` and a ``main()`` that
builds the session when launched via ``spark-submit jobs/<name>.py``.
"""
from __future__ import annotations

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    """Session for standalone job runs (pytest uses the conftest fixture)."""
    spark = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark
