"""Shared SparkSession builder for spark-submit entrypoints.

Jobs are written as functions over a SparkSession (the pytest suite uses
the conftest fixture instead); this builder mirrors the fixture's config.
"""
from pyspark.sql import SparkSession


def get_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
