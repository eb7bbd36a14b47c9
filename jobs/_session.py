"""Shared SparkSession builder for the job entrypoints.

Mirrors the conftest fixture settings so `python jobs/<name>.py` and
`spark-submit jobs/<name>.py` see the same configuration.
"""
from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master("local[*]")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
