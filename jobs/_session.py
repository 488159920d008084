"""Shared SparkSession builder for the spark-submit entrypoints.

Mirrors the test fixture's configuration (Arrow on, broadcast autojoin
off so shuffle paths are exercised; iterative loops use explicit
broadcast hints where the small side is provably small).
"""
from pyspark.sql import SparkSession


def get_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
