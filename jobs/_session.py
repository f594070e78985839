"""Shared spark-submit session bootstrap for jobs.

Jobs are written as functions over a SparkSession (tests drive them
through the conftest fixture); this module only supplies a session when
a job runs standalone under spark-submit / python.
"""
from pyspark.sql import SparkSession


def get_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
