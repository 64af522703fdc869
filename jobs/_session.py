"""Shared SparkSession setup for spark-submit entrypoints.

Jobs wrap library functions that take a SparkSession (so tests inject the
conftest fixture); this module provides the session when running
standalone via ``spark-submit jobs/<name>.py`` or ``python jobs/<name>.py``.
"""
import os
import sys

# Allow `python jobs/<name>.py` from a source checkout without install.
sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))

from pyspark.sql import SparkSession  # noqa: E402


def get_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
