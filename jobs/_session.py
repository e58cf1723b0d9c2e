"""Shared SparkSession bootstrap for the spark-submit entrypoints.

Under ``spark-submit`` the session config comes from the submit command;
``getOrCreate`` attaches to it. Run standalone (``python jobs/<name>.py``),
it builds a local session mirroring the test fixture (conftest.py).
"""
from __future__ import annotations

from pyspark.sql import SparkSession


def get_spark(app_name: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app_name)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
