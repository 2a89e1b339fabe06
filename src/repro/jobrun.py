"""Shared plumbing for the ``jobs/`` spark-submit entrypoints."""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def default_spark(app: str) -> SparkSession:
    """SparkSession for standalone jobs (mirrors the conftest fixture).

    Under pytest the session fixture already exists and ``getOrCreate``
    returns it; standalone, a local session is built with the same
    settings.
    """
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
