"""SparkSession for standalone ``spark-submit`` jobs.

Tests use the session fixture from ``conftest.py``; jobs call
``get_session()`` which applies the same per-session settings (Arrow,
shuffle partitions, broadcast joins disabled) to a builder-created or
spark-submit-provided session.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession

__all__ = ["get_session"]


def get_session(app_name: str = "repro-job") -> SparkSession:
    return (
        SparkSession.builder.appName(app_name)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
