"""Shared SparkSession bootstrap for spark-submit entrypoints.

Mirrors the test fixture's configuration (see conftest.py) so jobs and
tests exercise the same Spark settings; under spark-submit the master and
driver memory come from the submit command line instead.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_session(app_name: str) -> SparkSession:
    """Session with the reproduction's standard configs applied."""
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
