"""Shared SparkSession setup for spark-submit job entrypoints.

Mirrors the test fixture's configuration (shuffle partitions, Arrow,
broadcast joins disabled) so jobs and tests exercise identical plans.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_session(app_name: str) -> SparkSession:
    return (
        SparkSession.builder.appName(f"repro-{app_name}")
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
