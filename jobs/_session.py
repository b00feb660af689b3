"""Shared SparkSession builder for spark-submit jobs.

Mirrors the pytest fixture in ``conftest.py`` (shuffle partitions, Arrow,
broadcast joins disabled) so job runs and test runs exercise the same plans.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def build_session(app_name: str) -> SparkSession:
    spark = (
        SparkSession.builder.appName(app_name)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    return spark
