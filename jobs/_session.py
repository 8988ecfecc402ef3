"""Shared spark-submit session builder for the job entrypoints.

Jobs are thin CLI wrappers: the experiment logic lives in
``repro.bench.tables`` as functions taking a SparkSession (the pytest
``spark`` fixture drives the same functions in tests/benchmarks).
"""
from __future__ import annotations

from pyspark.sql import SparkSession


def get_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
