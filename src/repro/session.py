"""SparkSession construction for standalone jobs (``jobs/*.py``).

Tests use the ``spark`` fixture from ``conftest.py``; jobs run under
``spark-submit`` (or plain ``python``) and build an equivalent session here —
same Arrow, shuffle-partition, and broadcast settings, so job numbers are
comparable with test/benchmark numbers.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_session(app: str = "repro-job") -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
