"""SparkSession factory for spark-submit entrypoints.

Tests use the ``spark`` fixture from ``conftest.py``; jobs run standalone
and build an equivalent local session here (same shuffle/broadcast/Arrow
settings, lower default shuffle partitions since job graphs are small).
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_session(app_name: str = "repro-job") -> SparkSession:
    s = (
        SparkSession.builder.appName(app_name)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "8"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .config("spark.driver.host", "127.0.0.1")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s
