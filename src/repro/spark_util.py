"""SparkSession helper for standalone jobs.

Tests must use the ``spark`` fixture from conftest.py; jobs run under
``spark-submit`` (or plain ``python``) and create their own session with
the same settings the fixture uses.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_session(app_name: str = "repro-job") -> SparkSession:
    """Local session mirroring the test fixture's configuration."""
    return (
        SparkSession.builder.appName(app_name)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        # honoured at JVM launch when the session is created from Python
        .config("spark.driver.memory", os.environ.get("SPARK_DRIVER_MEM", "8g"))
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
