"""SparkSession builder for standalone jobs (``jobs/*.py``).

Tests use the ``spark`` fixture from ``conftest.py``; jobs launched via
``spark-submit`` (or plain ``python``) build an equivalent session here
so both paths run with the same shuffle/broadcast/Arrow settings.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_session(app: str) -> SparkSession:
    """Local-mode session mirroring the test fixture's configuration."""
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .config("spark.ui.showConsoleProgress", "false")
        .config("spark.driver.host", "127.0.0.1")
        .getOrCreate()
    )
