"""SparkSession construction for standalone jobs.

Tests use the session-scoped ``spark`` fixture from ``conftest.py``;
the ``jobs/`` entrypoints (run via ``spark-submit`` or plain
``python``) build an equivalent local session here. ``getOrCreate``
makes this a no-op inside an existing session (e.g. spark-submit).
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def build_spark(app_name: str = "repro-job") -> SparkSession:
    """Local session with the same per-session configs as conftest.py:
    modest shuffle width, Arrow on, broadcast joins off so shuffle paths
    are exercised."""
    return (
        SparkSession.builder.appName(app_name)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
