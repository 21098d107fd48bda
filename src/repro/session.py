"""SparkSession builder for ``spark-submit`` jobs.

Tests use the session-scoped ``spark`` fixture from ``conftest.py``;
jobs launched via ``spark-submit jobs/<name>.py`` build an equivalent
session here (same shuffle/Arrow/broadcast settings).
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_session(app: str = "repro-job") -> SparkSession:
    """Session with the repro defaults (broadcast joins disabled)."""
    return (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
