"""SparkSession factory for the ``jobs/`` entrypoints.

Tests use the session-scoped ``spark`` fixture from ``conftest.py``; jobs
run standalone (``python jobs/<name>.py`` or ``spark-submit``) and build
an equivalent local session here. The config mirrors the fixture:
broadcast joins disabled so shuffle paths are exercised, Arrow on.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_spark(app: str = "repro-job") -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "32"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s
