"""Shared SparkSession bootstrap for the spark-submit entrypoints.

Mirrors the conftest fixture configuration (Arrow on, broadcast joins
off, bounded shuffle partitions) so job runs and test runs exercise
identical plans. ``spark.driver.memory`` is only honoured at JVM
launch, so it is injected into ``PYSPARK_SUBMIT_ARGS`` at import time
— before any SparkSession exists — when the jobs are run with plain
``python`` rather than ``spark-submit``.
"""
from __future__ import annotations

import os

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '16g')} "
    "--conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false "
    "pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402


def session(app_name: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app_name)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
