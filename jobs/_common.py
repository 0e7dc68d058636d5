"""Shared SparkSession bootstrap for the spark-submit job entrypoints.

Jobs are thin wrappers over ``repro.harness``; under spark-submit the
session already exists and ``getOrCreate`` picks it up, while direct
``python jobs/<name>.py`` runs configure a local session equivalent to
the pytest fixture in ``conftest.py``.
"""
from __future__ import annotations

import os


def get_spark():
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName("koios-repro")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
