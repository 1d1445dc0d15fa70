"""Shared spark-submit bootstrap for the table jobs.

Each job is runnable either as ``spark-submit jobs/tableN.py`` or plain
``python jobs/tableN.py`` (a local session is created on demand). The
repo root is appended to sys.path so jobs work without installation.
"""
from __future__ import annotations

import os
import sys

_ROOT = os.path.dirname(os.path.dirname(os.path.abspath(__file__)))
for p in (os.path.join(_ROOT, "src"), _ROOT):
    if p not in sys.path:
        sys.path.insert(0, p)

RESULTS_DIR = os.path.join(_ROOT, "results")


def get_spark():
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName("sofa-repro-job")
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark
