"""Shared session bootstrap for the spark-submit entrypoints.

Jobs are thin wrappers over ``repro.harness.tables``: each builds one
paper table at the requested scale and prints paper-style rows (also
written to ``results/*.csv``).  Usage: ``spark-submit jobs/<name>.py
[scale]`` or plain ``python jobs/<name>.py [scale]`` (scale: test|bench|
full; default full).
"""
from __future__ import annotations

import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))


def get_spark():
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false "
        "pyspark-shell",
    )
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName("repro-job")
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


def scale_arg(default: str = "full") -> str:
    return sys.argv[1] if len(sys.argv) > 1 else default
