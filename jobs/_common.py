"""Shared session builder for spark-submit entrypoints.

Mirrors the test fixture's configuration (conftest.py); jobs are thin CLI
wrappers over ``repro.evalx.harness`` so tables can be regenerated with
``spark-submit jobs/table4.py [sf]`` or plain ``python jobs/table4.py``.
"""
import os
import sys

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    s = (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def sf_arg(default: float = 1.0) -> float:
    return float(sys.argv[1]) if len(sys.argv) > 1 else default
