"""Shared bootstrap for spark-submit job entrypoints.

Each ``jobs/e*.py`` wraps one experiment harness: build a local
SparkSession, run the harness, print the result tables. Run as
``spark-submit jobs/eN_*.py`` or plain ``python jobs/eN_*.py``.
"""
import os
import sys

_ROOT = os.path.dirname(os.path.dirname(os.path.abspath(__file__)))
for p in (_ROOT, os.path.join(_ROOT, "src")):
    if p not in sys.path:
        sys.path.insert(0, p)

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g "
    "--conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)


def get_spark():
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName("tempura-repro")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark
