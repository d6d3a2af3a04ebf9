"""Shared session bootstrap for the spark-submit entrypoints.

Each job regenerates one evaluation table at benchmark scale and prints it
next to the paper's published numbers, so `python jobs/<table>.py` (or
spark-submit) reproduces one table of EXPERIMENTS.md.
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))
import conftest  # noqa: F401  (sets PYSPARK_SUBMIT_ARGS before pyspark loads)

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions",
                os.environ.get("SPARK_SHUFFLE_PARTITIONS", "32"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s
