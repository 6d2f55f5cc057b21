"""Shared job plumbing: build a local SparkSession for spark-submit runs.

Each job exposes ``main(spark) -> pyspark DataFrame`` so it can be driven
either by ``spark-submit jobs/<name>.py`` or from tests/benchmarks with
the session fixture.
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def emit(spark, pdf, title: str):
    """Print the result table and return it as a Spark DataFrame."""
    print(f"\n== {title} ==")
    print(pdf.to_string(index=False))
    return spark.createDataFrame(pdf)
