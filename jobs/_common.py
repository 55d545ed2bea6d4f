"""Shared helpers for spark-submit figure jobs."""
import os
import sys

# allow running as `spark-submit jobs/<name>.py` from the repo root
sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))

from pyspark.sql import SparkSession  # noqa: E402


def get_spark(app: str) -> SparkSession:
    """Local session for standalone job runs (tests use the conftest
    fixture instead)."""
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def run_main(run_fn, app: str) -> None:
    spark = get_spark(app)
    try:
        _, md = run_fn(spark)
        print(md)
    finally:
        spark.stop()
