"""Shared SparkSession factory for spark-submit entrypoints.

Mirrors the test fixture's configuration (conftest.py): Arrow on, broadcast
joins off by default (jobs re-enable per-join with explicit hints), modest
shuffle parallelism for local[*]. ``spark.driver.memory`` is read at JVM
launch, not from SparkConf, so it is injected into PYSPARK_SUBMIT_ARGS here
— this module must be imported before any SparkContext is created (the job
scripts import it first).
"""
import os

os.environ.setdefault("SPARK_DRIVER_MEM", "32g")
os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ['SPARK_DRIVER_MEM']} "
    "--conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false "
    "pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
