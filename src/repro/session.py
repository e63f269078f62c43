"""SparkSession builder for the spark-submit job entrypoints.

Tests use the ``spark`` fixture from conftest.py; the ``jobs/`` scripts
use this builder so they run standalone under ``spark-submit`` or plain
``python`` with the same settings (shuffle width, Arrow, no broadcast
auto-threshold — matching the test session).
"""
import os

from pyspark.sql import SparkSession


def build_session(app_name: str = "repro-job") -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false "
        "--conf spark.ui.showConsoleProgress=false "
        "pyspark-shell",
    )
    s = (
        SparkSession.builder.appName(app_name)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "16"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s
