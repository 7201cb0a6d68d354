"""Shared session bootstrap for the spark-submit entrypoints.

Jobs run standalone (``python jobs/table2_1nn.py`` or spark-submit);
under pytest the same driver functions are called with the conftest
``spark`` fixture instead.
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '24g')} "
    "--conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402


def get_spark(app: str) -> SparkSession:
    s = (SparkSession.builder.appName(app)
         .config("spark.sql.shuffle.partitions", "64")
         .config("spark.sql.execution.arrow.pyspark.enabled", "true")
         .config("spark.sql.autoBroadcastJoinThreshold", -1)
         .getOrCreate())
    s.sparkContext.setLogLevel("ERROR")
    return s


def emit(title: str, frame) -> None:
    print(f"\n=== {title} ===")
    print(frame.to_string(index=False))
