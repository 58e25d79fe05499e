"""Shared SparkSession builder for the spark-submit entrypoints."""
from __future__ import annotations

import os

# Driver memory must be fixed before the JVM launches (getOrCreate);
# plain `python jobs/<job>.py` would otherwise get Spark's 1g default,
# which the 1M-sentence index aggregation cannot survive.
os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '32g')} "
    "--conf spark.driver.host=127.0.0.1 pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402


def get_spark(app: str) -> SparkSession:
    """Local session mirroring conftest's settings (Arrow on, no UI)."""
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s
