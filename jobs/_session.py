"""Shared SparkSession bootstrap for the spark-submit entrypoints.

Each job builds (or reuses) a local session configured like the test
fixture in conftest.py: Arrow on, broadcast joins off, modest shuffle
parallelism. Driver memory must be fixed *before* the JVM launches, so
``PYSPARK_SUBMIT_ARGS`` is set at import time (same approach as
conftest.py) — running ``python jobs/<name>.py`` without it would get
the 1g default and heap-out on the broadcast adjacencies.

Usage: ``spark-submit jobs/<name>.py [args]`` or ``python jobs/<name>.py``.
"""
import os

os.environ.setdefault("SPARK_DRIVER_MEM", "24g")
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
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
