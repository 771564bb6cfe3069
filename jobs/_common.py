"""Shared SparkSession builder for spark-submit job entrypoints.

Jobs are thin wrappers over ``repro.experiments.tables`` row producers:
``spark-submit jobs/<table>.py`` (or ``python jobs/<table>.py``) prints
the measured rows for that table. The session mirrors the pytest
fixture's configuration (broadcast joins disabled, Arrow on).
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__)))))

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "32"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s
