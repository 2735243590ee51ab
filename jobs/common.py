"""Shared SparkSession builder for spark-submit entrypoints.

Mirrors conftest.py's session config so jobs and tests see the same engine
settings (shuffle partitions, Arrow, no broadcast joins).
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))

# conftest.py computes the driver heap from the cgroup limit and exports
# PYSPARK_SUBMIT_ARGS before any pyspark import — reuse it verbatim so a
# plain `python jobs/run_*.py` gets the same JVM as the test session.
import conftest  # noqa: E402,F401


def get_spark(app: str):
    from pyspark.sql import SparkSession

    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions",
                os.environ.get("SPARK_SHUFFLE_PARTITIONS", "16"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s
