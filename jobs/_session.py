"""Shared SparkSession bootstrap for spark-submit jobs.

Jobs mirror the conftest fixture's configuration (shuffle partitions,
Arrow, broadcast joins disabled) but own their session lifecycle, so
``spark-submit jobs/<name>.py`` works standalone.
"""
import os

from pyspark.sql import SparkSession


def get_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )
