"""Shared spark-submit session helper for the job entrypoints.

Jobs are functions over a SparkSession; when launched via spark-submit
(or plain ``python jobs/<name>.py``) this builds the session with the
same conventions as conftest.py (broadcast joins disabled so the
shuffle paths the paper talks about are actually exercised).
"""
import os

from pyspark.sql import SparkSession


def get_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "32"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
