"""Shared SparkSession bootstrap for the spark-submit job entrypoints.

Jobs mirror the test fixture's configuration (Arrow on, broadcast joins
off so shuffle paths are exercised) but own their session lifecycle.
"""
from pyspark.sql import SparkSession


def get_session(app_name: str) -> SparkSession:
    spark = (
        SparkSession.builder.appName(app_name)
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark
