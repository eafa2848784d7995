"""SparkSession builder for the spark-submit jobs.

Mirrors the pytest fixture's configuration (shuffle partitions, Arrow,
broadcast disabled) so job runs are comparable to test/bench runs. Under
``spark-submit`` the master/memory come from the submit command line.
"""
import os

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
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


def get_benchmark(kb, name: str):
    from repro.lake import benchmarks as B

    return {
        "tus": B.make_tus_lite,
        "small": B.make_small_lite,
        "large": B.make_large_lite,
        "mini": B.make_mini,
    }[name](kb)
