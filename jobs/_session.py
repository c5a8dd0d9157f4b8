"""Shared SparkSession builder for spark-submit entrypoints.

Jobs are thin wrappers over ``repro.experiments`` functions that take a
SparkSession — tests/benchmarks pass the pytest session fixture, jobs
build their own local session here.
"""
from pyspark.sql import SparkSession


def build(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
