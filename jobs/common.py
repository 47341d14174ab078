"""Shared SparkSession bootstrap for spark-submit entrypoints.

Jobs are thin wrappers over ``repro.experiments.harness`` functions, which
take a SparkSession and return a DataFrame/pandas table — the same code
paths the tests and benchmarks exercise.
"""
import argparse

from pyspark.sql import SparkSession


def get_spark(app_name: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app_name)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def base_parser(description: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--n-series", type=int, default=3000, help="series per dataset")
    p.add_argument("--n-queries", type=int, default=100, help="query batch size")
    p.add_argument("--seed", type=int, default=0)
    return p
