"""Shared helpers for the spark-submit job entrypoints.

Each job wraps one evaluation-table runner (DESIGN.md T1-T8) so that
``spark-submit jobs/table<N>_*.py`` regenerates that table at benchmark
scale and prints it. The functions under ``repro.evaluation.tables`` are
the real implementation; jobs only build the session and print.
"""
import pandas as pd
from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (SparkSession.builder.appName(app)
            .config("spark.sql.shuffle.partitions", "64")
            .config("spark.sql.execution.arrow.pyspark.enabled", "true")
            .config("spark.sql.autoBroadcastJoinThreshold", -1)
            .getOrCreate())


def show(title: str, table: pd.DataFrame) -> None:
    print(f"\n=== {title} ===")
    print(table.to_string(index=False))
