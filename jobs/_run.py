"""Shared CLI plumbing for the table jobs (spark-submit entrypoints)."""
import argparse

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    """Local SparkSession mirroring the conftest fixture settings."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )


def parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--sf", type=float, default=1.0, help="analog scale factor")
    return p


def emit(df, title: str) -> None:
    print(f"\n== {title} ==")
    print(df.to_string(index=False))
