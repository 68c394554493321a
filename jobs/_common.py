"""Shared plumbing for spark-submit entrypoints."""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))


def get_spark(app: str):
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def emit(title: str, table_md: str, out=None):
    block = f"\n## {title}\n\n{table_md}\n"
    print(block)
    if out:
        with open(out, "a") as f:
            f.write(block)
