"""Shared SparkSession builder for spark-submit entrypoints.

Mirrors the conftest fixture's configuration (shuffle partitions, Arrow,
broadcast joins disabled) so job runs and test runs see the same planner
behaviour.
"""
import os
import sys


def get_spark(app: str):
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        f"--conf spark.driver.host=127.0.0.1 "
        f"--conf spark.ui.enabled=false "
        "pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def emit(df, out_path: str | None):
    """Print a result frame and optionally write it as CSV."""
    text = df.to_string(index=False)
    print(text)
    if out_path:
        df.to_csv(out_path, index=False)
        print(f"[written] {out_path}", file=sys.stderr)
