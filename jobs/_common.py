"""Shared plumbing for spark-submit job entrypoints."""
from __future__ import annotations

import os
import sys


def env_int(name: str, default: int) -> int:
    return int(os.environ.get(name, default))


def env_seed() -> int:
    return env_int("REPRO_SEED", 0)


def get_spark():
    """SparkSession for standalone jobs (spark-submit or plain python).

    Jobs reuse the conftest conventions: local master, quiet UI, arrow on.
    """
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName("repro-job")
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.ui.enabled", "false")
        .config("spark.driver.host", "127.0.0.1")
        .getOrCreate()
    )


def emit(text: str) -> None:
    print(text)
    sys.stdout.flush()
