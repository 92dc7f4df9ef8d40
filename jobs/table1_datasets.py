#!/usr/bin/env python
"""Reproduce Table I: dataset statistics (paper numbers printed alongside).

Usage: spark-submit jobs/table1_datasets.py   (env: REPRO_N, REPRO_SEED)
"""
from _common import emit, env_int, env_seed, get_spark

from repro.experiments.tables import format_rows, table1_rows


def main() -> None:
    spark = get_spark()
    try:
        rows = table1_rows(spark, n=env_int("REPRO_N", 20_000), seed=env_seed())
        emit(format_rows(rows, "Table I — Datasets (synthetic substitutes)"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
