"""Bench for the Spark dataflow: windowed grid aggregation and the
distributed exact snapshot at ~SF 0.1-style volume."""
import pandas as pd
import numpy as np

from repro.core.model import Query
from repro.experiments.datasets import SPECS, default_query, make_stream
from repro.spark.grid_agg import bursty_cell_per_pane, sliding_cell_scores
from repro.spark.io import stream_df
from repro.spark.snapshot import bursty_point_snapshot


def _big_pdf(n=100_000):
    return make_stream("US", n, seed=0)


def test_bench_spark_sliding_scores(benchmark, spark):
    pdf = _big_pdf()
    sdf = stream_df(spark, pdf).cache()
    sdf.count()
    q = default_query(SPECS["US"], 1.0)
    t_now = float(pdf["t"].max())

    def run():
        return (
            sliding_cell_scores(sdf, q, t_now)
            .orderBy("s", ascending=False)
            .limit(5)
            .collect()
        )

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    assert rows and rows[0]["s"] >= rows[-1]["s"]
    sdf.unpersist()


def test_bench_spark_pane_view(benchmark, spark):
    pdf = _big_pdf()
    sdf = stream_df(spark, pdf).cache()
    sdf.count()
    q = default_query(SPECS["US"], 1.0)

    def run():
        return bursty_cell_per_pane(sdf, q).count()

    n_panes = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n_panes > 10  # ~60 one-hour panes carry activity
    sdf.unpersist()


def test_bench_spark_snapshot_exact(benchmark, spark):
    pdf = _big_pdf(30_000)
    sdf = stream_df(spark, pdf).cache()
    sdf.count()
    q = default_query(SPECS["US"], 1.0)
    t_now = float(pdf["t"].max())

    def run():
        return bursty_point_snapshot(sdf, q, t_now)

    row = benchmark.pedantic(run, rounds=1, iterations=1)
    assert row is not None and row["score"] > 0
    sdf.unpersist()
