"""Bench for Table I: stream generation + Spark statistics aggregation."""
import pytest

from repro.experiments.tables import table1_rows

from benchmarks._util import BENCH_N


def test_bench_table1(benchmark, spark):
    rows = benchmark.pedantic(
        table1_rows, args=(spark, BENCH_N), kwargs={"seed": 0}, rounds=1, iterations=1
    )
    assert {r["dataset"] for r in rows} == {"UK", "US", "Taxi"}
    for r in rows:
        assert r["rate_per_h"] == pytest.approx(r["scaled_paper_rate_per_h"], rel=0.5)
