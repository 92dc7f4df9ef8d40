"""Bench for Table III: approximation ratio vs alpha (US, 1h window).

Asserts the table's shape: measured ratios far exceed the (1-α)/4 bound and
MGAPS ≥ GAPS.
"""
from repro.experiments.tables import table3_rows

from benchmarks._util import BENCH_N


def test_bench_table3_ratio(benchmark):
    rows = benchmark.pedantic(
        table3_rows,
        args=(BENCH_N,),
        kwargs={"alphas": [0.1, 0.5, 0.9], "sample_every": 10},
        rounds=1,
        iterations=1,
    )
    for r in rows:
        assert r["gaps_pct"] >= r["bound_pct"] - 1e-6
        assert r["mgaps_pct"] >= r["gaps_pct"] - 1e-6
        assert 40.0 <= r["gaps_pct"] <= 100.0 + 1e-6  # far above the bound
