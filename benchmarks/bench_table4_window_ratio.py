"""Bench for Table IV: approximation ratio vs window size (one window per
dataset at bench scale; the job sweeps all five)."""
from repro.experiments.tables import table4_rows

from benchmarks._util import BENCH_N


def test_bench_table4_ratio(benchmark):
    rows = benchmark.pedantic(
        table4_rows,
        args=(BENCH_N,),
        kwargs={
            "windows": {"Taxi": [10 / 60], "UK": [1.0], "US": [1.0]},
            "sample_every": 10,
        },
        rounds=1,
        iterations=1,
    )
    assert len(rows) == 3
    for r in rows:
        assert r["mgaps_pct"] >= r["gaps_pct"] - 1e-6
        assert r["gaps_pct"] > 12.5  # far above the worst-case bound at α=.5
