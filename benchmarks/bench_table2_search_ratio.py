"""Bench for Table II: CCS vs B-CCS search-trigger ratio (US, 1h window).

Asserts the table's shape: CCS triggers fewer searches than B-CCS.
"""
from repro.core.cell_cspot import CellCSPOT
from repro.experiments.datasets import SPECS, default_query
from repro.experiments.harness import events_of

from benchmarks._util import bench_stream, timed_run


def test_bench_table2_trigger_ratio(benchmark):
    objs = bench_stream("US")
    q = default_query(SPECS["US"], 1.0)
    evs = events_of(objs, q.wlen)

    def run():
        ccs = timed_run("ccs", CellCSPOT(q, mode="ccs"), evs)
        bccs = timed_run("bccs", CellCSPOT(q, mode="bccs"), evs)
        return ccs, bccs

    ccs, bccs = benchmark.pedantic(run, rounds=1, iterations=1)
    assert 0 < ccs.trigger_ratio < 1
    assert ccs.trigger_ratio < bccs.trigger_ratio
    assert ccs.searches < bccs.searches
