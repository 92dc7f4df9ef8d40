"""Bench for Figure 6's shape: GAPS fastest, MGAPS a small multiple of GAPS,
both orders of magnitude faster than CCS."""
from repro.core.cell_cspot import CellCSPOT
from repro.core.gap import GapSurge
from repro.core.mgap import MGapSurge
from repro.experiments.datasets import SPECS, default_query
from repro.experiments.harness import events_of

from benchmarks._util import bench_stream, timed_run


def test_bench_fig6_approx_ordering(benchmark):
    objs = bench_stream("US")
    q = default_query(SPECS["US"], 1.0)
    evs = events_of(objs, q.wlen)

    def run():
        return {
            "gaps": timed_run("gaps", GapSurge(q), evs),
            "mgaps": timed_run("mgaps", MGapSurge(q), evs),
            "ccs": timed_run("ccs", CellCSPOT(q, mode="ccs"), evs),
        }

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    t = {k: v.time_per_object_s for k, v in out.items()}
    assert t["gaps"] < t["mgaps"] < t["ccs"]
    # MGAPS runs GAPS four times: expect a small constant factor (paper: 2-5x)
    assert t["mgaps"] / t["gaps"] < 10.0
    # approx methods are at least an order of magnitude faster than exact here
    assert t["ccs"] / t["gaps"] > 5.0
