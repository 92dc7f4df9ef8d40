"""Bench for Figure 9's shape: kCCS runtime grows with k; kGAPS/kMGAPS are
nearly flat in k; the naive per-event greedy is far slower than kCCS."""
from repro.core.topk import KCellCSPOT, NaiveKSurge
from repro.experiments.datasets import SPECS, default_query
from repro.experiments.harness import events_of, run_continuous

from benchmarks._util import bench_stream


class _KGaps:
    def __init__(self, q, k):
        from repro.core.gap import GapSurge

        self.g, self.k = GapSurge(q), k
        self.stats = self.g.stats

    def step(self, ev):
        self.g.process(ev)
        return self.g.top_k(self.k)


def test_bench_fig9_k_scaling(benchmark):
    objs = bench_stream("US", n=1_500)
    q = default_query(SPECS["US"], 1.0)
    evs = events_of(objs, q.wlen)

    def run():
        out = {}
        for k in (3, 9):
            out[("kccs", k)] = run_continuous(
                "kccs", KCellCSPOT(q, k=k), evs
            ).time_per_object_s
            out[("kgaps", k)] = run_continuous(
                "kgaps", _KGaps(q, k), evs
            ).time_per_object_s
        return out

    t = benchmark.pedantic(run, rounds=1, iterations=1)
    assert t[("kccs", 9)] > t[("kccs", 3)]  # kCCS grows with k
    # kGAPS barely reacts to k compared with kCCS
    kccs_growth = t[("kccs", 9)] / t[("kccs", 3)]
    kgaps_growth = t[("kgaps", 9)] / max(t[("kgaps", 3)], 1e-12)
    assert kgaps_growth < kccs_growth


def test_bench_fig9_naive_far_slower(benchmark):
    # A 12h window keeps ~1/3 of the stream live: the naive greedy sweeps all
    # of it on every event while kCCS touches only affected cells.
    objs = bench_stream("US", n=400)
    q = default_query(SPECS["US"], 12.0)
    evs = events_of(objs, q.wlen)

    def run():
        naive = run_continuous("naive", NaiveKSurge(q, k=5), evs)
        kccs = run_continuous("kccs", KCellCSPOT(q, k=5), evs)
        return naive.time_per_object_s, kccs.time_per_object_s

    t_naive, t_kccs = benchmark.pedantic(run, rounds=1, iterations=1)
    assert t_naive > 3 * t_kccs
