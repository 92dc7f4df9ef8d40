"""Bench for Figure 8's shape: per-stream-hour compute of CCS grows with the
arrival rate much faster than GAPS's."""
from repro.core.cell_cspot import CellCSPOT
from repro.core.gap import GapSurge
from repro.experiments.datasets import SPECS, default_query, make_stream, to_objects
from repro.experiments.harness import events_of, run_continuous

from benchmarks._util import BENCH_N


def test_bench_fig8_rate_scaling(benchmark):
    def run():
        out = {}
        for rs in (1.0, 5.0):
            pdf = make_stream("US", BENCH_N, 0, rate_scale=rs)
            objs = to_objects(pdf)
            timespan = float(pdf["t"].max() - pdf["t"].min())
            q = default_query(SPECS["US"], 1.0)
            evs = events_of(objs, q.wlen)
            for label, algo in (
                ("ccs", CellCSPOT(q, mode="ccs")),
                ("gaps", GapSurge(q)),
            ):
                r = run_continuous(label, algo, evs)
                out[(label, rs)] = r.wall_s / timespan
        return out

    th = benchmark.pedantic(run, rounds=1, iterations=1)
    # higher arrival rate -> more compute per stream-hour for both...
    assert th[("ccs", 5.0)] > th[("ccs", 1.0)]
    # ...but GAPS stays far cheaper than CCS at high rate (scalability claim)
    assert th[("gaps", 5.0)] < th[("ccs", 5.0)]
