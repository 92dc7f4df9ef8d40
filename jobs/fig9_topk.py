#!/usr/bin/env python
"""Figure 9 shape: top-k detection — kCCS/kGAPS/kMGAPS runtime per object vs
window size (fixed k=5) and vs k (default window); plus the naive greedy
baseline on a small prefix (paper: ~100× slower than kCCS).
(env: REPRO_TOPK_N — default 4000 — REPRO_SEED)"""
from _common import emit, env_int, env_seed

from repro.core.gap import GapSurge
from repro.core.mgap import MGapSurge
from repro.core.topk import KCellCSPOT, NaiveKSurge
from repro.experiments.datasets import SPECS, default_query, make_stream, to_objects
from repro.experiments.harness import events_of, run_continuous
from repro.experiments.tables import format_rows

K_VALUES = [3, 5, 7, 9]
WINDOWS = {"Taxi": [5 / 60, 10 / 60, 30 / 60], "UK": [0.5, 1.0, 2.0], "US": [0.5, 1.0, 2.0]}


class _KGaps:
    """Continuous kGAPS wrapper: per event, update and emit top-k cells."""

    def __init__(self, q, k):
        self.g, self.k = GapSurge(q), k
        self.stats = self.g.stats

    def step(self, ev):
        self.g.process(ev)
        return self.g.top_k(self.k)


class _KMGaps:
    def __init__(self, q, k):
        self.g, self.k = MGapSurge(q), k
        self.stats = self.g.stats

    def step(self, ev):
        self.g.process(ev)
        return self.g.top_k(self.k)


def main() -> None:
    n, seed = env_int("REPRO_TOPK_N", 4_000), env_seed()
    win_rows, k_rows = [], []
    for name in WINDOWS:
        objs = to_objects(make_stream(name, n, seed))
        for wlen in WINDOWS[name]:
            q = default_query(SPECS[name], wlen)
            evs = events_of(objs, q.wlen)
            row = {"dataset": name, "window_h": round(wlen, 4), "k": 5}
            for label, algo in (
                ("kccs", KCellCSPOT(q, k=5)),
                ("kgaps", _KGaps(q, 5)),
                ("kmgaps", _KMGaps(q, 5)),
            ):
                r = run_continuous(label, algo, evs, warmup_frac=0.1)
                row[f"{label}_us_per_obj"] = 1e6 * r.time_per_object_s
            win_rows.append(row)
        base_w = 5 / 60 if name == "Taxi" else 1.0
        for k in K_VALUES:
            q = default_query(SPECS[name], base_w)
            evs = events_of(objs, q.wlen)
            row = {"dataset": name, "k": k}
            for label, algo in (
                ("kccs", KCellCSPOT(q, k=k)),
                ("kgaps", _KGaps(q, k)),
                ("kmgaps", _KMGaps(q, k)),
            ):
                r = run_continuous(label, algo, evs, warmup_frac=0.1)
                row[f"{label}_us_per_obj"] = 1e6 * r.time_per_object_s
            k_rows.append(row)
    emit(format_rows(win_rows, "Figure 9(a-c) shape — top-k runtime (us/object) vs window (k=5)"))
    emit(format_rows(k_rows, "Figure 9(d-f) shape — top-k runtime (us/object) vs k"))

    # Naive baseline: full greedy recomputation per event, small prefix of US.
    objs = to_objects(make_stream("US", min(n, 800), seed))
    q = default_query(SPECS["US"], 1.0)
    evs = events_of(objs, q.wlen)
    naive = run_continuous("naive", NaiveKSurge(q, k=5), evs, warmup_frac=0.1)
    kccs = run_continuous("kccs", KCellCSPOT(q, k=5), evs, warmup_frac=0.1)
    emit(
        format_rows(
            [
                {
                    "n_prefix": len(objs),
                    "naive_us_per_obj": 1e6 * naive.time_per_object_s,
                    "kccs_us_per_obj": 1e6 * kccs.time_per_object_s,
                    "slowdown_x": naive.time_per_object_s
                    / max(kccs.time_per_object_s, 1e-12),
                }
            ],
            "Naive top-k vs kCCS (US prefix)",
        )
    )


if __name__ == "__main__":
    main()
