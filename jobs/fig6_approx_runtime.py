#!/usr/bin/env python
"""Figure 6 shape: runtime per object of GAPS and MGAPS vs window size and
query size (plus CCS for the three-orders-of-magnitude comparison).
(env: REPRO_N, REPRO_SEED)"""
from _common import emit, env_int, env_seed

from repro.core.cell_cspot import CellCSPOT
from repro.core.gap import GapSurge
from repro.core.mgap import MGapSurge
from repro.core.model import Query
from repro.experiments.datasets import SPECS, default_query, make_stream, to_objects
from repro.experiments.harness import events_of, run_continuous
from repro.experiments.tables import TABLE2_WINDOWS, format_rows

SIZE_FACTORS = [0.5, 1.0, 2.0, 3.0]


def main() -> None:
    n, seed = env_int("REPRO_N", 20_000), env_seed()
    win_rows, size_rows = [], []
    for name, wins in TABLE2_WINDOWS.items():
        objs = to_objects(make_stream(name, n, seed))
        for wlen in wins:
            q = default_query(SPECS[name], wlen)
            evs = events_of(objs, q.wlen)
            row = {"dataset": name, "window_h": round(wlen, 4)}
            for label, algo in (
                ("gaps", GapSurge(q)),
                ("mgaps", MGapSurge(q)),
                ("ccs", CellCSPOT(q, mode="ccs")),
            ):
                r = run_continuous(label, algo, evs, warmup_frac=0.1)
                row[f"{label}_us_per_obj"] = 1e6 * r.time_per_object_s
            win_rows.append(row)
        base_w = 5 / 60 if name == "Taxi" else 1.0
        for f in SIZE_FACTORS:
            q0 = default_query(SPECS[name], base_w)
            q = Query(a=q0.a * f, b=q0.b * f, wlen=q0.wlen, alpha=q0.alpha)
            evs = events_of(objs, q.wlen)
            row = {"dataset": name, "size_factor": f}
            for label, algo in (("gaps", GapSurge(q)), ("mgaps", MGapSurge(q))):
                r = run_continuous(label, algo, evs, warmup_frac=0.1)
                row[f"{label}_us_per_obj"] = 1e6 * r.time_per_object_s
            size_rows.append(row)
    emit(format_rows(win_rows, "Figure 6(a-c) shape — approx runtime (us/object) vs window"))
    emit(format_rows(size_rows, "Figure 6(d-f) shape — approx runtime (us/object) vs rect size"))


if __name__ == "__main__":
    main()
