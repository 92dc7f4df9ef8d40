#!/usr/bin/env python
"""Figure 5 shape: runtime per object of the exact solutions (CCS, B-CCS,
Base, aG2) vs window size and vs query-rectangle size; plus the aG2
overlap-graph edge count (its O(n²) memory proxy).
(env: REPRO_FIG5_N — default 8000 — REPRO_SEED)"""
from _common import emit, env_int, env_seed

from repro.core.ag2 import AG2
from repro.core.cell_cspot import CellCSPOT
from repro.core.model import Query
from repro.experiments.datasets import SPECS, default_query, make_stream, to_objects
from repro.experiments.harness import events_of, run_continuous
from repro.experiments.tables import format_rows

WINDOWS = {"Taxi": [5 / 60, 10 / 60, 30 / 60], "UK": [0.5, 1.0, 2.0], "US": [0.5, 1.0, 2.0]}
SIZE_FACTORS = [0.5, 1.0, 2.0, 3.0]


def _algos(q):
    return [
        ("ccs", CellCSPOT(q, mode="ccs")),
        ("bccs", CellCSPOT(q, mode="bccs")),
        ("base", CellCSPOT(q, mode="base")),
        ("ag2", AG2(q)),
    ]


def main() -> None:
    n, seed = env_int("REPRO_FIG5_N", 8_000), env_seed()
    win_rows, size_rows = [], []
    for name in WINDOWS:
        objs = to_objects(make_stream(name, n, seed))
        for wlen in WINDOWS[name]:
            q = default_query(SPECS[name], wlen)
            evs = events_of(objs, q.wlen)
            row = {"dataset": name, "window_h": round(wlen, 4)}
            for label, algo in _algos(q):
                r = run_continuous(label, algo, evs, warmup_frac=0.1)
                row[f"{label}_us_per_obj"] = 1e6 * r.time_per_object_s
                if label == "ag2":
                    row["ag2_final_edges"] = algo.n_edges()  # graph size at end of run
            win_rows.append(row)
        # query-size sweep at the default window (1h; 5min for Taxi)
        base_w = 5 / 60 if name == "Taxi" else 1.0
        for f in SIZE_FACTORS:
            q0 = default_query(SPECS[name], base_w)
            q = Query(a=q0.a * f, b=q0.b * f, wlen=q0.wlen, alpha=q0.alpha)
            evs = events_of(objs, q.wlen)
            row = {"dataset": name, "size_factor": f}
            for label, algo in _algos(q):
                r = run_continuous(label, algo, evs, warmup_frac=0.1)
                row[f"{label}_us_per_obj"] = 1e6 * r.time_per_object_s
            size_rows.append(row)
    emit(format_rows(win_rows, "Figure 5(a-c) shape — exact runtime (us/object) vs window"))
    emit(format_rows(size_rows, "Figure 5(d-f) shape — exact runtime (us/object) vs rect size"))


if __name__ == "__main__":
    main()
