#!/usr/bin/env python
"""Figure 8 shape: scalability vs arrival rate. The stream is compressed in
time (rate_scale) and we report t_h = runtime / stream-timespan-in-hours —
the paper's "average time to process the objects arrived in one hour".
(env: REPRO_N, REPRO_SEED)"""
from _common import emit, env_int, env_seed

from repro.core.cell_cspot import CellCSPOT
from repro.core.gap import GapSurge
from repro.core.mgap import MGapSurge
from repro.experiments.datasets import SPECS, default_query, make_stream, to_objects
from repro.experiments.harness import events_of, run_continuous
from repro.experiments.tables import format_rows

RATE_SCALES = [1.0, 2.0, 5.0, 10.0]


def main() -> None:
    n, seed = env_int("REPRO_N", 20_000), env_seed()
    rows = []
    for name in SPECS:
        for rs in RATE_SCALES:
            pdf = make_stream(name, n, seed, rate_scale=rs)
            objs = to_objects(pdf)
            timespan_h = float(pdf["t"].max() - pdf["t"].min())
            wlen = 5 / 60 if name == "Taxi" else 1.0
            q = default_query(SPECS[name], wlen)
            if timespan_h < 3 * q.wlen:  # stream too short for the window
                continue
            evs = events_of(objs, q.wlen)
            row = {
                "dataset": name,
                "rate_scale": rs,
                "rate_per_h": round(len(objs) / timespan_h, 1),
            }
            for label, algo in (
                ("ccs", CellCSPOT(q, mode="ccs")),
                ("gaps", GapSurge(q)),
                ("mgaps", MGapSurge(q)),
            ):
                r = run_continuous(label, algo, evs)
                row[f"{label}_th_s"] = r.wall_s / timespan_h
            rows.append(row)
    emit(
        format_rows(
            rows,
            "Figure 8 shape — t_h (seconds of compute per stream-hour) vs arrival rate",
        )
    )


if __name__ == "__main__":
    main()
