#!/usr/bin/env python
"""Reproduce Table III: approximation ratio vs α (GAPS/MGAPS, US, 1 h
window), plus the Figure-7 observation (runtime vs α).
(env: REPRO_N, REPRO_SEED)"""
import time

from _common import emit, env_int, env_seed

from repro.core.cell_cspot import CellCSPOT
from repro.core.gap import GapSurge
from repro.core.mgap import MGapSurge
from repro.experiments.datasets import SPECS, default_query, make_stream, to_objects
from repro.experiments.harness import events_of, run_continuous
from repro.experiments.tables import TABLE3_ALPHAS, format_rows, table3_rows


def main() -> None:
    n, seed = env_int("REPRO_N", 20_000), env_seed()
    rows = table3_rows(n=n, seed=seed)
    emit(format_rows(rows, "Table III — approx ratio (%) vs alpha (US, 1h)"))

    # Figure 7 shape: runtime per object is insensitive to alpha.
    objs = to_objects(make_stream("US", n, seed))
    fig7 = []
    for alpha in TABLE3_ALPHAS:
        q = default_query(SPECS["US"], 1.0, alpha)
        evs = events_of(objs, q.wlen)
        row = {"alpha": alpha}
        for label, algo in (
            ("ccs", CellCSPOT(q, mode="ccs")),
            ("gaps", GapSurge(q)),
            ("mgaps", MGapSurge(q)),
        ):
            r = run_continuous(label, algo, evs, warmup_frac=0.1)
            row[f"{label}_us_per_obj"] = 1e6 * r.time_per_object_s
        fig7.append(row)
    emit(format_rows(fig7, "Figure 7 shape — runtime (us/object) vs alpha"))


if __name__ == "__main__":
    main()
