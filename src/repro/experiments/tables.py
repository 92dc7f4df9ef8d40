"""Builders for the paper's evaluation tables (I–IV), with the paper's own
numbers embedded so every job prints paper-vs-measured side by side.

Scale note: the paper streams 1,000,000 objects; we default to
``REPRO_N`` (env, default 20,000) objects over the *same stream duration*,
so window occupancy scales proportionally. Ratios (Tables II–IV) are
scale-free shapes; Table I's arrival rate scales by n/1M.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from ..core.cell_cspot import CellCSPOT
from ..core.gap import GapSurge
from ..core.mgap import MGapSurge
from ..core.model import Query
from .datasets import PAPER_TABLE1, SPECS, default_query, make_stream, to_objects
from .harness import approx_ratio_run, events_of, run_continuous


def repro_n(default: int = 20_000) -> int:
    return int(os.environ.get("REPRO_N", default))


# -- paper numbers ------------------------------------------------------

MIN = 1 / 60.0
TABLE2_WINDOWS = {
    "Taxi": [1 * MIN, 5 * MIN, 10 * MIN, 20 * MIN, 30 * MIN],
    "UK": [0.5, 1.0, 2.0, 5.0, 12.0],
    "US": [0.5, 1.0, 2.0, 5.0, 12.0],
}
PAPER_TABLE2 = {  # % of rectangle messages that trigger a search
    "Taxi": {"CCS": [4.85, 3.20, 2.56, 2.13, 1.95], "B-CCS": [92.63, 78.30, 70.00, 62.07, 57.90]},
    "UK": {"CCS": [0.34, 0.27, 0.23, 0.37, 0.48], "B-CCS": [37.79, 28.23, 22.76, 21.64, 14.57]},
    "US": {"CCS": [0.60, 0.68, 0.70, 0.52, 0.60], "B-CCS": [64.21, 52.29, 35.13, 9.0, 20.90]},
}

TABLE3_ALPHAS = [0.1, 0.3, 0.5, 0.7, 0.9]
PAPER_TABLE3 = {  # approx ratio (%) on US, 1h window
    "GAPS": [82.57, 81.76, 80.67, 77.23, 78.58],
    "MGAPS": [90.50, 89.44, 88.07, 87.80, 86.67],
}

TABLE4_WINDOWS = {
    "Taxi": [1 * MIN, 5 * MIN, 10 * MIN, 20 * MIN, 30 * MIN],
    "UK": [0.5, 1.0, 2.0, 12.0, 24.0],
    "US": [0.5, 1.0, 2.0, 12.0, 24.0],
}
PAPER_TABLE4 = {
    "Taxi": {"GAPS": [76.34, 73.90, 75.12, 75.70, 76.35], "MGAPS": [85.98, 85.14, 87.35, 88.34, 87.85]},
    "UK": {"GAPS": [90.22, 91.56, 91.98, 89.82, 92.44], "MGAPS": [93.13, 94.34, 93.76, 90.50, 92.82]},
    "US": {"GAPS": [84.23, 80.67, 89.70, 91.77, 80.10], "MGAPS": [88.61, 88.07, 91.44, 91.77, 84.34]},
}


# -- Table I ------------------------------------------------------------

def table1_rows(spark: SparkSession, n: int, seed: int = 0) -> list[dict]:
    """Dataset statistics from the generated streams via Spark aggregation."""
    from ..spark.io import stream_df

    rows = []
    for name, spec in SPECS.items():
        pdf = make_stream(name, n, seed)
        agg = (
            stream_df(spark, pdf)
            .agg(
                F.count("*").alias("n"),
                F.min("x").alias("x_min"),
                F.max("x").alias("x_max"),
                F.min("y").alias("y_min"),
                F.max("y").alias("y_max"),
                F.max("t").alias("t_max"),
                F.min("t").alias("t_min"),
            )
            .collect()[0]
        )
        span_h = agg["t_max"] - agg["t_min"]
        rows.append(
            {
                "dataset": name,
                "n": agg["n"],
                "rate_per_h": agg["n"] / span_h if span_h else float("nan"),
                "x_range": (round(agg["x_min"], 2), round(agg["x_max"], 2)),
                "y_range": (round(agg["y_min"], 2), round(agg["y_max"], 2)),
                "paper_n": PAPER_TABLE1[name]["n"],
                "paper_rate_per_h": PAPER_TABLE1[name]["rate_per_h"],
                "scaled_paper_rate_per_h": PAPER_TABLE1[name]["rate_per_h"]
                * n
                / PAPER_TABLE1[name]["n"],
            }
        )
    return rows


# -- Table II -----------------------------------------------------------

def table2_rows(
    n: int,
    seed: int = 0,
    datasets: list[str] | None = None,
    windows: dict[str, list[float]] | None = None,
    alpha: float = 0.5,
) -> list[dict]:
    """Search-trigger ratio (%) of CCS vs B-CCS per dataset × window size."""
    datasets = datasets or list(TABLE2_WINDOWS)
    windows = windows or TABLE2_WINDOWS
    rows = []
    for name in datasets:
        spec = SPECS[name]
        objs = to_objects(make_stream(name, n, seed))
        for wi, wlen in enumerate(windows[name]):
            q = default_query(spec, wlen, alpha)
            events = events_of(objs, q.wlen)
            res = {}
            for mode, label in (("ccs", "CCS"), ("bccs", "B-CCS")):
                r = run_continuous(
                    label, CellCSPOT(q, mode=mode), events, warmup_frac=0.1
                )
                res[label] = r
            paper = PAPER_TABLE2.get(name, {})
            full = windows is TABLE2_WINDOWS or windows == TABLE2_WINDOWS
            rows.append(
                {
                    "dataset": name,
                    "window_h": round(wlen, 4),
                    "ccs_pct": 100 * res["CCS"].trigger_ratio,
                    "bccs_pct": 100 * res["B-CCS"].trigger_ratio,
                    "ccs_us_per_obj": 1e6 * res["CCS"].time_per_object_s,
                    "bccs_us_per_obj": 1e6 * res["B-CCS"].time_per_object_s,
                    "paper_ccs_pct": paper["CCS"][wi] if full and paper else None,
                    "paper_bccs_pct": paper["B-CCS"][wi] if full and paper else None,
                }
            )
    return rows


# -- Tables III / IV ----------------------------------------------------

_APPROX = {
    "GAPS": lambda q: GapSurge(q),
    "MGAPS": lambda q: MGapSurge(q),
}


def table3_rows(
    n: int,
    seed: int = 0,
    alphas: list[float] | None = None,
    wlen: float = 1.0,
    dataset: str = "US",
    sample_every: int = 5,
) -> list[dict]:
    """Approximation ratio (%) of GAPS/MGAPS vs α (paper: US, 1 h window)."""
    alphas = alphas if alphas is not None else TABLE3_ALPHAS
    spec = SPECS[dataset]
    objs = to_objects(make_stream(dataset, n, seed))
    rows = []
    for ai, alpha in enumerate(alphas):
        q = default_query(spec, wlen, alpha)
        ratios = approx_ratio_run(
            objs, q, _APPROX, lambda qq: CellCSPOT(qq, mode="ccs"),
            sample_every=sample_every,
        )
        full = alphas == TABLE3_ALPHAS
        rows.append(
            {
                "dataset": dataset,
                "alpha": alpha,
                "gaps_pct": 100 * ratios["GAPS"],
                "mgaps_pct": 100 * ratios["MGAPS"],
                "paper_gaps_pct": PAPER_TABLE3["GAPS"][ai] if full else None,
                "paper_mgaps_pct": PAPER_TABLE3["MGAPS"][ai] if full else None,
                "bound_pct": 100 * (1 - alpha) / 4,
            }
        )
    return rows


def table4_rows(
    n: int,
    seed: int = 0,
    datasets: list[str] | None = None,
    windows: dict[str, list[float]] | None = None,
    alpha: float = 0.5,
    sample_every: int = 5,
) -> list[dict]:
    """Approximation ratio (%) of GAPS/MGAPS vs window size, per dataset."""
    datasets = datasets or list(TABLE4_WINDOWS)
    windows = windows or TABLE4_WINDOWS
    rows = []
    for name in datasets:
        spec = SPECS[name]
        objs = to_objects(make_stream(name, n, seed))
        for wi, wlen in enumerate(windows[name]):
            q = default_query(spec, wlen, alpha)
            ratios = approx_ratio_run(
                objs, q, _APPROX, lambda qq: CellCSPOT(qq, mode="ccs"),
                sample_every=sample_every,
            )
            paper = PAPER_TABLE4.get(name, {})
            full = windows is TABLE4_WINDOWS or windows == TABLE4_WINDOWS
            rows.append(
                {
                    "dataset": name,
                    "window_h": round(wlen, 4),
                    "gaps_pct": 100 * ratios["GAPS"],
                    "mgaps_pct": 100 * ratios["MGAPS"],
                    "paper_gaps_pct": paper["GAPS"][wi] if full and paper else None,
                    "paper_mgaps_pct": paper["MGAPS"][wi] if full and paper else None,
                }
            )
    return rows


# -- formatting ---------------------------------------------------------

def format_rows(rows: list[dict], title: str = "") -> str:
    """Fixed-width table printer for jobs/EXPERIMENTS.md."""
    if not rows:
        return f"{title}\n(empty)\n"
    cols = list(rows[0].keys())

    def fmt(v):
        if isinstance(v, float):
            return f"{v:.2f}"
        return str(v)

    widths = {
        c: max(len(c), *(len(fmt(r.get(c))) for r in rows)) for c in cols
    }
    lines = []
    if title:
        lines.append(title)
    lines.append(" | ".join(c.ljust(widths[c]) for c in cols))
    lines.append("-+-".join("-" * widths[c] for c in cols))
    for r in rows:
        lines.append(" | ".join(fmt(r.get(c)).ljust(widths[c]) for c in cols))
    return "\n".join(lines) + "\n"
