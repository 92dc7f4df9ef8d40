"""Synthetic UK/US/Taxi-like spatial-object streams (paper Table I).

Substitution (documented in DESIGN.md): the paper's real datasets (geo-tagged
tweets, Rome taxi traces) are not available offline, so we generate streams
that preserve what the algorithms actually consume:

* **temporal profile** — Poisson-like arrivals over the paper's real stream
  duration (UK 174 h, US 59.5 h, Taxi 55.1 h, from Table I's counts/rates),
  so relative window occupancies match the paper's at any window size;
* **spatial skew** — a mixture of Gaussian hotspots over a uniform
  background (cities/airports in the real data);
* **genuine bursts** — localized episodes, tightly clustered in space
  (a few query-cells wide) and time, on top of the background — these are
  what SURGE is designed to detect;
* **weights** — uniform integers in [1, 100], exactly the paper's choice.

Table I's printed lat/lon ranges for UK and US are OCR-garbled (e.g. "UK
latitude 139.0–150.9"); we use real bounding boxes for UK/US and the paper's
(sane, Rome) box for Taxi. Time unit is **hours** throughout the experiment
layer; multiply by 3600 for the Spark streaming (seconds) layer.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from ..core.model import Query, SpatialObject


@dataclass(frozen=True)
class DatasetSpec:
    name: str
    x_range: tuple[float, float]  # longitude
    y_range: tuple[float, float]  # latitude
    n_paper: int  # number of spatial objects in the paper's dataset
    rate_paper: float  # paper arrival rate, objects/hour (Table I)

    @property
    def duration_h(self) -> float:
        """Real timespan of the paper's stream — we keep it, scaling rate."""
        return self.n_paper / self.rate_paper

    @property
    def x_span(self) -> float:
        return self.x_range[1] - self.x_range[0]

    @property
    def y_span(self) -> float:
        return self.y_range[1] - self.y_range[0]


SPECS: dict[str, DatasetSpec] = {
    "UK": DatasetSpec("UK", (-8.0, 2.0), (49.0, 59.0), 1_000_000, 5747.0),
    "US": DatasetSpec("US", (-125.0, -66.0), (25.0, 49.0), 1_000_000, 16802.0),
    "Taxi": DatasetSpec("Taxi", (12.0, 12.9), (41.6, 42.2), 1_000_000, 18145.0),
}

#: paper's Table I rows, for side-by-side printing
PAPER_TABLE1 = {
    "UK": {"n": 1_000_000, "rate_per_h": 5_747},
    "US": {"n": 1_000_000, "rate_per_h": 16_802},
    "Taxi": {"n": 1_000_000, "rate_per_h": 18_145},
}


def default_query(spec: DatasetSpec, wlen_h: float, alpha: float = 0.5) -> Query:
    """The paper's default query size q: 1/1000 of each coordinate range."""
    return Query(a=spec.y_span / 1000.0, b=spec.x_span / 1000.0, wlen=wlen_h, alpha=alpha)


def make_stream(
    name: str,
    n: int,
    seed: int = 0,
    *,
    rate_scale: float = 1.0,
    hotspot_frac: float = 0.7,
    n_hotspots: int = 3,
    sigma_div: float = 400.0,
    burst_frac: float = 0.15,
    n_bursts: int = 12,
) -> pd.DataFrame:
    """Generate a stream (oid, x, y, w, t[h]) sorted by time.

    ``rate_scale > 1`` compresses arrival times (higher arrival rate, shorter
    duration) — the paper's Figure 8 scalability knob ("we stretch the stream
    to change its arrival rate").

    Hotspots are tight (σ = span/``sigma_div`` ≈ 2.5 query cells): a dense
    region several cells wide with a few objects per cell per window is the
    regime where the static upper bound systematically overshoots the true
    max (a cell overlaps ~4× the rectangles that can cover any single point)
    — the regime the paper's city-centre tweet/taxi data lives in, which
    drives Table II and Figure 5. With uniform σ = span/40 hotspots the
    per-cell occupancy at our scaled-down n would be ≪ 1 and both bound
    strategies would look alike.
    """
    spec = SPECS[name]
    g = np.random.default_rng(seed * 7919 + hash(name) % 1000)
    duration = spec.duration_h / rate_scale

    n_burst = int(n * burst_frac)
    n_bg = n - n_burst

    # background: hotspot mixture + uniform
    hx = g.uniform(*spec.x_range, n_hotspots)
    hy = g.uniform(*spec.y_range, n_hotspots)
    sigma_x = spec.x_span / sigma_div
    sigma_y = spec.y_span / sigma_div
    pick = g.integers(0, n_hotspots, n_bg)
    in_hot = g.random(n_bg) < hotspot_frac
    bx = np.where(
        in_hot, hx[pick] + g.normal(0, sigma_x, n_bg), g.uniform(*spec.x_range, n_bg)
    )
    by = np.where(
        in_hot, hy[pick] + g.normal(0, sigma_y, n_bg), g.uniform(*spec.y_range, n_bg)
    )
    bt = g.uniform(0, duration, n_bg)

    # burst episodes: tight in space (σ ≈ one query cell, so objects stack
    # into few cells) and time — distribute n_burst exactly across episodes
    sizes = np.full(max(n_bursts, 1), n_burst // max(n_bursts, 1))
    sizes[: n_burst - sizes.sum()] += 1
    ex, ey, et = [], [], []
    for m in sizes:
        if m == 0:
            continue
        cx = g.uniform(*spec.x_range)
        cy = g.uniform(*spec.y_range)
        tc = g.uniform(0.15, 0.95) * duration
        ep_dur = max(duration / 50.0, 1e-3)
        ex.append(cx + g.normal(0, spec.x_span / 1000.0, m))
        ey.append(cy + g.normal(0, spec.y_span / 1000.0, m))
        et.append(g.uniform(tc - ep_dur / 2, tc + ep_dur / 2, m))
    if ex:
        ex = np.concatenate(ex)
        ey = np.concatenate(ey)
        et = np.concatenate(et)
    else:  # pragma: no cover - n_burst=0 corner
        ex = ey = et = np.array([])

    x = np.clip(np.concatenate([bx, ex]), *spec.x_range)
    y = np.clip(np.concatenate([by, ey]), *spec.y_range)
    t = np.clip(np.concatenate([bt, et]), 0, duration)
    w = g.integers(1, 101, len(x)).astype(float)

    order = np.argsort(t, kind="stable")
    return pd.DataFrame(
        {
            "oid": np.arange(len(x), dtype=np.int64),
            "x": x[order],
            "y": y[order],
            "w": w[order],
            "t": t[order],
        }
    )


def to_objects(pdf: pd.DataFrame) -> list[SpatialObject]:
    """Pandas stream frame → core-model objects (driver-side algorithms)."""
    return [
        SpatialObject(
            oid=int(r.oid), x=float(r.x), y=float(r.y), w=float(r.w), t=float(r.t)
        )
        for r in pdf.itertuples()
    ]
