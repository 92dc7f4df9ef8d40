"""Shared helpers for the test suite: tiny random streams and snapshots."""
from __future__ import annotations

import numpy as np

from repro.core.model import Query, SpatialObject
from repro.core.sweepline import RectTuple


def random_rects(
    n: int, q: Query, seed: int, *, span: float = 10.0, frac_past: float = 0.4
) -> list[RectTuple]:
    """Random snapshot of rectangle objects: (x0, y0, w, 'c'|'p')."""
    g = np.random.default_rng(seed)
    xs = g.random(n) * span
    ys = g.random(n) * span
    ws = g.random(n) * 10.0 + 0.1
    wins = np.where(g.random(n) < frac_past, "p", "c")
    return [
        (float(x), float(y), float(w), str(win))
        for x, y, w, win in zip(xs, ys, ws, wins)
    ]


def random_stream(
    n: int,
    seed: int,
    *,
    span: float = 10.0,
    duration: float = 10.0,
    int_weights: bool = False,
) -> list[SpatialObject]:
    """Random object stream sorted by creation time; float weights by default
    so greedy top-k tie-breaking is unambiguous."""
    g = np.random.default_rng(seed)
    ts = np.sort(g.random(n) * duration)
    xs = g.random(n) * span
    ys = g.random(n) * span
    if int_weights:
        ws = g.integers(1, 101, n).astype(float)
    else:
        ws = g.random(n) * 10.0 + 0.1
    return [
        SpatialObject(oid=i, x=float(xs[i]), y=float(ys[i]), w=float(ws[i]), t=float(ts[i]))
        for i in range(n)
    ]


def stream_pdf(
    n: int,
    seed: int,
    *,
    span: float = 10.0,
    duration: float = 100.0,
    t0: float = 0.0,
):
    """Pandas stream frame (oid, x, y, w, t) sorted by t — Spark-layer input.

    Times are continuous uniforms, so pane-boundary collisions (where the
    paper's windows and Structured Streaming's ``window`` disagree) have
    probability zero.
    """
    import pandas as pd

    g = np.random.default_rng(seed)
    t = np.sort(t0 + g.random(n) * duration)
    return pd.DataFrame(
        {
            "oid": np.arange(n, dtype=np.int64),
            "x": g.random(n) * span,
            "y": g.random(n) * span,
            "w": g.integers(1, 101, n).astype(float),
            "t": t,
        }
    )


def pdf_to_objects(pdf) -> list[SpatialObject]:
    return [
        SpatialObject(oid=int(r.oid), x=float(r.x), y=float(r.y), w=float(r.w), t=float(r.t))
        for r in pdf.itertuples()
    ]


def snapshot_rects(
    objs: list[SpatialObject], wlen: float, t_now: float
) -> list[RectTuple]:
    """Rectangle-object snapshot of the two windows at time t_now."""
    out: list[RectTuple] = []
    for o in objs:
        if t_now - wlen < o.t <= t_now:
            out.append((o.x, o.y, o.w, "c"))
        elif t_now - 2 * wlen < o.t <= t_now - wlen:
            out.append((o.x, o.y, o.w, "p"))
    return out
