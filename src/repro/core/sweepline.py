"""SL-CSPOT: bursty-point search on a snapshot (paper Section IV-B).

The paper sweeps a horizontal line over an interval structure. We implement
the equivalent coordinate-compressed 2-D sweep: every disjoint region of the
rectangle arrangement (Theorem 2) is represented by a candidate point, a 2-D
difference grid accumulates current/past coverage, and the burst score is
evaluated at every candidate. Complexity is the same ``O(n²)`` in the number
of rectangles searched.

Candidate coordinates are all rectangle edge coordinates **plus midpoints of
consecutive coordinates**. Midpoints are required because the burst score is
not monotone in the coverage set: a past-window rectangle *lowers* the score,
so the optimum can lie strictly inside an open slab whose closed boundary is
covered by a past rectangle.

``rects`` are tuples ``(x0, y0, w, win)`` with ``win ∈ {'c', 'p'}`` (current /
past window). Containment is closed. ``bounds`` (optional) restricts the
search domain to the closed box ``[bx0, bx1] × [by0, by1]`` — used for
cell-restricted searches; boundary duplication between neighbouring cells is
harmless for an argmax.
"""
from __future__ import annotations

from collections.abc import Iterable, Sequence

import numpy as np

from .model import Query

RectTuple = tuple[float, float, float, str]

#: number of SL-CSPOT invocations since interpreter start (test/bench probe)
SEARCH_COUNTER = {"n": 0}


def _candidates(
    edges: np.ndarray, lo: float | None, hi: float | None
) -> np.ndarray:
    """Sorted unique candidate coordinates: edges (clipped to [lo, hi]) plus
    the domain endpoints plus midpoints of consecutive candidates."""
    if lo is not None:
        inner = edges[(edges > lo) & (edges < hi)]
        base = np.concatenate([[lo], inner, [hi]])
    else:
        base = edges
    base = np.unique(base)
    if base.size >= 2:
        mids = (base[:-1] + base[1:]) * 0.5
        base = np.unique(np.concatenate([base, mids]))
    return base


def sl_cspot(
    rects: Iterable[RectTuple],
    q: Query,
    bounds: Sequence[float] | None = None,
) -> tuple[float, float, float]:
    """Return ``(px, py, score)`` — a point of maximum burst score.

    With no rectangles (or a domain nowhere covered by a current-window
    rectangle) the score is 0, attained anywhere; we return the domain's
    low corner (or the origin) for determinism.
    """
    SEARCH_COUNTER["n"] += 1
    rl = list(rects)
    fallback = (bounds[0], bounds[1]) if bounds is not None else (0.0, 0.0)
    if not rl:
        return fallback[0], fallback[1], 0.0

    rx = np.array([r[0] for r in rl])
    ry = np.array([r[1] for r in rl])
    rw = np.array([r[2] for r in rl], dtype=np.float64)
    cur = np.array([r[3] == "c" for r in rl])

    if bounds is not None:
        bx0, by0, bx1, by1 = bounds
        xs = _candidates(np.unique(np.concatenate([rx, rx + q.b])), bx0, bx1)
        ys = _candidates(np.unique(np.concatenate([ry, ry + q.a])), by0, by1)
    else:
        xs = _candidates(np.unique(np.concatenate([rx, rx + q.b])), None, None)
        ys = _candidates(np.unique(np.concatenate([ry, ry + q.a])), None, None)

    m, n = xs.size, ys.size
    i0 = np.searchsorted(xs, rx, side="left")
    i1 = np.searchsorted(xs, rx + q.b, side="right")
    j0 = np.searchsorted(ys, ry, side="left")
    j1 = np.searchsorted(ys, ry + q.a, side="right")

    dc = np.zeros((m + 1, n + 1))
    dp = np.zeros((m + 1, n + 1))
    hit = (i0 < i1) & (j0 < j1)  # rectangle covers at least one candidate
    for d, mask in ((dc, hit & cur), (dp, hit & ~cur)):
        if not mask.any():
            continue
        a0, a1 = i0[mask], i1[mask]
        b0, b1 = j0[mask], j1[mask]
        w = rw[mask]
        np.add.at(d, (a0, b0), w)
        np.add.at(d, (a1, b0), -w)
        np.add.at(d, (a0, b1), -w)
        np.add.at(d, (a1, b1), w)

    fc = dc.cumsum(axis=0).cumsum(axis=1)[:m, :n] / q.wlen
    fp = dp.cumsum(axis=0).cumsum(axis=1)[:m, :n] / q.wlen
    s = q.alpha * np.maximum(fc - fp, 0.0) + (1.0 - q.alpha) * fc

    flat = int(np.argmax(s))
    i, j = divmod(flat, n)
    score = float(s[i, j])
    if score <= 0.0:
        return fallback[0], fallback[1], 0.0
    return float(xs[i]), float(ys[j]), score


def brute_force_bursty_point(
    rects: Iterable[RectTuple],
    q: Query,
    bounds: Sequence[float] | None = None,
) -> tuple[float, float, float]:
    """Independent O(n·m²) reference: direct closed-containment tests at every
    candidate point. Used by tests to validate ``sl_cspot``."""
    rl = list(rects)
    fallback = (bounds[0], bounds[1]) if bounds is not None else (0.0, 0.0)
    if not rl:
        return fallback[0], fallback[1], 0.0
    rx = np.array([r[0] for r in rl])
    ry = np.array([r[1] for r in rl])
    rw = np.array([r[2] for r in rl], dtype=np.float64)
    cur = np.array([r[3] == "c" for r in rl])
    if bounds is not None:
        bx0, by0, bx1, by1 = bounds
        xs = _candidates(np.unique(np.concatenate([rx, rx + q.b])), bx0, bx1)
        ys = _candidates(np.unique(np.concatenate([ry, ry + q.a])), by0, by1)
    else:
        xs = _candidates(np.unique(np.concatenate([rx, rx + q.b])), None, None)
        ys = _candidates(np.unique(np.concatenate([ry, ry + q.a])), None, None)
    cov_x = (rx[None, :] <= xs[:, None]) & (xs[:, None] <= (rx + q.b)[None, :])
    cov_y = (ry[None, :] <= ys[:, None]) & (ys[:, None] <= (ry + q.a)[None, :])
    wc = np.where(cur, rw, 0.0)
    wp = np.where(cur, 0.0, rw)
    fc = np.einsum("ir,jr->ij", cov_x * wc, cov_y.astype(float)) / q.wlen
    fp = np.einsum("ir,jr->ij", cov_x * wp, cov_y.astype(float)) / q.wlen
    s = q.alpha * np.maximum(fc - fp, 0.0) + (1.0 - q.alpha) * fc
    flat = int(np.argmax(s))
    i, j = divmod(flat, ys.size)
    score = float(s[i, j])
    if score <= 0.0:
        return fallback[0], fallback[1], 0.0
    return float(xs[i]), float(ys[j]), score
