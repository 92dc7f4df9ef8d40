"""Object/query model and the burst-score function (paper Section III).

Conventions used across the whole reproduction:

* A query region has size ``a × b`` where ``a`` is the **height** (y extent)
  and ``b`` the **width** (x extent). This matches the paper's grid
  (Definition 6): vertical lines ``x = i·b``, horizontal lines ``y = i·a``.
* At "present time" ``t`` the current window is ``W_c = (t−|W|, t]`` and the
  past window ``W_p = (t−2|W|, t−|W|]`` (half-open on the old side, so an
  object transitions out of a window exactly when ``t`` reaches
  ``t_c + |W|`` resp. ``t_c + 2|W|``).
* Rectangle objects (Definition 3) are **closed**: the rectangle generated
  from object ``o`` covers point ``p`` iff ``o.x ≤ p.x ≤ o.x + b`` and
  ``o.y ≤ p.y ≤ o.y + a``.
* Weights are assumed non-negative (the paper draws them uniformly from
  [1, 100]).
"""
from __future__ import annotations

from dataclasses import dataclass

NEW = "new"
GROWN = "grown"
EXPIRED = "expired"

#: numeric slack for score comparisons (floats accumulate via += / -=)
EPS = 1e-9


@dataclass(frozen=True)
class SpatialObject:
    """One element of the stream: weight, location, creation time."""

    oid: int
    x: float
    y: float
    w: float
    t: float


@dataclass(frozen=True)
class Query:
    """A SURGE query ⟨A, a×b, |W|⟩ plus the score parameter α.

    ``a`` is the region height (y), ``b`` the width (x). The preferred area A
    is taken as the whole space (the paper's default); restricting A is a
    pre-filter on the stream and is applied by the harness when needed.
    """

    a: float
    b: float
    wlen: float
    alpha: float = 0.5

    def __post_init__(self) -> None:
        if self.a <= 0 or self.b <= 0:
            raise ValueError("region size must be positive")
        if self.wlen <= 0:
            raise ValueError("window length must be positive")
        if not (0.0 <= self.alpha < 1.0):
            raise ValueError("alpha must be in [0, 1)")


def burst_score(fc: float, fp: float, alpha: float) -> float:
    """Definition 1: ``α·max(fc − fp, 0) + (1−α)·fc``."""
    return alpha * max(fc - fp, 0.0) + (1.0 - alpha) * fc


def point_in_rect(px: float, py: float, ox: float, oy: float, q: Query) -> bool:
    """Closed containment of point ``p`` in the rectangle object anchored at
    ``(ox, oy)`` (left-bottom corner, size ``b × a``)."""
    return ox <= px <= ox + q.b and oy <= py <= oy + q.a


def region_from_point(px: float, py: float, q: Query) -> tuple[float, float]:
    """Theorem 1: the bursty *region*'s left-bottom corner for bursty point p
    (p is the region's top-right corner)."""
    return px - q.b, py - q.a
