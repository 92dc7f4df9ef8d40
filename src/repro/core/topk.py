"""Top-k bursty region detection (paper Section VI).

* ``greedy_topk`` — Definition 9 applied literally on a snapshot: repeatedly
  find the bursty point over the remaining rectangles, then drop every
  rectangle covering it. The from-scratch reference for everything else.
* ``NaiveKSurge`` — the paper's naive continuous baseline: run the greedy
  snapshot computation after every event (reported ~100× slower than kCCS).
* ``KCellCSPOT`` — the kCCS extension (Algorithm 4): rectangle levels
  (``lvl[g] = i`` once g covers the i-th bursty point, hiding it from
  problems of higher order), per-cell per-level candidate caches, and a
  static bound shared across levels. We use *conservative invalidation* (an
  affected cell drops all cached level candidates) — correct by construction
  and validated per event against ``greedy_topk``; the paper's shape (runtime
  grows with k; kGAPS/kMGAPS nearly flat) is preserved.

kGAPS / kMGAPS live on :class:`repro.core.gap.GapSurge` /
:class:`repro.core.mgap.MGapSurge` as ``top_k``.
"""
from __future__ import annotations

import math

from .events import Event
from .geometry import base_grid
from .model import EPS, EXPIRED, GROWN, NEW, Query, SpatialObject, point_in_rect
from .sweepline import RectTuple, sl_cspot

_INF = math.inf


def greedy_topk(
    rects: list[RectTuple], q: Query, k: int
) -> list[tuple[float, float, float]]:
    """Top-k bursty points on a snapshot per Definition 9 (greedy removal)."""
    remaining = list(rects)
    out = []
    for _ in range(k):
        px, py, score = sl_cspot(remaining, q)
        out.append((px, py, score))
        if score <= EPS:
            continue  # nothing left to remove; later ranks are all zero
        remaining = [
            r
            for r in remaining
            if not (r[0] <= px <= r[0] + q.b and r[1] <= py <= r[1] + q.a)
        ]
    return out


class NaiveKSurge:
    """Recompute the greedy top-k from scratch on every event."""

    def __init__(self, q: Query, k: int) -> None:
        self.q = q
        self.k = k
        self.objs: dict[int, SpatialObject] = {}
        self.win: dict[int, str] = {}
        self.stats = {"events": 0}

    def step(self, ev: Event) -> list[tuple[float, float, float]]:
        self.stats["events"] += 1
        o = ev.obj
        if ev.kind == NEW:
            self.objs[o.oid] = o
            self.win[o.oid] = "c"
        elif ev.kind == GROWN:
            self.win[o.oid] = "p"
        else:
            del self.objs[o.oid]
            del self.win[o.oid]
        rl = [(x.x, x.y, x.w, self.win[x.oid]) for x in self.objs.values()]
        return greedy_topk(rl, self.q, self.k)


class _KCell:
    __slots__ = ("rects", "us", "cand", "cand_score", "valid")

    def __init__(self, k: int) -> None:
        self.rects: dict[int, SpatialObject] = {}
        self.us = 0.0  # static bound over *all* levels (⊇ every G[i:k])
        self.cand: list[tuple[float, float] | None] = [None] * k
        self.cand_score: list[float] = [0.0] * k
        self.valid: list[bool] = [False] * k


class KCellCSPOT:
    """Continuous top-k exact detection (Algorithm 4, conservative caching)."""

    def __init__(self, q: Query, k: int) -> None:
        self.q = q
        self.k = k
        self.grid = base_grid(q)
        self.cells: dict[tuple[int, int], _KCell] = {}
        self.objs: dict[int, SpatialObject] = {}
        self.win: dict[int, str] = {}
        self.lvl: dict[int, int] = {}  # oid -> level in [1, k]
        self.p: list[tuple[float, float, float] | None] = [None] * k
        self.cover: list[set[int]] = [set() for _ in range(k)]
        self.stats = {"events": 0, "searches": 0}

    # -- helpers ---------------------------------------------------------
    def _invalidate(self, key: tuple[int, int]) -> None:
        c = self.cells.get(key)
        if c is not None:
            c.valid = [False] * self.k

    def _dirty_obj(self, o: SpatialObject) -> None:
        for key in self.grid.cells_overlapping(o, self.q):
            self._invalidate(key)

    def _search_cell(self, key: tuple[int, int], c: _KCell, i: int) -> None:
        """Search cell at level i (rects with lvl ≥ i+1 in 1-based terms)."""
        rl = [
            (o.x, o.y, o.w, self.win[o.oid])
            for o in c.rects.values()
            if self.lvl[o.oid] >= i + 1
        ]
        px, py, score = sl_cspot(rl, self.q, bounds=self.grid.cell_bounds(key))
        c.cand[i] = (px, py)
        c.cand_score[i] = score
        c.valid[i] = True
        self.stats["searches"] += 1
        # Algorithm 4 lines 11–12: if no rectangle of the cell covers any of
        # the current bursty points (all levels are k), every level sees the
        # same rectangle set — share the result across levels.
        if all(self.lvl[oid] == self.k for oid in c.rects):
            for j in range(self.k):
                c.cand[j] = (px, py)
                c.cand_score[j] = score
                c.valid[j] = True

    def _coverers(self, px: float, py: float, min_lvl: int) -> set[int]:
        """Rectangles with lvl ≥ min_lvl covering point p — all of them live
        in the fine-grid cell containing p."""
        c = self.cells.get(self.grid.cell_of(px, py))
        if c is None:
            return set()
        return {
            oid
            for oid, o in c.rects.items()
            if self.lvl[oid] >= min_lvl and point_in_rect(px, py, o.x, o.y, self.q)
        }

    # -- event handling --------------------------------------------------
    def step(self, ev: Event) -> list[tuple[float, float, float] | None]:
        self.stats["events"] += 1
        o = ev.obj
        q = self.q
        keys = self.grid.cells_overlapping(o, q)
        if ev.kind == NEW:
            self.objs[o.oid] = o
            self.win[o.oid] = "c"
            self.lvl[o.oid] = self.k
            for key in keys:
                c = self.cells.get(key)
                if c is None:
                    c = _KCell(self.k)
                    self.cells[key] = c
                c.rects[o.oid] = o
                c.us += o.w / q.wlen
                self._invalidate(key)
        elif ev.kind == GROWN:
            self.win[o.oid] = "p"
            for key in keys:
                c = self.cells[key]
                c.us -= o.w / q.wlen
                self._invalidate(key)
        else:  # EXPIRED
            for key in keys:
                c = self.cells.get(key)
                if c is None:
                    continue
                c.rects.pop(o.oid, None)
                if not c.rects:
                    del self.cells[key]
                else:
                    self._invalidate(key)
            self.objs.pop(o.oid, None)
            self.win.pop(o.oid, None)
            self.lvl.pop(o.oid, None)
            for s in self.cover:
                s.discard(o.oid)

        # Solve the k cSPOT problems in order, maintaining levels.
        for i in range(self.k):
            old = self.p[i]
            best: tuple[float, float, float] | None = None
            # descending static-bound scan; us bounds every level's max score
            for key, c in sorted(
                self.cells.items(), key=lambda kv: -kv[1].us
            ):
                if best is not None and max(c.us, 0.0) <= best[2] + EPS:
                    break
                if not c.valid[i]:
                    self._search_cell(key, c, i)
                if c.cand[i] is not None and (
                    best is None or c.cand_score[i] > best[2]
                ):
                    best = (c.cand[i][0], c.cand[i][1], c.cand_score[i])
            if best is not None and best[2] <= EPS:
                best = None
            self.p[i] = best
            # Level maintenance (Algorithm 4 lines 15–17).
            new_cover = (
                self._coverers(best[0], best[1], i + 1) if best is not None else set()
            )
            freed = self.cover[i] - new_cover
            for oid in freed:
                if oid in self.lvl and self.lvl[oid] == i + 1:
                    self.lvl[oid] = self.k
                    self._dirty_obj(self.objs[oid])
            for oid in new_cover:
                if self.lvl[oid] != i + 1:
                    self.lvl[oid] = i + 1
                    self._dirty_obj(self.objs[oid])
            self.cover[i] = new_cover
        return list(self.p)
