"""Modified aG2 baseline (paper Section VII-A / Appendix J).

Reproduces the continuous-MaxRS structure of Amagata & Hara (EDBT'16) as the
paper modified it for SURGE:

* a coarse grid whose cell size is ``factor × q`` (the paper sets 10q),
  independent of the query rectangle;
* per cell, an **overlap graph** over the rectangle objects mapped to it —
  the O(n²)-space structure the paper criticises (we expose the edge count as
  the memory proxy);
* a per-rectangle upper bound (current-window weight of the rectangle plus
  its graph neighbours — no point inside the rectangle can score higher);
* branch-and-bound over rectangles in descending bound order, invoking
  SL-CSPOT restricted to a rectangle's extent (the paper's modification:
  SL-CSPOT replaces the MaxRS sweep), with dirty-flag result caching.

Exactness: a point with positive burst score is covered by at least one
current-window rectangle ``g``; every rectangle covering the point overlaps
``g`` and same-size overlapping rectangles always share a coarse cell, so the
search over ``{g} ∪ adj(g)`` within ``g``'s extent sees the full coverage.
"""
from __future__ import annotations

import heapq

from .events import Event
from .geometry import Grid, rects_overlap
from .model import EPS, EXPIRED, GROWN, NEW, Query, SpatialObject
from .sweepline import sl_cspot


class AG2:
    def __init__(self, q: Query, factor: float = 10.0) -> None:
        self.q = q
        self.grid = Grid(a=factor * q.a, b=factor * q.b)
        self.cells: dict[tuple[int, int], set[int]] = {}
        self.objs: dict[int, SpatialObject] = {}
        self.win: dict[int, str] = {}
        self.adj: dict[int, set[int]] = {}
        self.cur_sum: dict[int, float] = {}  # upper-bound numerator per rect
        self.cache: dict[int, tuple[float, float, float]] = {}
        self.dirty: set[int] = set()
        self._heap: list[tuple[float, int, int, float]] = []
        self._seq = 0
        self.stats = {"events": 0, "searches": 0, "trigger_events": 0}

    # -- bookkeeping -----------------------------------------------------
    def _ub(self, oid: int) -> float:
        return max(self.cur_sum[oid], 0.0) / self.q.wlen

    def _push(self, oid: int) -> None:
        u = self._ub(oid)
        heapq.heappush(self._heap, (-u, self._seq, oid, u))
        self._seq += 1

    def n_edges(self) -> int:
        """Overlap-graph edge count — the O(n²) memory proxy."""
        return sum(len(s) for s in self.adj.values()) // 2

    def process(self, ev: Event) -> None:
        self.stats["events"] += 1
        o = ev.obj
        oid = o.oid
        if ev.kind == NEW:
            self.objs[oid] = o
            self.win[oid] = "c"
            nbrs: set[int] = set()
            for key in self.grid.cells_overlapping(o, self.q):
                members = self.cells.setdefault(key, set())
                for other in members:
                    if rects_overlap(o, self.objs[other], self.q):
                        nbrs.add(other)
                members.add(oid)
            self.adj[oid] = nbrs
            self.cur_sum[oid] = o.w + sum(
                self.objs[n].w for n in nbrs if self.win[n] == "c"
            )
            for n in nbrs:
                self.adj[n].add(oid)
                self.cur_sum[n] += o.w
                self._push(n)
            self.dirty.update(nbrs)
            self.dirty.add(oid)
            self._push(oid)
        elif ev.kind == GROWN:
            self.win[oid] = "p"
            self.cur_sum[oid] -= o.w
            self._push(oid)
            for n in self.adj[oid]:
                self.cur_sum[n] -= o.w
                self._push(n)
            self.dirty.update(self.adj[oid])
            self.dirty.add(oid)
        else:  # EXPIRED
            for key in self.grid.cells_overlapping(o, self.q):
                members = self.cells.get(key)
                if members is not None:
                    members.discard(oid)
                    if not members:
                        del self.cells[key]
            self.dirty.update(self.adj[oid])
            for n in self.adj[oid]:
                self.adj[n].discard(oid)
                self._push(n)
            del self.adj[oid]
            del self.objs[oid]
            del self.win[oid]
            del self.cur_sum[oid]
            self.cache.pop(oid, None)
            self.dirty.discard(oid)

    # -- query -----------------------------------------------------------
    def _search_rect(self, oid: int) -> tuple[float, float, float]:
        o = self.objs[oid]
        group = [oid, *self.adj[oid]]
        rl = [
            (self.objs[g].x, self.objs[g].y, self.objs[g].w, self.win[g])
            for g in group
        ]
        res = sl_cspot(
            rl, self.q, bounds=(o.x, o.y, o.x + self.q.b, o.y + self.q.a)
        )
        self.cache[oid] = res
        self.dirty.discard(oid)
        self.stats["searches"] += 1
        return res

    def query(self) -> tuple[float, float, float] | None:
        best: tuple[float, float, float] | None = None
        consumed = []
        while self._heap:
            entry = self._heap[0]
            _, _, oid, upush = entry
            if oid not in self.objs or self._ub(oid) != upush:
                heapq.heappop(self._heap)
                continue
            if best is not None and upush <= best[2] + EPS:
                break
            heapq.heappop(self._heap)
            consumed.append(entry)
            if oid in self.dirty or oid not in self.cache:
                res = self._search_rect(oid)
            else:
                res = self.cache[oid]
            if best is None or res[2] > best[2]:
                best = res
        for entry in consumed:
            heapq.heappush(self._heap, entry)
        if best is None or best[2] <= EPS:
            return None
        return best

    def step(self, ev: Event) -> tuple[float, float, float] | None:
        before = self.stats["searches"]
        self.process(ev)
        out = self.query()
        if self.stats["searches"] > before:
            self.stats["trigger_events"] += 1
        return out
