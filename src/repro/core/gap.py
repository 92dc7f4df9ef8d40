"""GAP-SURGE — grid-based approximate solution (paper Section V-A).

Each grid cell of size ``b × a`` is a candidate region; per event only the
cell containing the object is updated in O(1), and a lazy max-heap reports
the best cell in O(log n). Approximation ratio ``(1−α)/4`` (Theorem 3).

Algorithm 3 as printed omits α in the score update (line 5); that is a typo —
we use Definition 1's burst score, consistent with the rest of the paper.
"""
from __future__ import annotations

import heapq

from .events import Event
from .geometry import Grid, base_grid
from .model import EPS, EXPIRED, GROWN, NEW, Query, burst_score


class GapSurge:
    """Continuous grid-cell approximation; ``grid`` defaults to Grid 1."""

    def __init__(self, q: Query, grid: Grid | None = None) -> None:
        self.q = q
        self.grid = grid if grid is not None else base_grid(q)
        self.cells: dict[tuple[int, int], list[float]] = {}  # key -> [wc, wp]
        self._heap: list[tuple[float, int, tuple[int, int], float]] = []
        self._seq = 0
        self.stats = {"events": 0}

    def _score(self, sums: list[float]) -> float:
        return burst_score(
            sums[0] / self.q.wlen, sums[1] / self.q.wlen, self.q.alpha
        )

    def process(self, ev: Event) -> None:
        """Algorithm 3 lines 1–5 (O(1) plus one heap push)."""
        self.stats["events"] += 1
        o = ev.obj
        key = self.grid.cell_of(o.x, o.y)
        sums = self.cells.get(key)
        if sums is None:
            sums = [0.0, 0.0]
            self.cells[key] = sums
        if ev.kind == NEW:
            sums[0] += o.w
        elif ev.kind == GROWN:
            sums[0] -= o.w
            sums[1] += o.w
        else:  # EXPIRED
            sums[1] -= o.w
        if abs(sums[0]) < 1e-12 and abs(sums[1]) < 1e-12:
            self.cells.pop(key)
            return
        s = self._score(sums)
        heapq.heappush(self._heap, (-s, self._seq, key, s))
        self._seq += 1

    def query(self) -> tuple[tuple[int, int], tuple[float, float, float, float], float] | None:
        """Best cell as ``(key, bounds, score)``; None iff the max score is 0."""
        while self._heap:
            negs, _, key, spush = self._heap[0]
            sums = self.cells.get(key)
            if sums is None or self._score(sums) != spush:
                heapq.heappop(self._heap)
                continue
            if spush <= EPS:
                return None
            return key, self.grid.cell_bounds(key), spush
        return None

    def step(self, ev: Event):
        self.process(ev)
        return self.query()

    def top_k(self, k: int) -> list[tuple[tuple[int, int], tuple[float, float, float, float], float]]:
        """Top-k cells by burst score (Algorithm 6). Cells of one grid are
        disjoint, so the per-cell ranking *is* the greedy Definition 9 result
        restricted to grid-aligned regions."""
        scored = sorted(
            ((self._score(s), key) for key, s in self.cells.items()),
            key=lambda t: (-t[0], t[1]),
        )
        return [
            (key, self.grid.cell_bounds(key), s) for s, key in scored[:k] if s > EPS
        ]
