"""MGAP-SURGE — multi-grid approximate solution (paper Section V-B).

Runs GAP-SURGE on the four half-cell-shifted grids and reports the best of
the four answers (Algorithm 5). Top-k (Algorithm 7): take the top-4k cells of
each grid, merge the ≤16k candidates, and greedily keep the top-k
non-overlapping ones.
"""
from __future__ import annotations

from .events import Event
from .geometry import shifted_grids
from .model import Query
from .gap import GapSurge

Bounds = tuple[float, float, float, float]


def _boxes_overlap(b1: Bounds, b2: Bounds) -> bool:
    """Open-interior overlap of two half-open cell boxes."""
    return b1[0] < b2[2] and b2[0] < b1[2] and b1[1] < b2[3] and b2[1] < b1[3]


class MGapSurge:
    def __init__(self, q: Query) -> None:
        self.q = q
        self.gaps = [GapSurge(q, grid=g) for g in shifted_grids(q)]
        self.stats = {"events": 0}

    def process(self, ev: Event) -> None:
        self.stats["events"] += 1
        for g in self.gaps:
            g.process(ev)

    def query(self):
        """Best region among the four grids: ``(key, bounds, score)``."""
        best = None
        for g in self.gaps:
            r = g.query()
            if r is not None and (best is None or r[2] > best[2]):
                best = r
        return best

    def step(self, ev: Event):
        self.process(ev)
        return self.query()

    def top_k(self, k: int):
        """Algorithm 7: merge top-4k per grid, keep top-k non-overlapping."""
        merged = []
        for g in self.gaps:
            merged.extend(g.top_k(4 * k))
        merged.sort(key=lambda t: (-t[2], t[1]))
        picked: list[tuple] = []
        for cand in merged:
            if len(picked) >= k:
                break
            if all(not _boxes_overlap(cand[1], p[1]) for p in picked):
                picked.append(cand)
        return picked
