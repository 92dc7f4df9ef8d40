"""Cell-CSPOT — the paper's exact continuous solution (Section IV-C).

One class implements the three evaluated exact variants:

* ``mode='ccs'``  — Cell-CSPOT: static **and** dynamic upper bounds
  (Definitions 7/8, Eqn 3) plus candidate-point reuse (Lemma 4).
* ``mode='bccs'`` — B-CCS: static upper bound only (candidate reuse kept; the
  dynamic bound is what pins ``U(c)`` to the candidate's score, so without it
  the query loop must keep scanning cells until ``U_s ≤ best`` — exactly why
  the paper observes far more searches, Table II).
* ``mode='base'`` — Base: no upper bounds; every affected cell is re-searched
  on every event (Appendix J).

Invariant (tested): in ``ccs`` mode a *valid* candidate point satisfies
``U(c) = min(U_s, U_d) = S(c.p)``, so the query can stop at the first fresh
max-heap entry whose cell has a valid candidate.

Lemma 4's margin condition ``f(c.p,W_c) − f(c.p,W_p) > 0`` is evaluated on the
**pre-event** state: a strictly positive pre-event margin is what makes the
candidate's score change by exactly ``w/|W_c|`` (new) resp. ``α·w/|W_p|``
(expired); a margin that flips sign would under-raise the candidate relative
to other points inside the event rectangle, so the candidate is invalidated.
"""
from __future__ import annotations

import heapq
import math

from .events import Event
from .geometry import base_grid
from .model import EPS, EXPIRED, GROWN, NEW, Query, SpatialObject, point_in_rect
from .sweepline import sl_cspot

_INF = math.inf


class _Cell:
    __slots__ = ("rects", "us", "ud", "cand", "cand_score", "valid")

    def __init__(self) -> None:
        self.rects: dict[int, SpatialObject] = {}
        self.us = 0.0  # static upper bound (current-window weight / |W|)
        self.ud = _INF  # dynamic upper bound; inf until first search
        self.cand: tuple[float, float] | None = None
        self.cand_score = 0.0
        self.valid = False


class CellCSPOT:
    """Continuous exact bursty-point detection over the event stream."""

    def __init__(self, q: Query, mode: str = "ccs") -> None:
        if mode not in ("ccs", "bccs", "base"):
            raise ValueError(f"unknown mode {mode!r}")
        self.q = q
        self.mode = mode
        self.grid = base_grid(q)
        self.cells: dict[tuple[int, int], _Cell] = {}
        self.win: dict[int, str] = {}  # oid -> 'c' | 'p'
        self._heap: list[tuple[float, int, tuple[int, int], float]] = []
        self._seq = 0
        self.stats = {"events": 0, "searches": 0, "trigger_events": 0}

    # -- bounds ----------------------------------------------------------
    def _u(self, c: _Cell) -> float:
        us = max(c.us, 0.0)  # guards against float drift of the running sum
        if self.mode == "ccs":
            return min(us, c.ud)
        if self.mode == "bccs":
            return us
        return c.cand_score if c.cand is not None else 0.0  # base

    def _push(self, key: tuple[int, int], c: _Cell) -> None:
        u = self._u(c)
        heapq.heappush(self._heap, (-u, self._seq, key, u))
        self._seq += 1

    def _point_fcfp(self, c: _Cell, px: float, py: float) -> tuple[float, float]:
        fc = fp = 0.0
        for oid, o in c.rects.items():
            if point_in_rect(px, py, o.x, o.y, self.q):
                if self.win[oid] == "c":
                    fc += o.w
                else:
                    fp += o.w
        return fc / self.q.wlen, fp / self.q.wlen

    # -- search ----------------------------------------------------------
    def _search(self, key: tuple[int, int], c: _Cell) -> None:
        rl = [
            (o.x, o.y, o.w, self.win[o.oid]) for o in c.rects.values()
        ]
        px, py, score = sl_cspot(rl, self.q, bounds=self.grid.cell_bounds(key))
        c.cand = (px, py)
        c.cand_score = score
        c.valid = True
        if self.mode == "ccs":
            c.ud = score
        self.stats["searches"] += 1

    # -- event handling --------------------------------------------------
    def process(self, ev: Event) -> None:
        """Apply one new/grown/expired event (Algorithm 2, lines 1–3)."""
        self.stats["events"] += 1
        o = ev.obj
        q = self.q
        dwc = o.w / q.wlen
        # Window state for new/grown is set up-front (searches inside the cell
        # loop need the post-event state; the Lemma-4 check never reads the
        # event object's own state pre-event). Expired is removed *after* the
        # loop: its pre-event 'p' contribution is what the Lemma-4 margin and
        # per-cell searches must still see while sibling cells are updated.
        if ev.kind == NEW:
            self.win[o.oid] = "c"
        elif ev.kind == GROWN:
            self.win[o.oid] = "p"
        for key in self.grid.cells_overlapping(o, q):
            c = self.cells.get(key)
            if c is None:
                c = _Cell()
                self.cells[key] = c
            # Lemma 4 candidate maintenance — pre-event state.
            if self.mode in ("ccs", "bccs") and c.valid and c.cand is not None:
                covers = point_in_rect(c.cand[0], c.cand[1], o.x, o.y, q)
                if ev.kind == GROWN:
                    if covers:
                        c.valid, c.cand = False, None
                elif covers:
                    fc, fp = self._point_fcfp(c, *c.cand)
                    if fc - fp > EPS:
                        c.cand_score += dwc if ev.kind == NEW else q.alpha * dwc
                    else:
                        c.valid, c.cand = False, None
                else:
                    c.valid, c.cand = False, None
            # Membership and upper bounds (Definition 7, Eqn 3).
            if ev.kind == NEW:
                c.rects[o.oid] = o
                c.us += dwc
                if c.ud != _INF:
                    c.ud += dwc
            elif ev.kind == GROWN:
                c.us -= dwc
            else:  # EXPIRED
                c.rects.pop(o.oid, None)
                if c.ud != _INF:
                    c.ud += q.alpha * dwc
            if not c.rects:
                del self.cells[key]  # empty cell: max score 0; stale heap
                continue  # entries resolve against the missing key
            if self.mode == "base":
                self._search(key, c)
            self._push(key, c)
        if ev.kind == EXPIRED:
            self.win.pop(o.oid, None)

    # -- query -----------------------------------------------------------
    def query(self) -> tuple[float, float, float] | None:
        """Current bursty point ``(px, py, score)``; None iff max score is 0.

        Scans cells in descending ``U(c)`` (lazy max-heap with staleness
        checks), searching invalid candidates, until the next bound cannot
        beat the best candidate found (Algorithm 2's loop, in the form that
        is provably correct for all three bound modes).
        """
        best: tuple[float, float, float] | None = None
        consumed: list[tuple[float, int, tuple[int, int], float]] = []
        while self._heap:
            entry = self._heap[0]
            negu, _, key, upush = entry
            c = self.cells.get(key)
            if c is None or self._u(c) != upush:
                heapq.heappop(self._heap)  # stale
                continue
            if best is not None and upush <= best[2] + EPS:
                break
            heapq.heappop(self._heap)
            if not (c.valid and c.cand is not None):
                self._search(key, c)
                self._push(key, c)
            else:
                consumed.append(entry)
            if c.cand is not None and (best is None or c.cand_score > best[2]):
                best = (c.cand[0], c.cand[1], c.cand_score)
        for entry in consumed:
            heapq.heappush(self._heap, entry)
        if best is None or best[2] <= EPS:
            return None
        return best

    def step(self, ev: Event) -> tuple[float, float, float] | None:
        """Process one event and report the bursty point; tracks whether the
        event triggered any SL-CSPOT invocation (Table II's metric)."""
        before = self.stats["searches"]
        self.process(ev)
        out = self.query()
        if self.stats["searches"] > before:
            self.stats["trigger_events"] += 1
        return out

    @property
    def trigger_ratio(self) -> float:
        """Fraction of processed events that triggered ≥1 cell search."""
        n = self.stats["events"]
        return self.stats["trigger_events"] / n if n else 0.0
