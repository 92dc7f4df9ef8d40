"""Stream → event sequence (paper Section IV-C).

Three event kinds per object ``o``:

* ``new``     at time ``o.t``            — enters the current window,
* ``grown``   at time ``o.t + |W|``      — leaves W_c, enters W_p,
* ``expired`` at time ``o.t + 2|W|``     — leaves W_p.

With ``W_c = (t−|W|, t]`` the transition is effective exactly *at* the
boundary instant, so pending transitions with effective time ``≤ t`` are
emitted **before** the new arrival at ``t``. Ties between transitions are
broken deterministically: expired < grown < new, then arrival order.
"""
from __future__ import annotations

import heapq
from collections.abc import Iterable, Iterator
from dataclasses import dataclass

from .model import EXPIRED, GROWN, NEW, SpatialObject

_KIND_PRIO = {EXPIRED: 0, GROWN: 1, NEW: 2}


@dataclass(frozen=True)
class Event:
    """One window-transition event ⟨g, l⟩ with its effective time."""

    time: float
    kind: str
    obj: SpatialObject


def event_stream(
    objects: Iterable[SpatialObject],
    wlen: float,
    *,
    drain: bool = False,
) -> Iterator[Event]:
    """Yield the interleaved new/grown/expired event sequence.

    ``objects`` must be sorted by creation time. With ``drain=True`` the
    trailing grown/expired events after the last arrival are emitted too
    (windows empty out); by default iteration stops at the last arrival,
    matching the paper's workload ("run each algorithm for N new arriving
    spatial objects").
    """
    pending: list[tuple[float, int, int, str, SpatialObject]] = []
    last_t = None
    for o in objects:
        if last_t is not None and o.t < last_t:
            raise ValueError("objects must be sorted by creation time")
        last_t = o.t
        while pending and pending[0][0] <= o.t:
            t, _, _, kind, obj = heapq.heappop(pending)
            yield Event(t, kind, obj)
        yield Event(o.t, NEW, o)
        heapq.heappush(pending, (o.t + wlen, _KIND_PRIO[GROWN], o.oid, GROWN, o))
        heapq.heappush(pending, (o.t + 2 * wlen, _KIND_PRIO[EXPIRED], o.oid, EXPIRED, o))
    if drain:
        while pending:
            t, _, _, kind, obj = heapq.heappop(pending)
            yield Event(t, kind, obj)


def window_contents(
    objects: Iterable[SpatialObject], wlen: float, t_now: float
) -> tuple[list[SpatialObject], list[SpatialObject]]:
    """Objects in (W_c, W_p) at time ``t_now`` — the from-scratch reference
    used by tests to validate every continuous algorithm."""
    cur, past = [], []
    for o in objects:
        if t_now - wlen < o.t <= t_now:
            cur.append(o)
        elif t_now - 2 * wlen < o.t <= t_now - wlen:
            past.append(o)
    return cur, past
