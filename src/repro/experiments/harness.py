"""Continuous-run harness: per-event timing, search counting, approx ratios.

Everything the paper's evaluation measures is a property of a *replay* of the
event stream through one or more continuous algorithms; this module is the
single place that does such replays.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from ..core.events import Event, event_stream
from ..core.model import NEW, Query, SpatialObject


@dataclass
class RunResult:
    """Outcome of replaying one algorithm over one event stream."""

    name: str
    n_objects: int
    n_events: int
    wall_s: float
    searches: int = 0
    trigger_events: int = 0
    extra: dict = field(default_factory=dict)

    @property
    def time_per_object_s(self) -> float:
        """The paper's headline metric: average processing time per (new)
        spatial object, the whole event cascade attributed to it."""
        return self.wall_s / self.n_objects if self.n_objects else 0.0

    @property
    def trigger_ratio(self) -> float:
        return self.trigger_events / self.n_events if self.n_events else 0.0


def events_of(objs: list[SpatialObject], wlen: float) -> list[Event]:
    return list(event_stream(objs, wlen))


def run_continuous(
    name: str, algo, events: list[Event], *, warmup_frac: float = 0.0
) -> RunResult:
    """Replay ``events`` through ``algo.step``; stats are read from
    ``algo.stats`` when present. ``warmup_frac`` skips the leading fraction
    of events from the *statistics* (the paper starts measuring "when the
    system becomes stable"), while still processing them."""
    n_warm = int(len(events) * warmup_frac)
    t0 = time.perf_counter()
    base_stats: dict = {}
    for i, ev in enumerate(events):
        if i == n_warm:
            t0 = time.perf_counter()
            base_stats = dict(getattr(algo, "stats", {}))
        algo.step(ev)
    wall = time.perf_counter() - t0
    stats = getattr(algo, "stats", {})
    measured = events[n_warm:]
    return RunResult(
        name=name,
        n_objects=sum(e.kind == NEW for e in measured),
        n_events=len(measured),
        wall_s=wall,
        searches=stats.get("searches", 0) - base_stats.get("searches", 0),
        trigger_events=stats.get("trigger_events", 0)
        - base_stats.get("trigger_events", 0),
    )


def approx_ratio_run(
    objs: list[SpatialObject],
    q: Query,
    approx_factories: dict[str, callable],
    exact_factory,
    *,
    sample_every: int = 1,
    warmup_frac: float = 0.1,
) -> dict[str, float]:
    """Average S(approx)/S(exact) over sampled events with S(exact) > 0 —
    the metric of the paper's Tables III/IV."""
    exact = exact_factory(q)
    approx = {name: f(q) for name, f in approx_factories.items()}
    events = events_of(objs, q.wlen)
    n_warm = int(len(events) * warmup_frac)
    sums = {name: 0.0 for name in approx}
    count = 0
    for i, ev in enumerate(events):
        e_res = exact.step(ev)
        a_res = {name: a.step(ev) for name, a in approx.items()}
        if i < n_warm or i % sample_every:
            continue
        if e_res is None or e_res[2] <= 0:
            continue
        count += 1
        for name, r in a_res.items():
            s = r[2] if r is not None else 0.0
            sums[name] += s / e_res[2]
    if count == 0:
        return {name: float("nan") for name in approx}
    return {name: s / count for name, s in sums.items()}
