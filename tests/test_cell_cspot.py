"""Cell-CSPOT continuous exactness: every variant must equal a from-scratch
snapshot recomputation after every event (Sections IV-B/IV-C)."""
import math

import pytest

from repro.core.cell_cspot import CellCSPOT
from repro.core.events import event_stream
from repro.core.model import EXPIRED, GROWN, NEW, Query
from repro.core.sweepline import sl_cspot

from tests._util import random_stream


def replay_and_check(objs, q, algo, *, check=True):
    """Drive ``algo`` through the full event stream; at every event compare
    its reported score to a from-scratch SL-CSPOT over the live windows."""
    state = {}
    for ev in event_stream(objs, q.wlen, drain=True):
        if ev.kind == NEW:
            state[ev.obj.oid] = (ev.obj, "c")
        elif ev.kind == GROWN:
            state[ev.obj.oid] = (ev.obj, "p")
        else:
            del state[ev.obj.oid]
        res = algo.step(ev)
        if not check:
            continue
        rl = [(o.x, o.y, o.w, w) for o, w in state.values()]
        ref = sl_cspot(rl, q)
        got = res[2] if res is not None else 0.0
        assert got == pytest.approx(ref[2], abs=1e-7), (
            f"{algo.mode} diverged at {ev.kind} t={ev.time}"
        )


@pytest.mark.parametrize("mode", ["ccs", "bccs", "base"])
@pytest.mark.parametrize("seed", range(5))
def test_exactness_random_streams(mode, seed):
    q = Query(a=2.0, b=3.0, wlen=1.0, alpha=0.5)
    objs = random_stream(60, seed=seed, span=12.0, duration=6.0)
    replay_and_check(objs, q, CellCSPOT(q, mode=mode))


@pytest.mark.parametrize("alpha", [0.0, 0.2, 0.7, 0.9])
def test_exactness_across_alpha(alpha):
    q = Query(a=1.5, b=1.5, wlen=0.8, alpha=alpha)
    objs = random_stream(50, seed=42, span=8.0, duration=5.0)
    replay_and_check(objs, q, CellCSPOT(q, mode="ccs"))


@pytest.mark.parametrize("mode", ["ccs", "bccs"])
def test_exactness_dense_overlap(mode):
    # many rectangles crammed into few cells — stresses candidate reuse
    q = Query(a=4.0, b=4.0, wlen=1.0, alpha=0.5)
    objs = random_stream(80, seed=9, span=6.0, duration=4.0)
    replay_and_check(objs, q, CellCSPOT(q, mode=mode))


def test_exactness_integer_weights():
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.3)
    objs = random_stream(70, seed=4, span=10.0, duration=5.0, int_weights=True)
    replay_and_check(objs, q, CellCSPOT(q, mode="ccs"))


def test_reported_point_score_consistent():
    """The returned point's directly-evaluated score equals the reported one."""
    q = Query(a=2.0, b=3.0, wlen=1.0, alpha=0.5)
    objs = random_stream(50, seed=13, span=10.0, duration=5.0)
    algo = CellCSPOT(q, mode="ccs")
    state = {}
    for ev in event_stream(objs, q.wlen, drain=True):
        if ev.kind == NEW:
            state[ev.obj.oid] = (ev.obj, "c")
        elif ev.kind == GROWN:
            state[ev.obj.oid] = (ev.obj, "p")
        else:
            del state[ev.obj.oid]
        res = algo.step(ev)
        if res is None:
            continue
        px, py, s = res
        fc = sum(o.w for o, w in state.values() if w == "c" and o.x <= px <= o.x + q.b and o.y <= py <= o.y + q.a)
        fp = sum(o.w for o, w in state.values() if w == "p" and o.x <= px <= o.x + q.b and o.y <= py <= o.y + q.a)
        direct = q.alpha * max(fc - fp, 0) / q.wlen + (1 - q.alpha) * fc / q.wlen
        assert s == pytest.approx(direct, abs=1e-7)


def test_upper_bound_invariants_ccs():
    """U(c) upper-bounds the cell's true max; valid candidates pin U to S(c.p)."""
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.4)
    objs = random_stream(60, seed=21, span=8.0, duration=5.0)
    algo = CellCSPOT(q, mode="ccs")
    for i, ev in enumerate(event_stream(objs, q.wlen, drain=True)):
        algo.step(ev)
        if i % 17 != 0:
            continue
        for key, c in list(algo.cells.items()):
            rl = [(o.x, o.y, o.w, algo.win[o.oid]) for o in c.rects.values()]
            true_max = sl_cspot(rl, q, bounds=algo.grid.cell_bounds(key))[2]
            u = algo._u(c)
            assert u >= true_max - 1e-7
            if c.valid and c.cand is not None:
                assert c.cand_score == pytest.approx(true_max, abs=1e-7)
                assert u == pytest.approx(c.cand_score, abs=1e-7)


def test_search_counts_ordering():
    """CCS triggers far fewer searches than B-CCS, which is cheaper than Base
    (the mechanism behind Table II and Figure 5). The gap needs cell
    occupancy: the static bound sums *all* current weights in a cell, so it
    overshoots the true max only when cells hold many rectangles."""
    q = Query(a=2.0, b=2.0, wlen=2.0, alpha=0.5)
    objs = random_stream(400, seed=5, span=10.0, duration=8.0, int_weights=True)
    counts, triggers = {}, {}
    for mode in ("ccs", "bccs", "base"):
        algo = CellCSPOT(q, mode=mode)
        replay_and_check(objs, q, algo, check=False)
        counts[mode] = algo.stats["searches"]
        triggers[mode] = algo.trigger_ratio
    assert counts["ccs"] < counts["bccs"] < counts["base"]
    assert triggers["ccs"] < triggers["bccs"] < 1.0


def test_trigger_ratio_bounds():
    q = Query(a=2.0, b=2.0, wlen=2.0, alpha=0.5)
    objs = random_stream(200, seed=6, span=10.0, duration=8.0)
    ccs = CellCSPOT(q, mode="ccs")
    base = CellCSPOT(q, mode="base")
    replay_and_check(objs, q, ccs, check=False)
    replay_and_check(objs, q, base, check=False)
    assert 0.0 < ccs.trigger_ratio < 1.0
    # Base searches every affected cell on every event; only events whose
    # windows are completely empty can skip.
    assert base.trigger_ratio > 0.95


def test_empty_windows_report_none():
    q = Query(a=1.0, b=1.0, wlen=0.1, alpha=0.5)
    objs = random_stream(10, seed=1, span=4.0, duration=5.0)
    algo = CellCSPOT(q, mode="ccs")
    last = None
    for ev in event_stream(objs, q.wlen, drain=True):
        last = algo.step(ev)
    assert last is None  # all objects expired after drain
    assert not algo.cells  # empty cells are reclaimed


def test_space_is_linear_in_live_objects():
    """Space claim of Section IV-C: each rect is stored in ≤4 cells."""
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.5)
    objs = random_stream(100, seed=8, span=12.0, duration=6.0)
    algo = CellCSPOT(q, mode="ccs")
    for ev in event_stream(objs, q.wlen, drain=True):
        algo.step(ev)
        stored = sum(len(c.rects) for c in algo.cells.values())
        assert stored <= 4 * len(algo.win)


def test_mode_validation():
    with pytest.raises(ValueError):
        CellCSPOT(Query(a=1, b=1, wlen=1), mode="nope")
