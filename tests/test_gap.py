"""GAP-SURGE: per-event correctness, approximation bound, tight example."""
import pytest

from repro.core.cell_cspot import CellCSPOT
from repro.core.events import Event, event_stream
from repro.core.gap import GapSurge
from repro.core.geometry import base_grid
from repro.core.model import EXPIRED, GROWN, NEW, Query, SpatialObject, burst_score
from repro.core.sweepline import sl_cspot

from tests._util import random_stream


def batch_cell_scores(state, q, grid):
    """From-scratch per-cell scores from the live window state."""
    sums = {}
    for o, win in state.values():
        key = grid.cell_of(o.x, o.y)
        wc, wp = sums.get(key, (0.0, 0.0))
        if win == "c":
            wc += o.w
        else:
            wp += o.w
        sums[key] = (wc, wp)
    return {
        k: burst_score(wc / q.wlen, wp / q.wlen, q.alpha)
        for k, (wc, wp) in sums.items()
    }


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("alpha", [0.0, 0.5, 0.9])
def test_matches_batch_recompute(seed, alpha):
    q = Query(a=2.0, b=3.0, wlen=1.0, alpha=alpha)
    grid = base_grid(q)
    objs = random_stream(80, seed=seed, span=12.0, duration=6.0)
    algo = GapSurge(q)
    state = {}
    for ev in event_stream(objs, q.wlen, drain=True):
        if ev.kind == NEW:
            state[ev.obj.oid] = (ev.obj, "c")
        elif ev.kind == GROWN:
            state[ev.obj.oid] = (ev.obj, "p")
        else:
            del state[ev.obj.oid]
        res = algo.step(ev)
        ref = batch_cell_scores(state, q, grid)
        best_ref = max(ref.values(), default=0.0)
        got = res[2] if res is not None else 0.0
        assert got == pytest.approx(best_ref, abs=1e-7)


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("alpha", [0.1, 0.5, 0.8])
def test_approximation_bound_theorem3(seed, alpha):
    """S(GAPS) >= (1-alpha)/4 * S(opt) at every event."""
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=alpha)
    objs = random_stream(70, seed=seed + 20, span=10.0, duration=5.0)
    gap = GapSurge(q)
    exact = CellCSPOT(q, mode="ccs")
    for ev in event_stream(objs, q.wlen, drain=True):
        g = gap.step(ev)
        e = exact.step(ev)
        s_gap = g[2] if g else 0.0
        s_opt = e[2] if e else 0.0
        assert s_gap >= (1 - alpha) / 4 * s_opt - 1e-7
        assert s_gap <= s_opt + 1e-7  # a cell is itself an a×b region


def _tight_example_events(q):
    """Lemma 7's instance: 4 current objects in the centre of a 2×2 cell
    junction, 1 past object per cell far from the optimum region."""
    past = [(0.3, 0.3), (3.7, 0.3), (0.3, 3.7), (3.7, 3.7)]
    cur = [(1.5, 1.5), (2.5, 1.5), (1.5, 2.5), (2.5, 2.5)]
    objs = [
        SpatialObject(oid=i, x=x, y=y, w=1.0, t=0.1) for i, (x, y) in enumerate(past)
    ] + [
        SpatialObject(oid=4 + i, x=x, y=y, w=1.0, t=1.2)
        for i, (x, y) in enumerate(cur)
    ]
    return objs


@pytest.mark.parametrize("alpha", [0.1, 0.5, 0.9])
def test_lemma7_tight_example(alpha):
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=alpha)
    objs = _tight_example_events(q)
    gap = GapSurge(q)
    exact = CellCSPOT(q, mode="ccs")
    last_gap = last_exact = None
    for ev in event_stream(objs, q.wlen):
        last_gap = gap.step(ev)
        last_exact = exact.step(ev)
    # exact: all four current objects in one region, no past object -> S = 4
    assert last_exact[2] == pytest.approx(4.0)
    # every aligned cell holds 1 current + 1 past object -> S = 1 - alpha
    assert last_gap[2] == pytest.approx(1.0 - alpha)
    assert last_gap[2] / last_exact[2] == pytest.approx((1 - alpha) / 4)


def test_cells_reclaimed_when_empty():
    q = Query(a=1.0, b=1.0, wlen=0.2, alpha=0.5)
    objs = random_stream(30, seed=3, span=5.0, duration=5.0)
    algo = GapSurge(q)
    for ev in event_stream(objs, q.wlen, drain=True):
        algo.step(ev)
    assert algo.cells == {}
    assert algo.query() is None


def test_reported_bounds_contain_reported_cell():
    q = Query(a=2.0, b=3.0, wlen=1.0, alpha=0.5)
    objs = random_stream(40, seed=8, span=9.0, duration=4.0)
    algo = GapSurge(q)
    for ev in event_stream(objs, q.wlen):
        res = algo.step(ev)
        if res is None:
            continue
        key, bounds, score = res
        x0, y0, x1, y1 = bounds
        assert x1 - x0 == pytest.approx(q.b)
        assert y1 - y0 == pytest.approx(q.a)
        assert algo.grid.cell_bounds(key) == bounds


def test_top_k_matches_sorted_cells():
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.4)
    grid = base_grid(q)
    objs = random_stream(60, seed=12, span=10.0, duration=4.0)
    algo = GapSurge(q)
    state = {}
    for ev in event_stream(objs, q.wlen):
        if ev.kind == NEW:
            state[ev.obj.oid] = (ev.obj, "c")
        elif ev.kind == GROWN:
            state[ev.obj.oid] = (ev.obj, "p")
        else:
            del state[ev.obj.oid]
        algo.process(ev)
    ref = sorted(batch_cell_scores(state, q, grid).values(), reverse=True)
    ref = [s for s in ref if s > 1e-9]
    got = [s for _, _, s in algo.top_k(5)]
    assert got == pytest.approx(ref[:5])
    # top-k cells of a single grid never overlap
    boxes = [b for _, b, _ in algo.top_k(5)]
    for i in range(len(boxes)):
        for j in range(i + 1, len(boxes)):
            bi, bj = boxes[i], boxes[j]
            assert not (
                bi[0] < bj[2] and bj[0] < bi[2] and bi[1] < bj[3] and bj[1] < bi[3]
            )
