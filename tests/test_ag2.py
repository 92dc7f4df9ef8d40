"""Modified aG2 baseline: exactness and the O(n²) overlap-graph cost proxy."""
import pytest

from repro.core.ag2 import AG2
from repro.core.cell_cspot import CellCSPOT
from repro.core.events import event_stream
from repro.core.geometry import rects_overlap
from repro.core.model import EXPIRED, GROWN, NEW, Query
from repro.core.sweepline import sl_cspot

from tests._util import random_stream


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("alpha", [0.0, 0.5, 0.8])
def test_exactness_vs_snapshot(seed, alpha):
    q = Query(a=2.0, b=3.0, wlen=1.0, alpha=alpha)
    objs = random_stream(50, seed=seed, span=10.0, duration=5.0)
    algo = AG2(q)
    state = {}
    for ev in event_stream(objs, q.wlen, drain=True):
        if ev.kind == NEW:
            state[ev.obj.oid] = (ev.obj, "c")
        elif ev.kind == GROWN:
            state[ev.obj.oid] = (ev.obj, "p")
        else:
            del state[ev.obj.oid]
        res = algo.step(ev)
        rl = [(o.x, o.y, o.w, w) for o, w in state.values()]
        ref = sl_cspot(rl, q)
        got = res[2] if res is not None else 0.0
        assert got == pytest.approx(ref[2], abs=1e-7)


def test_agrees_with_ccs():
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.5)
    objs = random_stream(60, seed=9, span=9.0, duration=5.0)
    ag2, ccs = AG2(q), CellCSPOT(q, mode="ccs")
    for ev in event_stream(objs, q.wlen, drain=True):
        r1 = ag2.step(ev)
        r2 = ccs.step(ev)
        s1 = r1[2] if r1 else 0.0
        s2 = r2[2] if r2 else 0.0
        assert s1 == pytest.approx(s2, abs=1e-7)


def test_overlap_graph_edge_count_exact():
    """Edge count equals the number of overlapping live pairs (the O(n²)
    memory proxy the paper criticises)."""
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.5)
    objs = random_stream(40, seed=2, span=6.0, duration=4.0)
    algo = AG2(q)
    live = {}
    for ev in event_stream(objs, q.wlen, drain=True):
        if ev.kind == NEW:
            live[ev.obj.oid] = ev.obj
        elif ev.kind == EXPIRED:
            del live[ev.obj.oid]
        algo.process(ev)
        objs_l = list(live.values())
        expected = sum(
            rects_overlap(objs_l[i], objs_l[j], q)
            for i in range(len(objs_l))
            for j in range(i + 1, len(objs_l))
        )
        assert algo.n_edges() == expected


def test_edges_grow_superlinearly_with_density():
    """Doubling live objects in a fixed area ~quadruples graph edges."""
    q = Query(a=2.0, b=2.0, wlen=10.0, alpha=0.5)

    def edges_for(n):
        algo = AG2(q)
        for ev in event_stream(
            random_stream(n, seed=4, span=6.0, duration=1.0), q.wlen
        ):
            algo.process(ev)
        return algo.n_edges()

    e1, e2 = edges_for(50), edges_for(100)
    assert e2 > 3 * e1


def test_state_cleanup_after_drain():
    q = Query(a=1.0, b=1.0, wlen=0.3, alpha=0.5)
    objs = random_stream(25, seed=5, span=4.0, duration=3.0)
    algo = AG2(q)
    for ev in event_stream(objs, q.wlen, drain=True):
        algo.step(ev)
    assert not algo.objs and not algo.adj and not algo.cells
    assert algo.n_edges() == 0
    assert algo.query() is None


def test_searches_triggered_counter():
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.5)
    objs = random_stream(40, seed=6, span=8.0, duration=4.0)
    algo = AG2(q)
    for ev in event_stream(objs, q.wlen):
        algo.step(ev)
    assert algo.stats["searches"] > 0
    assert 0 < algo.stats["trigger_events"] <= algo.stats["events"]
