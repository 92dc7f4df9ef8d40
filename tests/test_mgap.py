"""MGAP-SURGE: best-of-four-grids semantics and top-k merge."""
import pytest

from repro.core.cell_cspot import CellCSPOT
from repro.core.events import event_stream
from repro.core.gap import GapSurge
from repro.core.geometry import shifted_grids
from repro.core.mgap import MGapSurge, _boxes_overlap
from repro.core.model import Query

from tests._util import random_stream
from tests.test_gap import _tight_example_events


@pytest.mark.parametrize("seed", range(3))
def test_equals_max_of_four_gaps(seed):
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.5)
    objs = random_stream(60, seed=seed, span=10.0, duration=5.0)
    mg = MGapSurge(q)
    singles = [GapSurge(q, grid=g) for g in shifted_grids(q)]
    for ev in event_stream(objs, q.wlen, drain=True):
        got = mg.step(ev)
        refs = []
        for s in singles:
            r = s.step(ev)
            if r is not None:
                refs.append(r[2])
        best = max(refs, default=0.0)
        s_got = got[2] if got else 0.0
        assert s_got == pytest.approx(best, abs=1e-9)


@pytest.mark.parametrize("alpha", [0.1, 0.5, 0.8])
def test_mgap_never_worse_than_gap(alpha):
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=alpha)
    objs = random_stream(60, seed=7, span=10.0, duration=5.0)
    mg, g1 = MGapSurge(q), GapSurge(q)
    for ev in event_stream(objs, q.wlen):
        rm = mg.step(ev)
        rg = g1.step(ev)
        sm = rm[2] if rm else 0.0
        sg = rg[2] if rg else 0.0
        assert sm >= sg - 1e-9


def test_tight_example_recovered_by_shifted_grid():
    """On Lemma 7's instance a half-shifted grid centres a cell on the
    optimum, so MGAP returns the exact score while GAP gets (1-α)·S/4."""
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.5)
    objs = _tight_example_events(q)
    mg = MGapSurge(q)
    exact = CellCSPOT(q, mode="ccs")
    last_m = last_e = None
    for ev in event_stream(objs, q.wlen):
        last_m = mg.step(ev)
        last_e = exact.step(ev)
    assert last_e[2] == pytest.approx(4.0)
    assert last_m[2] == pytest.approx(4.0)


@pytest.mark.parametrize("alpha", [0.2, 0.6])
def test_approximation_bound(alpha):
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=alpha)
    objs = random_stream(50, seed=31, span=8.0, duration=4.0)
    mg = MGapSurge(q)
    exact = CellCSPOT(q, mode="ccs")
    for ev in event_stream(objs, q.wlen):
        rm = mg.step(ev)
        re_ = exact.step(ev)
        sm = rm[2] if rm else 0.0
        se = re_[2] if re_ else 0.0
        assert sm >= (1 - alpha) / 4 * se - 1e-7
        assert sm <= se + 1e-7


def test_boxes_overlap():
    assert _boxes_overlap((0, 0, 2, 2), (1, 1, 3, 3))
    assert not _boxes_overlap((0, 0, 2, 2), (2, 0, 4, 2))  # edge touch is ok
    assert not _boxes_overlap((0, 0, 2, 2), (5, 5, 7, 7))


def test_top_k_non_overlapping():
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.4)
    objs = random_stream(80, seed=17, span=10.0, duration=4.0)
    mg = MGapSurge(q)
    for ev in event_stream(objs, q.wlen):
        mg.process(ev)
    picked = mg.top_k(4)
    assert len(picked) <= 4
    scores = [s for _, _, s in picked]
    assert scores == sorted(scores, reverse=True)
    for i in range(len(picked)):
        for j in range(i + 1, len(picked)):
            assert not _boxes_overlap(picked[i][1], picked[j][1])
    # the merged top-1 equals the continuous query
    if picked:
        assert picked[0][2] == pytest.approx(mg.query()[2])
