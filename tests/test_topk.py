"""Top-k bursty regions (Section VI): kCCS vs the greedy definition; naive
baseline; kGAPS/kMGAPS sanity."""
import pytest

from repro.core.events import event_stream
from repro.core.gap import GapSurge
from repro.core.mgap import MGapSurge
from repro.core.model import EXPIRED, GROWN, NEW, Query
from repro.core.sweepline import sl_cspot
from repro.core.topk import KCellCSPOT, NaiveKSurge, greedy_topk

from tests._util import random_rects, random_stream


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("k", [1, 2, 3])
def test_greedy_topk_snapshot_properties(seed, k):
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.5)
    rects = random_rects(25, q, seed=seed)
    res = greedy_topk(rects, q, k)
    assert len(res) == k
    scores = [s for _, _, s in res]
    # rank-1 equals the global bursty point
    assert scores[0] == pytest.approx(sl_cspot(rects, q)[2])
    # greedy scores are non-increasing
    assert all(scores[i] >= scores[i + 1] - 1e-9 for i in range(k - 1))


def test_greedy_removes_covered_objects():
    """Definition 9: an object counts toward at most one region."""
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.0)
    # two separated clusters, the first strictly richer
    rects = [
        (0.0, 0.0, 3.0, "c"),
        (0.1, 0.1, 3.0, "c"),
        (10.0, 10.0, 2.0, "c"),
    ]
    res = greedy_topk(rects, q, 2)
    assert res[0][2] == pytest.approx(6.0)
    assert res[1][2] == pytest.approx(2.0)  # first cluster fully consumed


@pytest.mark.parametrize("seed", range(3))
@pytest.mark.parametrize("k", [2, 3])
def test_kccs_matches_naive_greedy(seed, k):
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.5)
    objs = random_stream(40, seed=seed + 60, span=8.0, duration=4.0)
    kccs = KCellCSPOT(q, k=k)
    naive = NaiveKSurge(q, k=k)
    for ev in event_stream(objs, q.wlen, drain=True):
        got = kccs.step(ev)
        ref = naive.step(ev)
        got_scores = [r[2] if r is not None else 0.0 for r in got]
        ref_scores = [s if s > 1e-9 else 0.0 for _, _, s in ref]
        assert got_scores == pytest.approx(ref_scores, abs=1e-7), (
            f"k={k} diverged at {ev.kind} t={ev.time}"
        )


def test_kccs_k1_equals_greedy_rank1():
    q = Query(a=2.0, b=3.0, wlen=1.0, alpha=0.3)
    objs = random_stream(35, seed=77, span=8.0, duration=4.0)
    kccs = KCellCSPOT(q, k=1)
    naive = NaiveKSurge(q, k=1)
    for ev in event_stream(objs, q.wlen, drain=True):
        got = kccs.step(ev)
        ref = naive.step(ev)
        g = got[0][2] if got[0] is not None else 0.0
        r = ref[0][2] if ref[0][2] > 1e-9 else 0.0
        assert g == pytest.approx(r, abs=1e-7)


def test_kccs_level_invariants():
    """Levels: lvl=i rects cover p[i-1]; every other live rect has lvl=k."""
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.5)
    k = 3
    objs = random_stream(30, seed=5, span=6.0, duration=3.0)
    algo = KCellCSPOT(q, k=k)
    for ev in event_stream(objs, q.wlen, drain=True):
        algo.step(ev)
        covered = set()
        for i in range(k):
            for oid in algo.cover[i]:
                assert algo.lvl[oid] == i + 1
                covered.add(oid)
        for oid, lv in algo.lvl.items():
            if oid not in covered:
                assert lv == k


def test_kgaps_topk_scores_non_increasing():
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.4)
    objs = random_stream(60, seed=8, span=9.0, duration=4.0)
    g = GapSurge(q)
    for ev in event_stream(objs, q.wlen):
        g.process(ev)
    scores = [s for _, _, s in g.top_k(6)]
    assert scores == sorted(scores, reverse=True)


def test_kmgaps_at_least_as_good_as_kgaps_rank1():
    q = Query(a=2.0, b=2.0, wlen=1.0, alpha=0.4)
    objs = random_stream(60, seed=9, span=9.0, duration=4.0)
    g, mg = GapSurge(q), MGapSurge(q)
    for ev in event_stream(objs, q.wlen):
        g.process(ev)
        mg.process(ev)
    tg, tmg = g.top_k(3), mg.top_k(3)
    if tg and tmg:
        assert tmg[0][2] >= tg[0][2] - 1e-9
