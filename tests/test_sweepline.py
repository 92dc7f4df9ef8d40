"""SL-CSPOT snapshot search vs. independent brute force (Section IV-B)."""
import numpy as np
import pytest

from repro.core.model import Query, point_in_rect
from repro.core.sweepline import brute_force_bursty_point, sl_cspot

from tests._util import random_rects

Q = Query(a=2.0, b=3.0, wlen=1.0, alpha=0.5)


def score_at(rects, q, px, py):
    """Direct burst score at a point, third independent implementation."""
    fc = sum(w for x, y, w, win in rects if win == "c" and x <= px <= x + q.b and y <= py <= y + q.a)
    fp = sum(w for x, y, w, win in rects if win == "p" and x <= px <= x + q.b and y <= py <= y + q.a)
    fc, fp = fc / q.wlen, fp / q.wlen
    return q.alpha * max(fc - fp, 0.0) + (1 - q.alpha) * fc


def test_empty():
    assert sl_cspot([], Q) == (0.0, 0.0, 0.0)
    assert sl_cspot([], Q, bounds=(1, 2, 4, 4)) == (1.0, 2.0, 0.0)


def test_single_current_rect():
    px, py, s = sl_cspot([(0.0, 0.0, 4.0, "c")], Q)
    assert s == pytest.approx(4.0)
    assert point_in_rect(px, py, 0.0, 0.0, Q)


def test_single_past_rect_scores_zero():
    _, _, s = sl_cspot([(0.0, 0.0, 4.0, "p")], Q)
    assert s == 0.0


def test_example3_three_overlapping_unit_rects():
    """Paper Example 3: three unit-weight current rects, |W|=1 -> S=3."""
    rects = [(0.0, 0.0, 1.0, "c"), (1.0, 0.5, 1.0, "c"), (2.0, 1.0, 1.0, "c")]
    px, py, s = sl_cspot(rects, Q)
    assert s == pytest.approx(3.0)
    for x, y, _, _ in rects:
        assert point_in_rect(px, py, x, y, Q)


def test_figure3_walkthrough():
    """Fig 3: g1 past, g2/g3 current (w=2 effective score each at |W|=1)."""
    q = Query(a=2.0, b=3.0, wlen=1.0, alpha=0.5)
    rects = [(0.0, 2.0, 2.0, "p"), (2.0, 1.0, 2.0, "c"), (4.0, 3.0, 2.0, "c")]
    px, py, s = sl_cspot(rects, q)
    # best: overlap of the two current rects, away from the past one -> S=4?
    # g2 spans x[2,5], g3 x[4,7]; overlap x[4,5], y overlap [3,3]: fc=4
    assert s == pytest.approx(score_at(rects, q, px, py))
    assert s >= 2.0  # at least one current rect alone


def test_past_rect_pushes_optimum_off_edge():
    """The case that forces midpoint candidates: a past rectangle whose edge
    coincides with the only current-coverage slab boundary."""
    q = Query(a=1.0, b=1.0, wlen=1.0, alpha=0.9)
    # current rect [0,1]x[0,1]; past rect [1,0]x... past covers x in [1,2]
    rects = [(0.0, 0.0, 10.0, "c"), (1.0, 0.0, 10.0, "p")]
    px, py, s = sl_cspot(rects, q)
    # at x=1 both overlap: fc=10, fp=10 -> S=(1-.9)*10=1. Inside x<1: S=10.
    assert s == pytest.approx(10.0)
    assert px < 1.0


def test_score_reported_matches_direct_evaluation():
    rects = random_rects(40, Q, seed=1)
    px, py, s = sl_cspot(rects, Q)
    assert s == pytest.approx(score_at(rects, Q, px, py))


@pytest.mark.parametrize("seed", range(12))
@pytest.mark.parametrize("alpha", [0.0, 0.3, 0.5, 0.9])
def test_matches_brute_force_random(seed, alpha):
    q = Query(a=2.0, b=3.0, wlen=1.0, alpha=alpha)
    rects = random_rects(25, q, seed=seed)
    _, _, s1 = sl_cspot(rects, q)
    _, _, s2 = brute_force_bursty_point(rects, q)
    assert s1 == pytest.approx(s2)


@pytest.mark.parametrize("seed", range(8))
def test_matches_brute_force_bounded(seed):
    q = Query(a=2.0, b=3.0, wlen=1.0, alpha=0.5)
    rects = random_rects(20, q, seed=seed + 100)
    bounds = (2.0, 2.0, 5.0, 4.0)
    p1 = sl_cspot(rects, q, bounds=bounds)
    p2 = brute_force_bursty_point(rects, q, bounds=bounds)
    assert p1[2] == pytest.approx(p2[2])
    if p1[2] > 0:
        assert bounds[0] <= p1[0] <= bounds[2]
        assert bounds[1] <= p1[1] <= bounds[3]


@pytest.mark.parametrize("seed", range(8))
def test_bounded_union_covers_global(seed):
    """Max over a partition of cells == global max (reduction sanity)."""
    q = Query(a=2.0, b=3.0, wlen=1.0, alpha=0.4)
    rects = random_rects(18, q, seed=seed + 50, span=6.0)
    _, _, s_global = sl_cspot(rects, q)
    best = 0.0
    for i in range(-2, 5):
        for j in range(-2, 5):
            b = (i * q.b, j * q.a, (i + 1) * q.b, (j + 1) * q.a)
            best = max(best, sl_cspot(rects, q, bounds=b)[2])
    assert best == pytest.approx(s_global)


def test_identical_weights_integer_like():
    q = Query(a=1.0, b=1.0, wlen=2.0, alpha=0.5)
    rects = [(0.0, 0.0, 2.0, "c"), (0.5, 0.5, 2.0, "c"), (0.2, 0.2, 2.0, "p")]
    px, py, s = sl_cspot(rects, q)
    assert s == pytest.approx(score_at(rects, q, px, py))


def test_window_normalization():
    """f divides by |W|: doubling wlen halves the score."""
    r = [(0.0, 0.0, 4.0, "c")]
    s1 = sl_cspot(r, Query(a=1, b=1, wlen=1.0))[2]
    s2 = sl_cspot(r, Query(a=1, b=1, wlen=2.0))[2]
    assert s1 == pytest.approx(2 * s2)


def test_all_past_in_bounds_returns_zero_at_corner():
    q = Query(a=1.0, b=1.0, wlen=1.0)
    px, py, s = sl_cspot([(0.0, 0.0, 5.0, "p")], q, bounds=(0, 0, 1, 1))
    assert s == 0.0
    assert (px, py) == (0.0, 0.0)
