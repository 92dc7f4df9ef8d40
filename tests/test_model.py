"""Burst-score function and model invariants (paper Section III, Lemmas 2/5/6)."""
import math

import pytest
from hypothesis import given, strategies as st

from repro.core.model import (
    Query,
    burst_score,
    point_in_rect,
    region_from_point,
)

finite = st.floats(0.0, 1e6, allow_nan=False, allow_infinity=False)
alphas = st.floats(0.0, 0.999, allow_nan=False)


def test_burst_score_example3():
    # Example 3: three unit-weight current rectangles, |W|=1, overlap point.
    assert burst_score(3.0, 0.0, 0.5) == pytest.approx(3.0)


def test_burst_score_paper_fig3_values():
    # Fig 3 walk-through with alpha=0.5: I.fc=2, fp=0 -> S=2; fc=3 -> S=3.
    assert burst_score(2.0, 0.0, 0.5) == pytest.approx(2.0)
    assert burst_score(3.0, 0.0, 0.5) == pytest.approx(3.0)
    # after g3's bottom edge: fc=1, fp=1 -> S=1-alpha... with I3 holding g1(past)
    assert burst_score(1.0, 1.0, 0.5) == pytest.approx(0.5)


@given(fc=finite, fp=finite, alpha=alphas)
def test_burst_score_nonnegative_and_bounded_by_fc(fc, fp, alpha):
    s = burst_score(fc, fp, alpha)
    assert s >= 0.0
    # Lemma 2's core inequality: S(p) <= f(p, W_c)
    assert s <= fc + 1e-9


@given(fc=finite, fp=finite, alpha=alphas)
def test_burst_score_lower_bound_lemma5(fc, fp, alpha):
    # S(r) >= (1-alpha) * f(r, W_c) — the inequality behind Lemma 5.
    assert burst_score(fc, fp, alpha) >= (1 - alpha) * fc - 1e-9


@given(
    fc1=finite, fp1=finite, fc2=finite, fp2=finite, alpha=alphas
)
def test_burst_score_subadditive_lemma6(fc1, fp1, fc2, fp2, alpha):
    # Disjoint union: scores add on f; burst scores are subadditive.
    combined = burst_score(fc1 + fc2, fp1 + fp2, alpha)
    assert combined <= burst_score(fc1, fp1, alpha) + burst_score(fc2, fp2, alpha) + 1e-9


def test_burst_score_zero_when_no_current():
    for alpha in (0.0, 0.3, 0.9):
        assert burst_score(0.0, 5.0, alpha) == 0.0


def test_query_validation():
    with pytest.raises(ValueError):
        Query(a=0, b=1, wlen=1)
    with pytest.raises(ValueError):
        Query(a=1, b=1, wlen=0)
    with pytest.raises(ValueError):
        Query(a=1, b=1, wlen=1, alpha=1.0)
    with pytest.raises(ValueError):
        Query(a=1, b=1, wlen=1, alpha=-0.1)
    Query(a=1, b=2, wlen=3, alpha=0.0)  # boundary ok


def test_point_in_rect_closed_boundaries():
    q = Query(a=2.0, b=3.0, wlen=1.0)
    assert point_in_rect(0.0, 0.0, 0.0, 0.0, q)
    assert point_in_rect(3.0, 2.0, 0.0, 0.0, q)
    assert point_in_rect(1.5, 1.0, 0.0, 0.0, q)
    assert not point_in_rect(3.0 + 1e-9, 1.0, 0.0, 0.0, q)
    assert not point_in_rect(1.0, -1e-9, 0.0, 0.0, q)


def test_region_from_point_theorem1():
    q = Query(a=2.0, b=3.0, wlen=1.0)
    assert region_from_point(10.0, 5.0, q) == (7.0, 3.0)


eighths = st.integers(-800, 800).map(lambda i: i / 8.0)


@given(px=eighths, py=eighths, ox=eighths, oy=eighths)
def test_reduction_equivalence(px, py, ox, oy):
    """Theorem 1's core fact: object o is inside the a×b region with top-right
    corner p iff the rectangle object anchored at o covers p."""
    q = Query(a=2.0, b=3.0, wlen=1.0)
    rx, ry = region_from_point(px, py, q)
    in_region = rx <= ox <= rx + q.b and ry <= oy <= ry + q.a
    assert in_region == point_in_rect(px, py, ox, oy, q)
