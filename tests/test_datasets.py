"""Synthetic dataset generators (Table I substitutes)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.model import Query
from repro.experiments.datasets import (
    SPECS,
    default_query,
    make_stream,
    to_objects,
)


@pytest.mark.parametrize("name", list(SPECS))
def test_stream_well_formed(name):
    pdf = make_stream(name, 500, seed=1)
    spec = SPECS[name]
    assert list(pdf.columns) == ["oid", "x", "y", "w", "t"]
    assert len(pdf) >= 500  # bursts may round the count up slightly
    assert (pdf["t"].diff().dropna() >= 0).all()
    assert pdf["x"].between(*spec.x_range).all()
    assert pdf["y"].between(*spec.y_range).all()
    assert pdf["w"].between(1, 100).all()
    assert (pdf["w"] == pdf["w"].astype(int)).all()
    assert pdf["t"].min() >= 0
    assert pdf["t"].max() <= spec.duration_h + 1e-9


@pytest.mark.parametrize("name", list(SPECS))
def test_stream_deterministic(name):
    a = make_stream(name, 300, seed=7)
    b = make_stream(name, 300, seed=7)
    pd.testing.assert_frame_equal(a, b)
    c = make_stream(name, 300, seed=8)
    assert not a["x"].equals(c["x"])


def test_duration_matches_paper_timespan():
    for name, spec in SPECS.items():
        pdf = make_stream(name, 2000, seed=0)
        # arrivals spread over (most of) the paper's stream duration
        assert pdf["t"].max() > 0.8 * spec.duration_h


def test_rate_scale_compresses_time():
    base = make_stream("US", 1000, seed=3)
    fast = make_stream("US", 1000, seed=3, rate_scale=5.0)
    assert fast["t"].max() == pytest.approx(base["t"].max() / 5.0, rel=0.1)


def test_paper_durations():
    assert SPECS["UK"].duration_h == pytest.approx(174.0, rel=0.01)
    assert SPECS["US"].duration_h == pytest.approx(59.5, rel=0.01)
    assert SPECS["Taxi"].duration_h == pytest.approx(55.1, rel=0.01)


@pytest.mark.parametrize("name", list(SPECS))
def test_default_query_size(name):
    spec = SPECS[name]
    q = default_query(spec, wlen_h=1.0, alpha=0.3)
    assert q.b == pytest.approx(spec.x_span / 1000)
    assert q.a == pytest.approx(spec.y_span / 1000)
    assert q.alpha == 0.3


def test_to_objects_roundtrip():
    pdf = make_stream("Taxi", 100, seed=2)
    objs = to_objects(pdf)
    assert len(objs) == len(pdf)
    assert objs[0].t <= objs[-1].t
    assert objs[3].x == pdf["x"].iloc[3]
    assert objs[3].w == pdf["w"].iloc[3]


def test_bursts_create_dense_episodes():
    """Burst episodes concentrate many objects in few cells in a short time
    span — the signal SURGE is designed to detect."""
    spec = SPECS["US"]
    pdf = make_stream("US", 5000, seed=1)
    q = default_query(spec, 1.0)
    # find the densest (cell, 1h-bucket): should be well above the median
    ci = np.floor(pdf["x"] / q.b)
    cj = np.floor(pdf["y"] / q.a)
    tb = np.floor(pdf["t"])
    counts = pdf.groupby([ci, cj, tb]).size()
    assert counts.max() >= 5 * max(counts.median(), 1)
