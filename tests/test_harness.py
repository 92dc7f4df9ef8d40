"""Continuous-run harness: timing/statistics plumbing."""
import math

import pytest

from repro.core.cell_cspot import CellCSPOT
from repro.core.gap import GapSurge
from repro.core.mgap import MGapSurge
from repro.core.model import NEW, Query
from repro.experiments.datasets import SPECS, default_query, make_stream, to_objects
from repro.experiments.harness import approx_ratio_run, events_of, run_continuous


@pytest.fixture(scope="module")
def small_us():
    return to_objects(make_stream("US", 600, seed=1))


def test_events_of_counts(small_us):
    q = default_query(SPECS["US"], 1.0)
    evs = events_of(small_us, q.wlen)
    n_new = sum(e.kind == NEW for e in evs)
    assert n_new == len(small_us)
    assert len(evs) >= n_new


def test_run_continuous_stats(small_us):
    q = default_query(SPECS["US"], 1.0)
    evs = events_of(small_us, q.wlen)
    r = run_continuous("ccs", CellCSPOT(q, mode="ccs"), evs)
    assert r.n_objects == len(small_us)
    assert r.n_events == len(evs)
    assert r.wall_s > 0
    assert r.time_per_object_s > 0
    assert 0 <= r.trigger_ratio <= 1
    assert r.searches >= r.trigger_events


def test_run_continuous_warmup(small_us):
    q = default_query(SPECS["US"], 1.0)
    evs = events_of(small_us, q.wlen)
    r = run_continuous("ccs", CellCSPOT(q, mode="ccs"), evs, warmup_frac=0.5)
    assert r.n_events == len(evs) - int(len(evs) * 0.5)
    assert r.n_objects < len(small_us)


def test_approx_ratio_in_bounds(small_us):
    q = default_query(SPECS["US"], 1.0, alpha=0.5)
    ratios = approx_ratio_run(
        small_us,
        q,
        {"GAPS": lambda qq: GapSurge(qq), "MGAPS": lambda qq: MGapSurge(qq)},
        lambda qq: CellCSPOT(qq, mode="ccs"),
        sample_every=3,
    )
    for name, r in ratios.items():
        assert not math.isnan(r)
        assert (1 - q.alpha) / 4 - 1e-9 <= r <= 1 + 1e-9
    assert ratios["MGAPS"] >= ratios["GAPS"] - 1e-9


def test_approx_ratio_empty_stream():
    q = Query(a=1.0, b=1.0, wlen=1.0)
    ratios = approx_ratio_run(
        [], q, {"GAPS": lambda qq: GapSurge(qq)}, lambda qq: CellCSPOT(qq)
    )
    assert math.isnan(ratios["GAPS"])
