"""Event-stream generation: new/grown/expired transitions (Section IV-C)."""
import pytest

from repro.core.events import Event, event_stream, window_contents
from repro.core.model import EXPIRED, GROWN, NEW, SpatialObject

from tests._util import random_stream


def obj(oid, t):
    return SpatialObject(oid=oid, x=0.0, y=0.0, w=1.0, t=t)


def test_single_object_drain():
    evs = list(event_stream([obj(0, 1.0)], wlen=2.0, drain=True))
    assert [(e.kind, e.time) for e in evs] == [
        (NEW, 1.0),
        (GROWN, 3.0),
        (EXPIRED, 5.0),
    ]


def test_no_drain_stops_at_last_arrival():
    evs = list(event_stream([obj(0, 1.0), obj(1, 2.0)], wlen=0.5))
    kinds = [(e.kind, e.obj.oid) for e in evs]
    # o0 grows at 1.5 and expires at 2.0 before o1 arrives at 2.0
    assert kinds == [(NEW, 0), (GROWN, 0), (EXPIRED, 0), (NEW, 1)]


def test_transition_before_arrival_at_same_time():
    # grown at exactly t is emitted before the new arrival at t
    evs = list(event_stream([obj(0, 0.0), obj(1, 1.0)], wlen=1.0))
    assert [(e.kind, e.obj.oid) for e in evs] == [(NEW, 0), (GROWN, 0), (NEW, 1)]


def test_tie_priority_expired_before_grown_before_new():
    # o0 expires at 2.0, o1 grows at 2.0, o2 arrives at 2.0
    evs = list(event_stream([obj(0, 0.0), obj(1, 1.0), obj(2, 2.0)], wlen=1.0))
    assert [(e.kind, e.obj.oid) for e in evs] == [
        (NEW, 0),
        (GROWN, 0),
        (NEW, 1),
        (EXPIRED, 0),
        (GROWN, 1),
        (NEW, 2),
    ]


def test_unsorted_input_raises():
    with pytest.raises(ValueError):
        list(event_stream([obj(0, 2.0), obj(1, 1.0)], wlen=1.0))


def test_each_object_emits_three_events_with_drain():
    objs = random_stream(50, seed=7, duration=5.0)
    evs = list(event_stream(objs, wlen=1.0, drain=True))
    assert len(evs) == 150
    for kind in (NEW, GROWN, EXPIRED):
        assert sum(e.kind == kind for e in evs) == 50


def test_event_times_nondecreasing():
    objs = random_stream(80, seed=3, duration=4.0)
    evs = list(event_stream(objs, wlen=0.7, drain=True))
    times = [e.time for e in evs]
    assert times == sorted(times)


def test_window_state_matches_window_contents():
    """Replaying the events reproduces window_contents at every arrival."""
    objs = random_stream(60, seed=11, duration=6.0)
    wlen = 1.3
    state = {}  # oid -> 'c' | 'p'
    for ev in event_stream(objs, wlen):
        if ev.kind == NEW:
            state[ev.obj.oid] = "c"
        elif ev.kind == GROWN:
            state[ev.obj.oid] = "p"
        else:
            del state[ev.obj.oid]
        if ev.kind == NEW:
            t_now = ev.time
            cur, past = window_contents(objs, wlen, t_now)
            assert {o.oid for o in cur} == {k for k, v in state.items() if v == "c"}
            assert {o.oid for o in past} == {k for k, v in state.items() if v == "p"}


def test_window_contents_boundaries():
    objs = [obj(0, 0.0), obj(1, 1.0), obj(2, 2.0)]
    cur, past = window_contents(objs, wlen=1.0, t_now=2.0)
    # W_c = (1, 2]: o2 ; W_p = (0, 1]: o1 ; o0 at 0.0 is out
    assert [o.oid for o in cur] == [2]
    assert [o.oid for o in past] == [1]
