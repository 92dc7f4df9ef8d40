"""Shared benchmark scale knobs and replay helpers."""
from __future__ import annotations

import os
import time

from repro.experiments.datasets import default_query, make_stream, to_objects, SPECS
from repro.experiments.harness import events_of, run_continuous

#: benchmark stream size (objects); benchmarks are shape checks, the jobs
#: produce the recorded numbers at REPRO_N scale
BENCH_N = int(os.environ.get("REPRO_BENCH_N", 4_000))


def bench_stream(name: str, n: int | None = None, seed: int = 0):
    objs = to_objects(make_stream(name, n or BENCH_N, seed))
    return objs


def timed_run(label, algo, events, warmup_frac=0.1):
    return run_continuous(label, algo, events, warmup_frac=warmup_frac)
