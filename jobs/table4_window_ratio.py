#!/usr/bin/env python
"""Reproduce Table IV (Appendix K): approximation ratio vs window size for
GAPS/MGAPS on all three datasets. (env: REPRO_N, REPRO_SEED)"""
from _common import emit, env_int, env_seed

from repro.experiments.tables import format_rows, table4_rows


def main() -> None:
    rows = table4_rows(n=env_int("REPRO_N", 20_000), seed=env_seed())
    emit(format_rows(rows, "Table IV — approx ratio (%) vs window size"))


if __name__ == "__main__":
    main()
