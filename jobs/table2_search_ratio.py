#!/usr/bin/env python
"""Reproduce Table II: % of rectangle messages that trigger a search,
CCS vs B-CCS, per dataset × window size. (env: REPRO_N, REPRO_SEED)"""
from _common import emit, env_int, env_seed

from repro.experiments.tables import format_rows, table2_rows


def main() -> None:
    rows = table2_rows(n=env_int("REPRO_N", 20_000), seed=env_seed())
    emit(format_rows(rows, "Table II — search-trigger ratio (%), CCS vs B-CCS"))


if __name__ == "__main__":
    main()
