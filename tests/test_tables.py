"""Table builders (tiny configurations — the jobs run the full ones)."""
import pytest

from repro.experiments.tables import (
    PAPER_TABLE2,
    PAPER_TABLE3,
    PAPER_TABLE4,
    TABLE2_WINDOWS,
    TABLE3_ALPHAS,
    TABLE4_WINDOWS,
    format_rows,
    table1_rows,
    table2_rows,
    table3_rows,
    table4_rows,
)


def test_paper_constants_shape():
    for name, wins in TABLE2_WINDOWS.items():
        assert len(wins) == 5
        assert len(PAPER_TABLE2[name]["CCS"]) == 5
        assert len(PAPER_TABLE2[name]["B-CCS"]) == 5
    assert len(TABLE3_ALPHAS) == 5
    assert len(PAPER_TABLE3["GAPS"]) == 5
    for name in TABLE4_WINDOWS:
        assert len(PAPER_TABLE4[name]["GAPS"]) == 5


def test_table1(spark):
    rows = table1_rows(spark, n=400, seed=0)
    assert {r["dataset"] for r in rows} == {"UK", "US", "Taxi"}
    for r in rows:
        assert r["n"] >= 400
        assert r["rate_per_h"] > 0
        assert r["paper_n"] == 1_000_000
        # measured rate tracks the scaled-down paper rate
        assert r["rate_per_h"] == pytest.approx(
            r["scaled_paper_rate_per_h"], rel=0.5
        )
    out = format_rows(rows, "Table I")
    assert "Table I" in out and "dataset" in out


def test_table2_small():
    rows = table2_rows(
        n=1200, seed=0, datasets=["US"], windows={"US": [1.0]}
    )
    assert len(rows) == 1
    r = rows[0]
    assert 0 <= r["ccs_pct"] <= 100
    assert 0 <= r["bccs_pct"] <= 100
    assert r["ccs_us_per_obj"] > 0
    assert r["paper_ccs_pct"] is None  # restricted windows: no paper column


def test_table3_small():
    rows = table3_rows(n=900, seed=0, alphas=[0.5], sample_every=4)
    assert len(rows) == 1
    r = rows[0]
    assert r["bound_pct"] == pytest.approx(12.5)
    assert r["bound_pct"] - 1e-6 <= r["gaps_pct"] <= 100 + 1e-6
    assert r["mgaps_pct"] >= r["gaps_pct"] - 1e-6


def test_table4_small():
    rows = table4_rows(
        n=900, seed=0, datasets=["Taxi"], windows={"Taxi": [0.5]}, sample_every=4
    )
    assert len(rows) == 1
    assert 0 < rows[0]["gaps_pct"] <= 100 + 1e-6


def test_format_rows_empty():
    assert "(empty)" in format_rows([], "T")
