"""Spark windowed grid aggregation vs DuckDB oracle and the core GAP-SURGE."""
import pytest
from pyspark.sql import functions as F

from repro.core.events import event_stream
from repro.core.gap import GapSurge
from repro.core.model import Query
from repro.oracle import assert_equivalent
from repro.spark.grid_agg import (
    bursty_cell_per_pane,
    bursty_cell_sliding,
    pane_cell_scores,
    sliding_cell_scores,
    with_cell,
)
from repro.spark.io import stream_df

from tests._util import pdf_to_objects, stream_pdf

Q = Query(a=2.0, b=3.0, wlen=10.0, alpha=0.5)


@pytest.fixture(scope="module")
def pdf():
    return stream_pdf(250, seed=1, span=12.0, duration=100.0)


@pytest.fixture(scope="module")
def sdf(spark, pdf):
    return stream_df(spark, pdf).cache()


def test_with_cell_oracle(spark, sdf, pdf):
    got = with_cell(sdf, Q).select("oid", "ci", "cj")
    assert_equivalent(
        got,
        f"SELECT oid, CAST(floor(x/{Q.b}) AS BIGINT) AS ci, "
        f"CAST(floor(y/{Q.a}) AS BIGINT) AS cj FROM objs",
        objs=pdf,
    )


@pytest.mark.parametrize("t_now", [25.0, 50.0, 95.0])
@pytest.mark.parametrize("alpha", [0.0, 0.5, 0.9])
def test_sliding_cell_scores_oracle(spark, sdf, pdf, t_now, alpha):
    q = Query(a=Q.a, b=Q.b, wlen=Q.wlen, alpha=alpha)
    got = sliding_cell_scores(sdf, q, t_now)
    t0, t1 = t_now - 2 * q.wlen, t_now - q.wlen
    assert_equivalent(
        got,
        f"""
        SELECT ci, cj, fc, fp,
               {alpha}*greatest(fc - fp, 0) + {1 - alpha}*fc AS s
        FROM (
          SELECT CAST(floor(x/{q.b}) AS BIGINT) AS ci,
                 CAST(floor(y/{q.a}) AS BIGINT) AS cj,
                 sum(CASE WHEN t > {t1} THEN w ELSE 0 END)/{q.wlen} AS fc,
                 sum(CASE WHEN t <= {t1} THEN w ELSE 0 END)/{q.wlen} AS fp
          FROM objs WHERE t > {t0} AND t <= {t_now}
          GROUP BY 1, 2
        )
        """,
        objs=pdf,
    )


def test_sliding_argmax_matches_core_gap(spark, sdf, pdf):
    """Distributed GAP at a snapshot == event-driven core GAP at that time."""
    objs = pdf_to_objects(pdf)
    checkpoints = {45.0, 70.0}
    results = {}
    evs = list(event_stream(objs, Q.wlen, drain=True))
    # replay once, capturing state at each checkpoint
    gap = GapSurge(Q)
    idx = 0
    for t_now in sorted(checkpoints):
        while idx < len(evs) and evs[idx].time <= t_now:
            gap.process(evs[idx])
            idx += 1
        results[t_now] = gap.query()
    for t_now, core_res in results.items():
        row = bursty_cell_sliding(sdf, Q, t_now)
        if core_res is None:
            assert row is None
        else:
            assert row["s"] == pytest.approx(core_res[2], abs=1e-7)
            assert (row["ci"], row["cj"]) == core_res[0]


def test_pane_scores_oracle(spark, sdf, pdf):
    got = pane_cell_scores(sdf, Q)
    assert_equivalent(
        got,
        f"""
        WITH sums AS (
          SELECT CAST(floor(x/{Q.b}) AS BIGINT) AS ci,
                 CAST(floor(y/{Q.a}) AS BIGINT) AS cj,
                 CAST(ceil(t/{Q.wlen}) - 1 AS BIGINT) AS pane,
                 sum(w) AS wsum
          FROM objs GROUP BY 1, 2, 3
        ),
        cur AS (SELECT ci, cj, pane, wsum AS wc FROM sums),
        prev AS (SELECT ci, cj, pane + 1 AS pane, wsum AS wp FROM sums)
        SELECT ci, cj, pane,
               COALESCE(wc, 0)/{Q.wlen} AS fc,
               COALESCE(wp, 0)/{Q.wlen} AS fp,
               {Q.alpha}*greatest(COALESCE(wc,0)/{Q.wlen} - COALESCE(wp,0)/{Q.wlen}, 0)
                 + {1 - Q.alpha}*COALESCE(wc,0)/{Q.wlen} AS s
        FROM cur FULL OUTER JOIN prev USING (ci, cj, pane)
        """,
        objs=pdf,
    )


@pytest.mark.parametrize("pane", [2, 5, 8])
def test_pane_equals_sliding_at_boundary(spark, sdf, pane):
    """At t = (pane+1)·|W| the pane is exactly W_c and the previous pane is
    exactly W_p, so pane scores equal sliding scores."""
    t_now = (pane + 1) * Q.wlen
    sliding = {
        (r["ci"], r["cj"]): (r["fc"], r["fp"], r["s"])
        for r in sliding_cell_scores(sdf, Q, t_now).collect()
    }
    paned = {
        (r["ci"], r["cj"]): (r["fc"], r["fp"], r["s"])
        for r in pane_cell_scores(sdf, Q).where(F.col("pane") == pane).collect()
    }
    assert set(sliding) == set(paned)
    for key in sliding:
        assert sliding[key] == pytest.approx(paned[key], abs=1e-7)


def test_bursty_cell_per_pane_rank1(spark, sdf):
    per_pane = bursty_cell_per_pane(sdf, Q).collect()
    assert per_pane  # at least one pane has activity
    scored = pane_cell_scores(sdf, Q).toPandas()
    for row in per_pane:
        pane_rows = scored[scored["pane"] == row["pane"]]
        assert row["s"] == pytest.approx(pane_rows["s"].max(), abs=1e-9)


def test_shifted_grid_sliding(spark, sdf, pdf):
    from repro.core.geometry import Grid

    g = Grid(a=Q.a, b=Q.b, sx=Q.b / 2, sy=Q.a / 2)
    got = sliding_cell_scores(sdf, Q, 50.0, grid=g).select("ci", "cj", "fc")
    t1 = 50.0 - Q.wlen
    assert_equivalent(
        got,
        f"""
        SELECT CAST(floor((x - {g.sx})/{Q.b}) AS BIGINT) AS ci,
               CAST(floor((y - {g.sy})/{Q.a}) AS BIGINT) AS cj,
               sum(CASE WHEN t > {t1} THEN w ELSE 0 END)/{Q.wlen} AS fc
        FROM objs WHERE t > {50.0 - 2 * Q.wlen} AND t <= 50.0
        GROUP BY 1, 2
        """,
        objs=pdf,
    )
