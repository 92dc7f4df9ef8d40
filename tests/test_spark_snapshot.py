"""Distributed exact snapshot (applyInPandas sweep) vs the pure-Python exact
search and a DuckDB candidate-point SQL oracle."""
import pytest
from pyspark.sql import functions as F

from repro.core.model import Query
from repro.core.sweepline import sl_cspot
from repro.oracle import assert_equivalent
from repro.spark.io import stream_df
from repro.spark.snapshot import (
    bursty_point_snapshot,
    bursty_region_snapshot,
    cell_candidates,
    rect_objects,
)

from tests._util import pdf_to_objects, snapshot_rects, stream_pdf

Q = Query(a=2.0, b=3.0, wlen=10.0, alpha=0.5)


@pytest.fixture(scope="module")
def pdf():
    return stream_pdf(150, seed=3, span=10.0, duration=60.0)


@pytest.fixture(scope="module")
def sdf(spark, pdf):
    return stream_df(spark, pdf).cache()


def _exact_sql(q: Query, t_now: float) -> str:
    """DuckDB program computing the exact maximum burst score at a snapshot:
    candidate x/y coordinates are all rectangle edges plus midpoints of
    consecutive edges (complete for any α), scored by direct containment."""
    t0, t1 = t_now - 2 * q.wlen, t_now - q.wlen
    return f"""
    WITH r AS (
      SELECT x, y, w, CASE WHEN t > {t1} THEN 1 ELSE 0 END AS cur
      FROM objs WHERE t > {t0} AND t <= {t_now}
    ),
    xe AS (SELECT DISTINCT v FROM (SELECT x AS v FROM r UNION SELECT x + {q.b} FROM r)),
    xc AS (SELECT v FROM xe
           UNION SELECT (v + lead(v) OVER (ORDER BY v)) / 2 FROM xe),
    ye AS (SELECT DISTINCT v FROM (SELECT y AS v FROM r UNION SELECT y + {q.a} FROM r)),
    yc AS (SELECT v FROM ye
           UNION SELECT (v + lead(v) OVER (ORDER BY v)) / 2 FROM ye),
    scores AS (
      SELECT xc.v AS px, yc.v AS py,
        COALESCE(SUM(CASE WHEN r.cur = 1 AND r.x <= xc.v AND xc.v <= r.x + {q.b}
                           AND r.y <= yc.v AND yc.v <= r.y + {q.a}
                      THEN r.w END), 0) / {q.wlen} AS fc,
        COALESCE(SUM(CASE WHEN r.cur = 0 AND r.x <= xc.v AND xc.v <= r.x + {q.b}
                           AND r.y <= yc.v AND yc.v <= r.y + {q.a}
                      THEN r.w END), 0) / {q.wlen} AS fp
      FROM xc CROSS JOIN yc CROSS JOIN r
      WHERE xc.v IS NOT NULL AND yc.v IS NOT NULL
      GROUP BY xc.v, yc.v
    )
    SELECT max({q.alpha} * greatest(fc - fp, 0) + {1 - q.alpha} * fc) AS best_score
    FROM scores
    """


def test_rect_objects_window_tags(spark, sdf, pdf):
    t_now = 40.0
    got = rect_objects(sdf, Q, t_now).select("oid", "win")
    t0, t1 = t_now - 2 * Q.wlen, t_now - Q.wlen
    assert_equivalent(
        got,
        f"SELECT oid, CASE WHEN t > {t1} THEN 'c' ELSE 'p' END AS win "
        f"FROM objs WHERE t > {t0} AND t <= {t_now}",
        objs=pdf,
    )


@pytest.mark.parametrize("t_now", [30.0, 45.0, 58.0])
def test_snapshot_matches_core_exact(spark, sdf, pdf, t_now):
    objs = pdf_to_objects(pdf)
    rects = snapshot_rects(objs, Q.wlen, t_now)
    ref = sl_cspot(rects, Q)
    got = bursty_point_snapshot(sdf, Q, t_now)
    score = got["score"] if got is not None else 0.0
    assert score == pytest.approx(ref[2], abs=1e-7)


@pytest.mark.parametrize("alpha", [0.0, 0.3, 0.8])
def test_snapshot_score_duckdb_oracle(spark, sdf, pdf, alpha):
    """The distributed max burst score equals the DuckDB candidate-point
    program's — oracle coverage for the custom applyInPandas operator."""
    q = Query(a=Q.a, b=Q.b, wlen=Q.wlen, alpha=alpha)
    t_now = 45.0
    got = bursty_point_snapshot(sdf, q, t_now)
    score = got["score"] if got is not None else 0.0
    got_df = spark.createDataFrame([(float(score),)], "best_score double")
    assert_equivalent(got_df, _exact_sql(q, t_now), objs=pdf)


def test_cell_candidates_scores_are_achievable(spark, sdf, pdf):
    """Every per-cell candidate's score is the true max within its cell."""
    t_now = 45.0
    objs = pdf_to_objects(pdf)
    rects = snapshot_rects(objs, Q.wlen, t_now)
    from repro.core.geometry import base_grid

    grid = base_grid(Q)
    for row in cell_candidates(sdf, Q, t_now).collect():
        bounds = grid.cell_bounds((row["ci"], row["cj"]))
        ref = sl_cspot(rects, Q, bounds=bounds)
        assert row["score"] == pytest.approx(ref[2], abs=1e-7)


def test_bursty_region_corner(spark, sdf):
    t_now = 45.0
    p = bursty_point_snapshot(sdf, Q, t_now)
    r = bursty_region_snapshot(sdf, Q, t_now)
    assert r["score"] == pytest.approx(p["score"])
    assert r["x0"] == pytest.approx(p["px"] - Q.b)
    assert r["y0"] == pytest.approx(p["py"] - Q.a)


def test_empty_snapshot(spark, sdf):
    assert bursty_point_snapshot(sdf, Q, t_now=-100.0) is None
    assert bursty_region_snapshot(sdf, Q, t_now=-100.0) is None
