"""Distributed exact snapshot detection (Sections IV-A/IV-B on Spark).

The SURGE→cSPOT reduction and the cell decomposition are pure column
expressions: each object becomes a rectangle object, each rectangle is
exploded to the ≤4 grid cells it overlaps (Lemma 1), and each cell group is
searched independently with the same SL-CSPOT sweep the driver-side exact
algorithm uses — expressed as ``groupBy(cell).applyInPandas`` with an
explicit output schema, the sanctioned Python-operator path (a true JVM
physical operator is out of scope in this offline environment; the shuffle
and the argmax stay in Catalyst).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, Row
from pyspark.sql import functions as F

from ..core.model import Query

_OUT_SCHEMA = "ci long, cj long, px double, py double, score double"


def rect_objects(df: DataFrame, q: Query, t_now: float) -> DataFrame:
    """Live rectangle objects at ``t_now``: window tag + cell span columns."""
    live = df.where(
        (F.col("t") > F.lit(t_now - 2 * q.wlen)) & (F.col("t") <= F.lit(t_now))
    )
    return (
        live.withColumn(
            "win",
            F.when(F.col("t") > F.lit(t_now - q.wlen), F.lit("c")).otherwise(
                F.lit("p")
            ),
        )
        .withColumn("ci0", F.floor(F.col("x") / F.lit(q.b)).cast("long"))
        .withColumn("ci1", F.floor((F.col("x") + F.lit(q.b)) / F.lit(q.b)).cast("long"))
        .withColumn("cj0", F.floor(F.col("y") / F.lit(q.a)).cast("long"))
        .withColumn("cj1", F.floor((F.col("y") + F.lit(q.a)) / F.lit(q.a)).cast("long"))
    )


def _cell_search_fn(a: float, b: float, wlen: float, alpha: float):
    """Factory for the per-cell search; plain parameters so the closure
    pickles cleanly to executors. Imports stay inside for worker-side use."""

    def search(pdf: pd.DataFrame) -> pd.DataFrame:
        from repro.core.model import Query as _Q
        from repro.core.sweepline import sl_cspot as _sl

        q = _Q(a=a, b=b, wlen=wlen, alpha=alpha)
        ci = int(pdf["ci"].iloc[0])
        cj = int(pdf["cj"].iloc[0])
        bounds = (ci * b, cj * a, (ci + 1) * b, (cj + 1) * a)
        rects = list(
            zip(pdf["x"].astype(float), pdf["y"].astype(float),
                pdf["w"].astype(float), pdf["win"])
        )
        px, py, score = _sl(rects, q, bounds=bounds)
        return pd.DataFrame(
            {"ci": [ci], "cj": [cj], "px": [px], "py": [py], "score": [score]}
        )

    return search


def cell_candidates(df: DataFrame, q: Query, t_now: float) -> DataFrame:
    """Per-cell bursty-point candidates: one row per non-empty cell."""
    rects = rect_objects(df, q, t_now)
    exploded = rects.withColumn(
        "ci", F.explode(F.sequence(F.col("ci0"), F.col("ci1")))
    ).withColumn("cj", F.explode(F.sequence(F.col("cj0"), F.col("cj1"))))
    return exploded.select("x", "y", "w", "win", "ci", "cj").groupBy(
        "ci", "cj"
    ).applyInPandas(_cell_search_fn(q.a, q.b, q.wlen, q.alpha), _OUT_SCHEMA)


def bursty_point_snapshot(df: DataFrame, q: Query, t_now: float) -> Row | None:
    """The exact bursty point at ``t_now`` (global argmax over cells), or
    None when the maximum burst score is 0."""
    rows = (
        cell_candidates(df, q, t_now)
        .orderBy(F.desc("score"), "px", "py")
        .limit(1)
        .collect()
    )
    if not rows or rows[0]["score"] <= 0.0:
        return None
    return rows[0]


def bursty_region_snapshot(df: DataFrame, q: Query, t_now: float):
    """Theorem 1: the exact bursty *region* (left-bottom corner) at ``t_now``."""
    p = bursty_point_snapshot(df, q, t_now)
    if p is None:
        return None
    return {"x0": p["px"] - q.b, "y0": p["py"] - q.a, "score": p["score"]}
