"""GAP-SURGE as Catalyst dataflow: windowed per-cell burst-score aggregation.

Two views of the stream, both pure DataFrame expressions (no UDFs):

* **sliding snapshot** (`sliding_cell_scores`): at a given present time
  ``t_now``, per-cell ``f_c``/``f_p``/``S`` over the exact sliding windows
  ``W_c = (t_now−|W|, t_now]`` and ``W_p = (t_now−2|W|, t_now−|W|]`` — the
  event-driven GAP-SURGE semantics, evaluated in parallel.
* **tumbling panes** (`pane_cell_scores`): pane ``i = floor(t/|W|)``; for each
  (cell, pane), ``f_c`` is the pane's sum and ``f_p`` the previous pane's —
  the Structured-Streaming-friendly view. At each pane boundary ``t`` the
  pane *is* ``W_c`` and the previous pane *is* ``W_p``, so pane scores at
  boundaries equal the sliding scores there (tested).

Every function returns columns with fixed names (``ci, cj, fc, fp, s``) so
the DuckDB oracle can diff results row-by-row.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Row, Window
from pyspark.sql import functions as F

from ..core.geometry import Grid, base_grid
from ..core.model import Query


def with_cell(df: DataFrame, q: Query, grid: Grid | None = None) -> DataFrame:
    """Add grid-cell coordinates ``ci``/``cj`` (Definition 6, half-open)."""
    g = grid if grid is not None else base_grid(q)
    return df.withColumn(
        "ci", F.floor((F.col("x") - F.lit(g.sx)) / F.lit(g.b)).cast("long")
    ).withColumn(
        "cj", F.floor((F.col("y") - F.lit(g.sy)) / F.lit(g.a)).cast("long")
    )


def _score_col(fc, fp, alpha: float):
    return F.lit(alpha) * F.greatest(fc - fp, F.lit(0.0)) + F.lit(1.0 - alpha) * fc


def sliding_cell_scores(
    df: DataFrame, q: Query, t_now: float, grid: Grid | None = None
) -> DataFrame:
    """Per-cell burst scores for the sliding windows anchored at ``t_now``."""
    live = df.where(
        (F.col("t") > F.lit(t_now - 2 * q.wlen)) & (F.col("t") <= F.lit(t_now))
    )
    cur = F.col("t") > F.lit(t_now - q.wlen)
    agg = (
        with_cell(live, q, grid)
        .groupBy("ci", "cj")
        .agg(
            (F.sum(F.when(cur, F.col("w")).otherwise(0.0)) / q.wlen).alias("fc"),
            (F.sum(F.when(~cur, F.col("w")).otherwise(0.0)) / q.wlen).alias("fp"),
        )
    )
    return agg.withColumn("s", _score_col(F.col("fc"), F.col("fp"), q.alpha))


def bursty_cell_sliding(
    df: DataFrame, q: Query, t_now: float, grid: Grid | None = None
) -> Row | None:
    """The GAP-SURGE answer at ``t_now``: argmax cell (ties by ci, cj), or
    None when the maximum burst score is 0."""
    rows = (
        sliding_cell_scores(df, q, t_now, grid)
        .orderBy(F.desc("s"), "ci", "cj")
        .limit(1)
        .collect()
    )
    if not rows or rows[0]["s"] <= 0.0:
        return None
    return rows[0]


def pane_sums(df: DataFrame, q: Query, grid: Grid | None = None) -> DataFrame:
    """Per-(cell, pane) weight sums; pane ``i`` covers ``(i·|W|, (i+1)·|W|]``
    so pane boundaries coincide with sliding-window boundaries at multiples
    of |W| (an object exactly at a boundary belongs to the earlier pane,
    matching the half-open-on-the-old-side window convention)."""
    return (
        with_cell(df, q, grid)
        .withColumn("pane", F.ceil(F.col("t") / F.lit(q.wlen)).cast("long") - 1)
        .groupBy("ci", "cj", "pane")
        .agg(F.sum("w").alias("wsum"))
    )


def pane_cell_scores_from_sums(sums: DataFrame, q: Query) -> DataFrame:
    """Burst scores per (cell, pane) from pane sums: ``f_c`` is the pane's
    sum, ``f_p`` the previous pane's (full outer self-join so a cell whose
    activity stopped still shows its decayed pane with fc=0)."""
    # Aliased self-join with an explicit condition: the two sides share
    # lineage (one aggregation, possibly a streaming memory sink), so
    # unqualified join keys would be ambiguous.
    cur = sums.select(
        F.col("ci").alias("c_ci"),
        F.col("cj").alias("c_cj"),
        F.col("pane").alias("c_pane"),
        F.col("wsum").alias("wc"),
    )
    prev = sums.select(
        F.col("ci").alias("p_ci"),
        F.col("cj").alias("p_cj"),
        (F.col("pane") + 1).alias("p_pane"),
        F.col("wsum").alias("wp"),
    )
    joined = cur.join(
        prev,
        on=(
            (F.col("c_ci") == F.col("p_ci"))
            & (F.col("c_cj") == F.col("p_cj"))
            & (F.col("c_pane") == F.col("p_pane"))
        ),
        how="full_outer",
    )
    fc = F.coalesce(F.col("wc"), F.lit(0.0)) / q.wlen
    fp = F.coalesce(F.col("wp"), F.lit(0.0)) / q.wlen
    return joined.select(
        F.coalesce(F.col("c_ci"), F.col("p_ci")).alias("ci"),
        F.coalesce(F.col("c_cj"), F.col("p_cj")).alias("cj"),
        F.coalesce(F.col("c_pane"), F.col("p_pane")).alias("pane"),
        fc.alias("fc"),
        fp.alias("fp"),
        _score_col(fc, fp, q.alpha).alias("s"),
    )


def pane_cell_scores(df: DataFrame, q: Query, grid: Grid | None = None) -> DataFrame:
    return pane_cell_scores_from_sums(pane_sums(df, q, grid), q)


def bursty_cell_per_pane(df: DataFrame, q: Query, grid: Grid | None = None) -> DataFrame:
    """Continuous GAP-SURGE at pane granularity: the best cell of every pane
    (rank-1 by score, deterministic tie-break)."""
    scored = pane_cell_scores(df, q, grid)
    win = Window.partitionBy("pane").orderBy(F.desc("s"), "ci", "cj")
    return (
        scored.withColumn("rk", F.row_number().over(win))
        .where((F.col("rk") == 1) & (F.col("s") > 0.0))
        .drop("rk")
    )
