"""Structured Streaming formulation (the repro hint's target shape).

A file-source stream of spatial objects → event-time watermark → tumbling
``window(ts, |W|)`` × grid-cell aggregation → memory sink (availableNow).
The resulting pane table is scored with the same batch pane logic
(`pane_cell_scores_from_sums`), so streaming and batch views are tested
equal.

Note on boundary semantics: Structured Streaming's ``window`` is half-open
``[start, end)`` while the paper's sliding windows are half-open on the old
side; objects created *exactly* at a pane boundary differ. Workloads here
use continuous timestamps, so this is a measure-zero difference (the batch
comparison tests keep objects off boundaries).
"""
from __future__ import annotations

import uuid

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core.geometry import Grid
from ..core.model import Query
from .grid_agg import pane_cell_scores_from_sums, with_cell
from .io import STREAM_SCHEMA, with_event_time


def streaming_pane_sums(
    spark: SparkSession,
    src_dir: str,
    q: Query,
    grid: Grid | None = None,
    watermark: str = "0 seconds",
) -> DataFrame:
    """Build the streaming aggregation DataFrame (not yet started)."""
    raw = spark.readStream.schema(STREAM_SCHEMA).json(src_dir)
    cells = with_cell(with_event_time(raw).withWatermark("ts", watermark), q, grid)
    return cells.groupBy(
        F.window("ts", f"{q.wlen} seconds").alias("win"), "ci", "cj"
    ).agg(F.sum("w").alias("wsum"))


def run_streaming_panes(
    spark: SparkSession,
    src_dir: str,
    q: Query,
    grid: Grid | None = None,
    watermark: str = "0 seconds",
) -> DataFrame:
    """Run the streaming aggregation to completion over the files currently
    in ``src_dir`` (availableNow trigger, memory sink) and return the pane
    sums as a batch DataFrame (``ci, cj, pane, wsum``)."""
    name = "panes_" + uuid.uuid4().hex[:8]
    query = (
        streaming_pane_sums(spark, src_dir, q, grid, watermark)
        .writeStream.format("memory")
        .queryName(name)
        .outputMode("complete")
        .trigger(availableNow=True)
        .start()
    )
    query.awaitTermination()
    sums = spark.table(name).select(
        "ci",
        "cj",
        F.floor(F.col("win.start").cast("double") / F.lit(q.wlen))
        .cast("long")
        .alias("pane"),
        "wsum",
    )
    return sums


def streaming_burst_scores(
    spark: SparkSession,
    src_dir: str,
    q: Query,
    grid: Grid | None = None,
) -> DataFrame:
    """End-to-end continuous GAP view from a streaming source: per-(cell,
    pane) burst scores computed from the streamed pane sums."""
    return pane_cell_scores_from_sums(run_streaming_panes(spark, src_dir, q, grid), q)
