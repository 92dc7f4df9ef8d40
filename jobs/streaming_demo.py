#!/usr/bin/env python
"""End-to-end Structured Streaming demo: generate a US-like stream, feed it
as JSON micro-batches, run the windowed per-cell aggregation, and print the
bursty cell of each pane (GAP-SURGE streaming view).
(env: REPRO_STREAM_N — default 5000 — REPRO_SEED)"""
import json
import os
import tempfile

from _common import emit, env_int, env_seed, get_spark
from pyspark.sql import functions as F

from repro.core.model import Query
from repro.experiments.datasets import SPECS, default_query, make_stream
from repro.spark.streaming import streaming_burst_scores


def main() -> None:
    n, seed = env_int("REPRO_STREAM_N", 5_000), env_seed()
    pdf = make_stream("US", n, seed)
    pdf = pdf.assign(t=pdf["t"] * 3600.0)  # hours -> seconds for event time
    q0 = default_query(SPECS["US"], 1.0)
    q = Query(a=q0.a, b=q0.b, wlen=q0.wlen * 3600.0, alpha=q0.alpha)

    spark = get_spark()
    try:
        with tempfile.TemporaryDirectory() as src:
            n_files = 4
            chunk = len(pdf) // n_files + 1
            for i in range(n_files):
                part = pdf.iloc[i * chunk : (i + 1) * chunk]
                with open(os.path.join(src, f"part-{i}.json"), "w") as f:
                    for r in part.itertuples():
                        f.write(
                            json.dumps(
                                {"oid": int(r.oid), "x": float(r.x), "y": float(r.y),
                                 "w": float(r.w), "t": float(r.t)}
                            )
                            + "\n"
                        )
            scored = streaming_burst_scores(spark, src, q)
            from pyspark.sql import Window

            win = Window.partitionBy("pane").orderBy(F.desc("s"), "ci", "cj")
            best = (
                scored.withColumn("rk", F.row_number().over(win))
                .where((F.col("rk") == 1) & (F.col("s") > 0))
                .orderBy(F.desc("s"))
                .limit(10)
            )
            emit("Top bursty (cell, pane) rows from the streaming view")
            emit("(event time in seconds, so scores are weight/second):")
            for r in best.collect():
                emit(
                    f"  pane={r['pane']:>4} cell=({r['ci']},{r['cj']}) "
                    f"fc={r['fc']:.1f} fp={r['fp']:.1f} S={r['s']:.1f}"
                )
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
