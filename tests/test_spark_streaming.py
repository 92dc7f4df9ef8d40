"""Structured Streaming pane aggregation == batch pane view == DuckDB oracle."""
import json
import os

import pytest
from pyspark.sql import functions as F

from repro.core.model import Query
from repro.oracle import assert_equivalent
from repro.spark.grid_agg import pane_cell_scores, pane_sums
from repro.spark.io import stream_df
from repro.spark.streaming import run_streaming_panes, streaming_burst_scores

from tests._util import stream_pdf

Q = Query(a=2.0, b=3.0, wlen=10.0, alpha=0.5)


@pytest.fixture(scope="module")
def pdf():
    return stream_pdf(120, seed=5, span=10.0, duration=50.0, t0=0.5)


@pytest.fixture(scope="module")
def src_dir(tmp_path_factory, pdf):
    """The stream as a directory of JSON files (3 micro-batches by time)."""
    d = tmp_path_factory.mktemp("stream_src")
    parts = [pdf.iloc[i::1] for i in [0]]  # keep ordering simple: split by thirds
    n = len(pdf)
    for i, chunk in enumerate([pdf.iloc[: n // 3], pdf.iloc[n // 3 : 2 * n // 3], pdf.iloc[2 * n // 3 :]]):
        with open(os.path.join(d, f"part-{i}.json"), "w") as f:
            for r in chunk.itertuples():
                f.write(
                    json.dumps(
                        {"oid": int(r.oid), "x": float(r.x), "y": float(r.y),
                         "w": float(r.w), "t": float(r.t)}
                    )
                    + "\n"
                )
    return str(d)


def test_streaming_pane_sums_match_batch(spark, pdf, src_dir):
    got = run_streaming_panes(spark, src_dir, Q)
    batch = pane_sums(stream_df(spark, pdf), Q)
    g = {(r["ci"], r["cj"], r["pane"]): r["wsum"] for r in got.collect()}
    b = {(r["ci"], r["cj"], r["pane"]): r["wsum"] for r in batch.collect()}
    assert set(g) == set(b)
    for k in g:
        assert g[k] == pytest.approx(b[k])


def test_streaming_pane_sums_oracle(spark, pdf, src_dir):
    got = run_streaming_panes(spark, src_dir, Q)
    assert_equivalent(
        got,
        f"""
        SELECT CAST(floor(x/{Q.b}) AS BIGINT) AS ci,
               CAST(floor(y/{Q.a}) AS BIGINT) AS cj,
               CAST(ceil(t/{Q.wlen}) - 1 AS BIGINT) AS pane,
               sum(w) AS wsum
        FROM objs GROUP BY 1, 2, 3
        """,
        objs=pdf,
    )


def test_streaming_burst_scores_match_batch(spark, pdf, src_dir):
    got = streaming_burst_scores(spark, src_dir, Q).toPandas()
    batch = pane_cell_scores(stream_df(spark, pdf), Q).toPandas()
    key = ["ci", "cj", "pane"]
    got = got.sort_values(key).reset_index(drop=True)
    batch = batch.sort_values(key).reset_index(drop=True)
    assert len(got) == len(batch)
    for col in ["ci", "cj", "pane"]:
        assert (got[col] == batch[col]).all()
    for col in ["fc", "fp", "s"]:
        assert got[col].values == pytest.approx(batch[col].values, abs=1e-9)


def test_streaming_watermark_variant(spark, pdf, src_dir):
    """A non-zero watermark must not change availableNow complete-mode
    results for this bounded input."""
    got = run_streaming_panes(spark, src_dir, Q, watermark="5 seconds")
    total = got.agg(F.sum("wsum").alias("tw")).collect()[0]["tw"]
    assert total == pytest.approx(float(pdf["w"].sum()))
