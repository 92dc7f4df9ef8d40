"""Schemas and conversion helpers for spatial-object stream DataFrames."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType, LongType, StructField, StructType

STREAM_SCHEMA = StructType(
    [
        StructField("oid", LongType(), False),
        StructField("x", DoubleType(), False),
        StructField("y", DoubleType(), False),
        StructField("w", DoubleType(), False),
        StructField("t", DoubleType(), False),
    ]
)


def stream_df(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Spatial-object stream pandas frame → Spark DataFrame with the explicit
    stream schema (never infer types for a stable oracle comparison)."""
    return spark.createDataFrame(pdf[["oid", "x", "y", "w", "t"]], schema=STREAM_SCHEMA)


def with_event_time(df: DataFrame) -> DataFrame:
    """Add an event-time timestamp column ``ts`` from the double ``t``
    (seconds since epoch) for windowed/streaming operators."""
    return df.withColumn("ts", F.timestamp_seconds(F.col("t")))
