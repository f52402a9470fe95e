"""Structured Streaming ingestion for the FTPMfTS pipeline.

Raw sensor readings arrive as timestamped files (one reading per row,
possibly several readings inside one symbolization slot).  The stream
is aggregated with an event-time window of ``slot_seconds`` per
variable — the windowed-aggregation step of the repro plan — and the
mean value per (variable, window) is thresholded into a symbol.  The
result is the same ``(var, t, symbol)`` relation the batch
:mod:`repro.core.symbolize` produces, with ``t`` the slot index, so the
rest of the pipeline (instances → sequences → mining) is unchanged.

``run_available_now`` drains all currently available input with an
``availableNow`` trigger into an in-memory table and returns it — the
pattern used by the tests and by incremental re-mining jobs.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    DoubleType,
    StringType,
    StructField,
    StructType,
    TimestampType,
)

#: Schema of raw streaming readings files.
READING_SCHEMA = StructType(
    [
        StructField("var", StringType(), False),
        StructField("ts", TimestampType(), False),
        StructField("value", DoubleType(), False),
    ]
)


def read_reading_stream(spark: SparkSession, input_path: str) -> DataFrame:
    """File-source stream of raw readings (CSV, schema enforced)."""
    return (
        spark.readStream.schema(READING_SCHEMA)
        .option("header", "false")
        .csv(input_path)
    )


def windowed_symbolize(
    readings: DataFrame,
    *,
    slot_seconds: int,
    threshold: float = 0.05,
    on: str = "On",
    off: str = "Off",
) -> DataFrame:
    """Event-time windowed aggregation → symbols.

    Works on both batch and streaming DataFrames: groups readings into
    per-variable tumbling windows of ``slot_seconds``, averages the
    readings in each window, and maps the mean through the On/Off
    threshold.  Output: ``(var, t, symbol)`` with ``t`` the slot index
    (window start / slot length).
    """
    win = F.window(F.col("ts"), f"{slot_seconds} seconds")
    agg = readings.groupBy("var", win.alias("win")).agg(
        F.avg("value").alias("mean_value")
    )
    return agg.select(
        "var",
        (F.unix_timestamp(F.col("win.start")) / F.lit(slot_seconds))
        .cast("long")
        .alias("t"),
        F.when(F.col("mean_value") >= F.lit(threshold), F.lit(on))
        .otherwise(F.lit(off))
        .alias("symbol"),
    )


def run_available_now(
    sdf: DataFrame, query_name: str, *, timeout_sec: int = 120
) -> DataFrame:
    """Drain a streaming aggregation into an in-memory table.

    Uses ``complete`` output mode (the aggregation state is small: one
    row per variable and slot) with an ``availableNow`` trigger, waits
    for the drain to finish, and returns the materialized table.
    """
    query = (
        sdf.writeStream.format("memory")
        .queryName(query_name)
        .outputMode("complete")
        .trigger(availableNow=True)
        .start()
    )
    try:
        if not query.awaitTermination(timeout_sec):
            raise TimeoutError(
                f"streaming query {query_name!r} did not drain in "
                f"{timeout_sec}s"
            )
    finally:
        query.stop()
    return sdf.sparkSession.table(query_name)
