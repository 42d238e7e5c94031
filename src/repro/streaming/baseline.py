"""The native Structured Streaming baseline: watermarked, stateful,
event-time windowed aggregation — the classic stream-processing formulation
of the Listing 1 ``delayed_trains`` query.

This is the comparator for T7. With a watermark, the streaming engine can
bound its state and emit *final* windows, but (a) events later than the
watermark are dropped, and (b) windows only emit once the watermark passes —
the §6.4 trade-off ("Temporary delays in metric delivery … Real-world
scenarios often demand waiting until results are final"). DVS/IVM instead
repairs late data on the next refresh.
"""
from __future__ import annotations

import uuid

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.streaming.pipeline import EVENT_SCHEMA


def run_watermark_baseline(
    spark: SparkSession,
    events_dir: str,
    checkpoint_dir: str,
    *,
    watermark: str = "30 minutes",
    window: str = "1 hour",
) -> pd.DataFrame:
    """Consume the same event files with a watermarked window aggregation.

    Event time is ``e_arrives_at``-ordered at the source (files are written
    in stream order), but the aggregation windows on the *event* timestamp
    ``e_time`` — so events arriving later than the watermark allows are
    discarded by the engine. Returns the appended (finalized) windows as
    pandas: columns (train_id, hour, num_delays).
    """
    sink = f"wm_baseline_{uuid.uuid4().hex[:8]}"
    stream = (
        spark.readStream.schema(EVENT_SCHEMA)
        .option("maxFilesPerTrigger", 1)
        .json(events_dir)
    )
    agg = (
        stream.filter(F.col("e_type") == "ARRIVAL")
        .withWatermark("e_time", watermark)
        .groupBy(F.window("e_time", window).alias("win"), F.col("e_train_id"))
        .agg(F.expr("sum(CASE WHEN e_delay_min > 10 THEN 1 ELSE 0 END)").alias("num_delays"))
    )
    q = (
        agg.writeStream.outputMode("append")
        .format("memory")
        .queryName(sink)
        .option("checkpointLocation", checkpoint_dir)
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination()
    out = spark.table(sink).select(
        F.col("e_train_id").alias("train_id"),
        F.col("win.start").alias("hour"),
        F.col("num_delays"),
    )
    return out.toPandas()
