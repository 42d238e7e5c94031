"""The Listing 1 pipeline (late-train tracking) fed by Structured Streaming.

Two Dynamic Tables, exactly as in the paper's example:

- ``train_arrivals``: ARRIVAL events joined with ``trains``
- ``delayed_trains``: arrivals joined with ``schedule``, grouped by train and
  hour, counting arrivals more than 10 minutes late

Ingestion follows the calibration mapping: a Structured Streaming file
source delivers micro-batches; ``foreachBatch`` appends each batch to the
``train_events`` base table inside a DML transaction and then refreshes the
DT graph incrementally at the batch's data timestamp — Dynamic Tables *are*
micro-batch IVM (§5), so this is the same maintenance loop Snowflake runs,
with Spark's streaming engine providing batching and exactly-once file
tracking.
"""
from __future__ import annotations

import json
import os
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import types as T

from repro.core import plan as P
from repro.core.engine import DTEngine, RefreshResult

EVENT_SCHEMA = T.StructType(
    [
        T.StructField("e_type", T.StringType()),
        T.StructField("e_train_id", T.LongType()),
        T.StructField("e_schedule_id", T.LongType()),
        T.StructField("e_time", T.TimestampType()),
        T.StructField("e_delay_min", T.LongType()),
        T.StructField("e_arrives_at", T.TimestampType()),
    ]
)

TRAIN_ARRIVALS_PLAN = P.Project(
    P.Filter(
        P.Join(P.Scan("train_events"), P.Scan("trains"), ("e_train_id",), ("t_id",), "inner"),
        "e_type = 'ARRIVAL'",
    ),
    (
        ("train_id", "e_train_id"),
        ("arrival_time", "e_time"),
        ("schedule_id", "e_schedule_id"),
        ("delay_min", "e_delay_min"),
    ),
)

DELAYED_TRAINS_PLAN = P.Aggregate(
    P.Project(
        P.Join(
            P.Scan("train_arrivals"), P.Scan("schedule"), ("schedule_id",), ("s_id",), "inner"
        ),
        (
            ("d_train_id", "train_id"),
            ("hour", "date_trunc('hour', s_expected)"),
            ("is_delayed", "CASE WHEN delay_min > 10 THEN 1 ELSE 0 END"),
        ),
    ),
    ("d_train_id", "hour"),
    (("num_delays", "sum(is_delayed)"),),
)


def build_listing1_pipeline(
    spark: SparkSession,
    *,
    trains: pd.DataFrame,
    schedule: pd.DataFrame,
    now: float = 0.0,
    target_lag: float = 60.0,
) -> DTEngine:
    """Create the base tables and the two Listing 1 DTs (empty event log)."""
    engine = DTEngine(spark)
    engine.create_base_table(
        "train_events",
        pd.DataFrame(
            {
                "e_type": pd.Series(dtype="object"),
                "e_train_id": pd.Series(dtype="int64"),
                "e_schedule_id": pd.Series(dtype="int64"),
                "e_time": pd.Series(dtype="datetime64[ns]"),
                "e_delay_min": pd.Series(dtype="int64"),
                "e_arrives_at": pd.Series(dtype="datetime64[ns]"),
            }
        ),
        now=now,
    )
    engine.create_base_table("trains", trains, now=now)
    engine.create_base_table("schedule", schedule, now=now)
    engine.create_dynamic_table(
        "train_arrivals", TRAIN_ARRIVALS_PLAN, target_lag="DOWNSTREAM", now=now
    )
    engine.create_dynamic_table(
        "delayed_trains", DELAYED_TRAINS_PLAN, target_lag=target_lag, now=now
    )
    return engine


def write_event_files(events: pd.DataFrame, out_dir: str, *, n_files: int = 6) -> list[str]:
    """Split the event log (ordered by stream-arrival time) into JSON files —
    one file per micro-batch for the streaming source."""
    os.makedirs(out_dir, exist_ok=True)
    paths = []
    size = max(1, (len(events) + n_files - 1) // n_files)
    for i in range(n_files):
        chunk = events.iloc[i * size : (i + 1) * size]
        if len(chunk) == 0:
            continue
        path = os.path.join(out_dir, f"batch_{i:04d}.json")
        with open(path, "w") as f:
            for _, row in chunk.iterrows():
                rec = {
                    "e_type": row["e_type"],
                    "e_train_id": int(row["e_train_id"]),
                    "e_schedule_id": int(row["e_schedule_id"]),
                    "e_time": row["e_time"].isoformat(),
                    "e_delay_min": int(row["e_delay_min"]),
                    "e_arrives_at": row["e_arrives_at"].isoformat(),
                }
                f.write(json.dumps(rec) + "\n")
        paths.append(path)
    return paths


@dataclass
class IngestStats:
    """Telemetry from a streaming ingest run."""

    batches: int = 0
    events: int = 0
    refreshes: list[RefreshResult] = field(default_factory=list)


def run_streaming_ingest(
    spark: SparkSession,
    engine: DTEngine,
    events_dir: str,
    checkpoint_dir: str,
    *,
    batch_interval_s: float = 60.0,
    start_ts: float = 0.0,
) -> IngestStats:
    """Consume the event directory as a stream; each micro-batch commits a
    DML transaction and incrementally refreshes the DT graph.

    Uses ``maxFilesPerTrigger=1`` + ``availableNow`` so every file becomes
    its own micro-batch, exercising repeated incremental refreshes.
    """
    stats = IngestStats()

    def process_batch(batch_df, batch_id: int) -> None:
        pdf = batch_df.toPandas()
        if len(pdf) == 0:
            return
        stats.batches += 1
        stats.events += len(pdf)
        ts = start_ts + stats.batches * batch_interval_s
        txn = engine.txn(now=ts - 1e-3)
        txn.insert("train_events", pdf)
        txn.commit()
        stats.refreshes.extend(engine.refresh_graph(ts=ts))

    stream = (
        spark.readStream.schema(EVENT_SCHEMA)
        .option("maxFilesPerTrigger", 1)
        .json(events_dir)
    )
    q = (
        stream.writeStream.foreachBatch(process_batch)
        .option("checkpointLocation", checkpoint_dir)
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination()
    return stats
