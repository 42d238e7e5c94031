"""Structured Streaming integration (the reproduction's ingestion path).

The paper's Dynamic Tables implement micro-batch processing (§5); this
package drives the DT engine from a Spark Structured Streaming source via
``foreachBatch`` (each micro-batch = one DML transaction + a graph refresh),
and provides the native watermark-based streaming baseline the §6.4
discussion contrasts against.
"""
from repro.streaming.pipeline import (
    EVENT_SCHEMA,
    build_listing1_pipeline,
    run_streaming_ingest,
    write_event_files,
)
from repro.streaming.baseline import run_watermark_baseline

__all__ = [
    "EVENT_SCHEMA",
    "build_listing1_pipeline",
    "run_streaming_ingest",
    "write_event_files",
    "run_watermark_baseline",
]
