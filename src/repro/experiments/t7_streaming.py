"""T7 — Micro-batch IVM across the latency spectrum vs watermark streaming.

Paper claims (§1, §5, §6.4 + the Listing 1 example):

- Dynamic Tables implement stream processing as micro-batch IVM; the same
  declarative query serves latencies from seconds to hours (here: the
  micro-batch cadence is the knob, correctness is invariant);
- watermark-based streaming must trade completeness for finality: "temporary
  delays in metric delivery … may trigger spurious alerts"; DVS/IVM repairs
  late data on the next refresh instead of dropping it.

Workload: the Listing 1 train pipeline over synthetic arrivals with a
configurable late-arrival fraction, ingested by Structured Streaming; the
baseline is the same aggregation as a watermarked windowed stream.
"""
from __future__ import annotations

import tempfile

import duckdb
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.refresh import INCREMENTAL
from repro.experiments.common import render_table
from repro.streaming import (
    build_listing1_pipeline,
    run_streaming_ingest,
    run_watermark_baseline,
    write_event_files,
)
from repro.synth_data import schedule_pdf, train_events_pdf, trains_pdf


def _truth(schedule: pd.DataFrame, events: pd.DataFrame) -> int:
    con = duckdb.connect()
    con.register("ev", events)
    total = con.execute(
        "SELECT sum(CASE WHEN e_delay_min > 10 THEN 1 ELSE 0 END) FROM ev WHERE e_type='ARRIVAL'"
    ).fetchone()[0]
    con.close()
    return int(total)


def run(
    spark: SparkSession,
    *,
    n_trains: int = 8,
    hours: int = 5,
    p_late_arrival: float = 0.2,
    n_batches: int = 6,
    watermark: str = "30 minutes",
    seed: int = 17,
) -> dict:
    trains = trains_pdf(n_trains=n_trains)
    schedule = schedule_pdf(n_trains=n_trains, hours=hours, per_hour=2)
    events = train_events_pdf(
        schedule, p_delayed=0.4, p_late_arrival=p_late_arrival, seed=seed
    )
    truth_total = _truth(schedule, events)
    with tempfile.TemporaryDirectory() as tmp:
        engine = build_listing1_pipeline(spark, trains=trains, schedule=schedule)
        write_event_files(events, f"{tmp}/events", n_files=n_batches)
        stats = run_streaming_ingest(spark, engine, f"{tmp}/events", f"{tmp}/ckpt")
        base = run_watermark_baseline(
            spark, f"{tmp}/events", f"{tmp}/ckpt_b", watermark=watermark
        )
        dt_total = int(engine.query_pdf("delayed_trains")["num_delays"].sum())
        incr = [
            r
            for r in stats.refreshes
            if r.action == INCREMENTAL and r.name == "delayed_trains"
        ]
        return {
            "events": len(events),
            "late_events": int((events["e_arrives_at"] - events["e_time"]).dt.total_seconds().gt(1800).sum()),
            "batches": stats.batches,
            "truth_delays": truth_total,
            "dt_delays": dt_total,
            "baseline_delays": int(base["num_delays"].sum()),
            "incremental_refreshes": len(incr),
            "mean_incr_wall_s": sum(r.wall_s for r in incr) / max(1, len(incr)),
        }


def format_table(result: dict) -> str:
    r = result
    rows = [
        ["events streamed", r["events"], "—"],
        ["late events (>30 min behind)", r["late_events"], "—"],
        ["micro-batches", r["batches"], "micro-batch processing (§5)"],
        ["ground-truth delayed arrivals", r["truth_delays"], "—"],
        ["Dynamic Tables result", r["dt_delays"], "== truth (DVS repairs late data)"],
        ["watermark streaming result", r["baseline_delays"], "< truth (late data dropped / windows unemitted, §6.4)"],
        ["incremental micro-batch refreshes", r["incremental_refreshes"], "IVM per micro-batch"],
        ["mean incremental refresh wall", f"{r['mean_incr_wall_s']:.2f} s", "seconds-scale lag feasible"],
    ]
    return render_table(
        "T7: Listing 1 pipeline — micro-batch IVM (DTs) vs watermarked streaming",
        ["metric", "value", "paper expectation"],
        rows,
    )
