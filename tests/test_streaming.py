"""T7 infrastructure: the Listing 1 pipeline driven by Structured Streaming
micro-batches (foreachBatch → DML txn → incremental graph refresh), versus
the native watermarked streaming baseline."""
import duckdb
import pandas as pd
import pytest

from repro.core.refresh import INCREMENTAL, REINITIALIZE
from repro.streaming import (
    build_listing1_pipeline,
    run_streaming_ingest,
    run_watermark_baseline,
    write_event_files,
)
from repro.synth_data import schedule_pdf, train_events_pdf, trains_pdf

from tests.helpers import engine_dvs_check


@pytest.fixture(scope="module")
def dataset():
    trains = trains_pdf(n_trains=5)
    schedule = schedule_pdf(n_trains=5, hours=4, per_hour=2)
    events = train_events_pdf(schedule, p_delayed=0.4, p_late_arrival=0.2, seed=17)
    return trains, schedule, events


def truth_delays(schedule: pd.DataFrame, events: pd.DataFrame) -> pd.DataFrame:
    """Ground truth via DuckDB over the complete event log."""
    con = duckdb.connect()
    con.register("ev", events)
    con.register("sch", schedule)
    out = con.execute(
        """
        SELECT e_train_id AS train_id,
               date_trunc('hour', s_expected) AS hour,
               sum(CASE WHEN e_delay_min > 10 THEN 1 ELSE 0 END) AS num_delays
        FROM ev JOIN sch ON ev.e_schedule_id = sch.s_id
        WHERE e_type = 'ARRIVAL'
        GROUP BY 1, 2
        """
    ).fetchdf()
    con.close()
    return out


class TestListing1Pipeline:
    def test_end_to_end_stream_matches_truth(self, spark, tmp_path, dataset):
        trains, schedule, events = dataset
        engine = build_listing1_pipeline(spark, trains=trains, schedule=schedule)
        write_event_files(events, str(tmp_path / "events"), n_files=5)
        stats = run_streaming_ingest(
            spark, engine, str(tmp_path / "events"), str(tmp_path / "ckpt")
        )
        assert stats.batches == 5
        assert stats.events == len(events)
        # all post-init refreshes are incremental micro-batches
        actions = [r.action for r in stats.refreshes]
        assert set(actions) <= {INCREMENTAL, REINITIALIZE, "NO_DATA"}
        assert actions.count(INCREMENTAL) >= 8
        # the DT equals the batch ground truth — late data fully repaired
        got = engine.query_pdf("delayed_trains").rename(columns={"d_train_id": "train_id"})
        want = truth_delays(schedule, events)
        merged = got.merge(want, on=["train_id", "hour"], suffixes=("_got", "_want"), how="outer")
        assert merged["num_delays_got"].fillna(-1).tolist() == merged["num_delays_want"].fillna(-1).tolist()
        # and satisfies the DVS invariant against the oracle
        engine_dvs_check(engine, "train_arrivals")
        engine_dvs_check(engine, "delayed_trains")

    def test_incremental_refreshes_touch_fraction_of_dt(self, spark, tmp_path, dataset):
        trains, schedule, events = dataset
        engine = build_listing1_pipeline(spark, trains=trains, schedule=schedule)
        write_event_files(events, str(tmp_path / "events"), n_files=8)
        stats = run_streaming_ingest(
            spark, engine, str(tmp_path / "events"), str(tmp_path / "ckpt")
        )
        incr = [r for r in stats.refreshes if r.action == INCREMENTAL and r.name == "train_arrivals"]
        # later micro-batches change a minority of a growing DT
        assert incr[-1].change_fraction < 0.5

    def test_downstream_lag_config(self, spark, dataset):
        trains, schedule, _ = dataset
        engine = build_listing1_pipeline(spark, trains=trains, schedule=schedule, target_lag=60.0)
        assert engine.effective_target_lag("train_arrivals") == 60.0  # DOWNSTREAM


class TestWatermarkBaseline:
    def test_baseline_drops_late_data(self, spark, tmp_path, dataset):
        trains, schedule, events = dataset
        write_event_files(events, str(tmp_path / "ev_b"), n_files=5)
        base = run_watermark_baseline(
            spark, str(tmp_path / "ev_b"), str(tmp_path / "ckpt_b"), watermark="30 minutes"
        )
        truth = truth_delays(schedule, events)
        # the baseline undercounts: late arrivals beyond the watermark are
        # dropped, and unclosed windows never emit in append mode
        assert base["num_delays"].sum() < truth["num_delays"].sum()

    def test_dt_pipeline_beats_baseline_on_completeness(self, spark, tmp_path, dataset):
        trains, schedule, events = dataset
        engine = build_listing1_pipeline(spark, trains=trains, schedule=schedule)
        write_event_files(events, str(tmp_path / "ev_c"), n_files=5)
        run_streaming_ingest(spark, engine, str(tmp_path / "ev_c"), str(tmp_path / "ckpt_c"))
        base = run_watermark_baseline(
            spark, str(tmp_path / "ev_c"), str(tmp_path / "ckpt_c2"), watermark="30 minutes"
        )
        truth_total = truth_delays(schedule, events)["num_delays"].sum()
        dt_total = engine.query_pdf("delayed_trains")["num_delays"].sum()
        assert dt_total == truth_total
        assert base["num_delays"].sum() < truth_total
