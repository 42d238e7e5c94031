"""T7 benchmark: the Listing 1 pipeline — Structured Streaming micro-batch
IVM (Dynamic Tables) vs the watermarked streaming baseline (§6.4)."""
import pytest

from repro.experiments import t7_streaming as t7


@pytest.fixture(scope="module")
def t7_result(spark):
    res = t7.run(spark, n_trains=8, hours=5, p_late_arrival=0.2, n_batches=6)
    print("\n" + t7.format_table(res))
    assert res["dt_delays"] == res["truth_delays"]  # DVS repairs late data
    assert res["baseline_delays"] < res["truth_delays"]  # watermark drops it
    return res


def test_t7_pipeline_end_to_end(benchmark, spark, t7_result):
    res = benchmark.pedantic(
        t7.run,
        args=(spark,),
        kwargs={"n_trains": 5, "hours": 3, "n_batches": 4, "seed": 23},
        rounds=1,
        iterations=1,
    )
    assert res["dt_delays"] == res["truth_delays"]
