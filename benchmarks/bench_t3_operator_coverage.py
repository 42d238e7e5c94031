"""T3 benchmark: incremental operator coverage over a Fig. 6-distributed
query population (pure planning — no Spark)."""
import pytest

from repro.experiments import t3_operator_coverage as t3


@pytest.fixture(scope="module")
def t3_result():
    res = t3.run(n_queries=400, seed=0)
    print("\n" + t3.format_table(res))
    assert 0.55 < res["frac_incremental"] < 0.9
    return res


def test_t3_coverage_classification(benchmark, t3_result):
    res = benchmark(t3.run, n_queries=200, seed=1)
    assert 0.5 < res["frac_incremental"] <= 1.0
