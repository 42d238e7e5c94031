"""The random query generator (§6.1 level-4 test infrastructure): generated
plans must always compile, render to DuckDB SQL, and produce oracle-equal
results."""
import pytest

from repro.core import plan as P
from repro.core.compile import compile_full, out_columns, to_sql
from repro.workload.generator import OPERATOR_MIX, QueryGenerator, random_plans

from tests.helpers import base_schemas, check_full, small_store


@pytest.fixture(scope="module")
def store():
    return small_store(seed=21)


class TestGeneratorValidity:
    @pytest.mark.parametrize("seed", range(10))
    def test_supported_plans_compile_and_match_oracle(self, spark, store, seed):
        g = QueryGenerator(seed=seed)
        plan_ = g.random_plan(allow_unsupported=False)
        assert P.incremental_supported(plan_)
        check_full(spark, store, plan_, 0.0)

    @pytest.mark.parametrize("seed", range(10, 16))
    def test_unsupported_allowed_plans_still_correct(self, spark, store, seed):
        g = QueryGenerator(seed=seed)
        plan_ = g.random_plan(allow_unsupported=True)
        check_full(spark, store, plan_, 0.0)

    def test_output_columns_unique(self, store):
        for plan_ in random_plans(25, seed=77, allow_unsupported=True):
            cols = out_columns(plan_, base_schemas(store))
            assert len(cols) == len(set(cols)), cols

    def test_plans_are_diverse(self):
        kinds = set()
        for plan_ in random_plans(60, seed=5, allow_unsupported=True):
            kinds.update(P.operator_names(plan_))
        assert {"Join", "Aggregate", "Filter", "Project", "Scan"} <= kinds

    def test_mix_reaches_unsupported_tail(self):
        plans = random_plans(120, seed=9, allow_unsupported=True)
        unsupported = [p for p in plans if not P.incremental_supported(p)]
        # the Fig. 6 tail: a meaningful minority is FULL-only
        assert 0.05 < len(unsupported) / len(plans) < 0.6

    def test_deterministic_in_seed(self):
        a = [to_sql(p, {t: [c.name for c in cs] for t, cs in _base_cols().items()}) for p in random_plans(5, seed=42)]
        b = [to_sql(p, {t: [c.name for c in cs] for t, cs in _base_cols().items()}) for p in random_plans(5, seed=42)]
        assert a == b

    def test_mix_keys_are_known(self):
        assert set(OPERATOR_MIX) >= {
            "project",
            "filter",
            "join_inner",
            "aggregate",
            "window",
            "scalar_aggregate",
        }


def _base_cols():
    from repro.workload.generator import _BASE

    return _BASE
