"""The central correctness suite: every strategy on every query must
return exactly the DuckDB ground truth (the oracle diffs sorted rows,
so a wrong rewrite, a lossy Bloom transfer, or a broken semi/anti edge
fails loudly, not silently)."""
import pytest

from repro import queries
from repro.core.strategies import STRATEGIES, run_query
from repro.oracle import assert_equivalent


@pytest.mark.parametrize("strategy", STRATEGIES)
@pytest.mark.parametrize("name", queries.ALL)
def test_strategy_matches_oracle(spark, tpch_small, name, strategy):
    spec = queries.build(name, tpch_small.spark)
    rr = run_query(spark, spec, strategy)
    try:
        assert rr.rows, f"{name} returned no rows — retune its constants"
        assert_equivalent(rr.df, spec.oracle_sql, **tpch_small.pandas)
    finally:
        rr.cleanup()


@pytest.mark.parametrize("name", ["q05", "q18"])
def test_phase_timings_populated(spark, tpch_small, name):
    spec = queries.build(name, tpch_small.spark)
    rr = run_query(spark, spec, "pred_trans")
    try:
        assert rr.transfer_s > 0 and rr.join_s > 0
        assert rr.total_s >= rr.transfer_s + rr.join_s - 1e-9
        assert rr.reduced_sizes and rr.sizes
    finally:
        rr.cleanup()


def test_unknown_strategy_rejected(spark, tpch_small):
    spec = queries.build("q03", tpch_small.spark)
    with pytest.raises(ValueError, match="unknown strategy"):
        run_query(spark, spec, "bloomy")
