"""Figure-4 machinery: Q5 under alternative join orders must produce
identical results for every strategy (conditions are derived from the
edge set, not the order)."""
import pytest

from repro import queries
from repro.core.strategies import run_query
from repro.oracle import assert_equivalent
from repro.queries.q05 import JOIN_ORDERS


@pytest.mark.parametrize("order_name", sorted(JOIN_ORDERS))
@pytest.mark.parametrize("strategy", ["no_pred_trans", "pred_trans"])
def test_q5_join_orders_equivalent(spark, tpch_small, order_name, strategy):
    spec = queries.build("q05", tpch_small.spark)
    rr = run_query(spark, spec, strategy, join_order=JOIN_ORDERS[order_name])
    try:
        assert_equivalent(rr.df, spec.oracle_sql, **tpch_small.pandas)
    finally:
        rr.cleanup()


def test_orders_are_permutations():
    ref = sorted(JOIN_ORDERS["order1"])
    for order in JOIN_ORDERS.values():
        assert sorted(order) == ref


def test_orders_differ():
    assert len({tuple(o) for o in JOIN_ORDERS.values()}) == 3
