"""Benchmark behind the **Figure-4 table**: Q5 under three join orders
per strategy. The claim to check in the grouped output: Pred-Trans is
fastest on every order and its spread across orders is the smallest."""
import pytest

from benchmarks.conftest import SF_BENCH
from repro import queries
from repro.core.strategies import STRATEGIES, run_query
from repro.queries.q05 import JOIN_ORDERS


@pytest.mark.parametrize("strategy", STRATEGIES)
@pytest.mark.parametrize("order_name", sorted(JOIN_ORDERS))
def test_q5_order(benchmark, spark, tpch_bench, order_name, strategy):
    benchmark.group = f"robustness-q5-{order_name}-sf{SF_BENCH}"
    state = {}

    def once():
        spec = queries.build("q05", tpch_bench.spark)
        rr = run_query(spark, spec, strategy, join_order=JOIN_ORDERS[order_name])
        state["rows"] = len(rr.rows)
        rr.cleanup()

    benchmark.pedantic(once, rounds=1, iterations=1)
    benchmark.extra_info["join_order"] = ">".join(JOIN_ORDERS[order_name])
    assert state["rows"] > 0
