"""Benchmark behind the **Figure-2 table** (per-query runtime of the
four strategies) and the **Figure-3 table** (phase breakdown, stored as
``extra_info``). A representative 8-query subset keeps the bench run
bounded; ``jobs/tpch_sweep.py`` covers all 14 queries."""
import pytest

from benchmarks.conftest import SF_BENCH
from repro import queries
from repro.core.strategies import STRATEGIES, run_query

#: The queries the paper calls out: big wins (q02 q03 q17 q18 q21), the
#: case study (q05), cyclic (q09), and a small-gain 2-table query (q12).
BENCH_QUERIES = ("q02", "q03", "q05", "q09", "q12", "q17", "q18", "q21")


@pytest.mark.parametrize("strategy", STRATEGIES)
@pytest.mark.parametrize("query", BENCH_QUERIES)
def test_query_strategy(benchmark, spark, tpch_bench, query, strategy):
    benchmark.group = f"tpch-{query}-sf{SF_BENCH}"
    state = {}

    def once():
        spec = queries.build(query, tpch_bench.spark)
        rr = run_query(spark, spec, strategy)
        state["phases"] = (rr.pre_s, rr.transfer_s, rr.join_s)
        state["rows"] = len(rr.rows)
        rr.cleanup()

    benchmark.pedantic(once, rounds=1, iterations=1)
    pre, transfer, join = state["phases"]
    benchmark.extra_info["pre_s"] = round(pre, 3)
    benchmark.extra_info["transfer_s"] = round(transfer, 3)
    benchmark.extra_info["join_s"] = round(join, 3)
    assert state["rows"] > 0
