"""Benchmark behind **Table 1** (Q5 join-input sizes): times each
strategy's full Q5 execution with HT/PR instrumentation and attaches
the measured join-input sizes as ``extra_info`` so the bench output
regenerates the table. ``jobs/table1_q5.py`` prints the same data
side-by-side with the paper's numbers."""
import pytest

from benchmarks.conftest import SF_BENCH
from repro import queries
from repro.core.strategies import STRATEGIES, run_query


@pytest.mark.parametrize("strategy", STRATEGIES)
def test_table1_q5(benchmark, spark, tpch_bench, strategy):
    benchmark.group = f"table1-q5-sf{SF_BENCH}"
    spec = queries.build("q05", tpch_bench.spark)
    state = {}

    def once():
        rr = run_query(spark, spec, strategy, measure=True)
        state["measures"] = [(m.table, m.ht_rows, m.pr_rows) for m in rr.measures]
        rr.cleanup()

    benchmark.pedantic(once, rounds=1, iterations=1)
    benchmark.extra_info["ht_pr_per_join"] = state["measures"]
    assert len(state["measures"]) == 5
