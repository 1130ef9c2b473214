"""Smoke tests for the job entrypoints (called as functions with a tiny
SF; the CLI wrappers only add argparse + a session)."""
import jobs.robustness_q5 as robustness_q5
import jobs.run_query as run_query_job
import jobs.table1_q5 as table1_q5
import jobs.tpch_sweep as tpch_sweep
from repro.core.strategies import STRATEGIES

SF = 0.002


def test_table1_job(spark):
    measured = table1_q5.run(spark, sf=SF)
    assert set(measured) == set(STRATEGIES)
    for rows in measured.values():
        assert len(rows) == 5
        assert all(ht >= 0 and pr >= 0 for ht, pr in rows)
    text = table1_q5.format_table(measured, SF)
    assert "Join 5" in text and "pred_trans" in text


def test_table1_paper_reference_shape():
    assert set(table1_q5.PAPER_TABLE1) == set(STRATEGIES)
    assert all(len(v) == 5 for v in table1_q5.PAPER_TABLE1.values())


def test_sweep_job(spark):
    results = tpch_sweep.run(spark, SF, ["q12", "q14"])
    assert set(results) == {"q12", "q14"}
    for row in results.values():
        assert set(row) == set(STRATEGIES)
        assert all(c.total_s > 0 for c in row.values())
    text = tpch_sweep.format_tables(results, SF)
    assert "avg speedup" in text and "phase breakdown" in text


def test_robustness_job(spark):
    results = robustness_q5.run(spark, SF)
    assert set(results) == {"order1", "order2", "order3"}
    text = robustness_q5.format_table(results, SF)
    assert "max/min" in text


def test_run_query_job(spark):
    rr, data = run_query_job.run(spark, "q03", "pred_trans", SF, verify=True)
    assert rr.rows
    rr.cleanup()
    data.unpersist()
