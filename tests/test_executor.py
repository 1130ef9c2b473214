"""Executor tests on the toy chain: condition derivation, join types,
extra conditions, instrumentation."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.executor import execute_join_phase
from repro.core.spec import Edge, QuerySpec, TableRef


def _spec(toy, edges, order):
    return QuerySpec(
        name="toy",
        tables={k: TableRef(df=v) for k, v in toy.items() if k in order},
        edges=edges,
        join_order=order,
        finalize=lambda df, s: df,
    )


def _tables(spec, toy):
    return {t: toy[t] for t in spec.tables}


CHAIN = lambda: [
    Edge("R", ("r_a",), "S", ("s_a",)),
    Edge("S", ("s_b",), "T", ("t_b",)),
]


class TestInnerJoins:
    def test_chain_result(self, toy):
        spec = _spec(toy, CHAIN(), ["R", "S", "T"])
        df, _ = execute_join_phase(spec, _tables(spec, toy))
        rows = {(r.r_a, r.s_b, r.t_b) for r in df.collect()}
        # a=1 joins S rows (1,10),(1,11); both t_b present in T
        assert rows == {(1, 10, 10), (1, 11, 11)}

    def test_order_invariance(self, toy):
        spec = _spec(toy, CHAIN(), ["R", "S", "T"])
        a, _ = execute_join_phase(spec, _tables(spec, toy), join_order=["R", "S", "T"])
        b, _ = execute_join_phase(spec, _tables(spec, toy), join_order=["T", "S", "R"])
        assert {tuple(sorted(r.asDict().items())) for r in a.collect()} == {
            tuple(sorted(r.asDict().items())) for r in b.collect()
        }

    def test_multi_edge_step_conjoins_conditions(self, toy, spark):
        # U joins both R (on a) and T (on b) when folded in last -> both
        # conditions must apply.
        U = spark.createDataFrame(
            pd.DataFrame({"u_a": [1, 1, 2], "u_b": [10, 99, 12]})
        )
        toy2 = dict(toy, U=U)
        edges = CHAIN() + [
            Edge("R", ("r_a",), "U", ("u_a",)),
            Edge("T", ("t_b",), "U", ("u_b",)),
        ]
        spec = _spec(toy2, edges, ["R", "S", "T", "U"])
        df, _ = execute_join_phase(spec, _tables(spec, toy2))
        rows = {(r.r_a, r.t_b, r.u_b) for r in df.collect()}
        assert rows == {(1, 10, 10)}  # u=(1,99) fails the T condition

    def test_disconnected_order_raises(self, toy):
        spec = _spec(toy, CHAIN(), ["R", "T", "S"])
        with pytest.raises(ValueError, match="disconnects"):
            execute_join_phase(spec, _tables(spec, toy))


class TestSemiAnti:
    def test_semi_keeps_left_columns_only(self, toy):
        edges = [Edge("R", ("r_a",), "S", ("s_a",), how="semi")]
        spec = _spec(toy, edges, ["R", "S"])
        df, _ = execute_join_phase(spec, _tables(spec, toy))
        assert df.columns == ["r_a", "r_x"]
        assert {r.r_a for r in df.collect()} == {1, 2}

    def test_semi_does_not_duplicate(self, toy):
        # R a=1 matches two S rows but must appear once.
        edges = [Edge("R", ("r_a",), "S", ("s_a",), how="semi")]
        spec = _spec(toy, edges, ["R", "S"])
        df, _ = execute_join_phase(spec, _tables(spec, toy))
        assert df.filter(F.col("r_a") == 1).count() == 1

    def test_anti(self, toy):
        edges = [Edge("R", ("r_a",), "S", ("s_a",), how="anti", transfer="ltr")]
        spec = _spec(toy, edges, ["R", "S"])
        df, _ = execute_join_phase(spec, _tables(spec, toy))
        assert {r.r_a for r in df.collect()} == {3}

    def test_extra_condition_on_semi(self, toy):
        # EXISTS (s_a = r_a AND s_y > 1): drops nothing for a=2 (s_y=3),
        # keeps a=1 via (1,11,y=2).
        edges = [
            Edge(
                "R",
                ("r_a",),
                "S",
                ("s_a",),
                how="semi",
                extra=lambda rdf, sdf: sdf["s_y"] > 1,
            )
        ]
        spec = _spec(toy, edges, ["R", "S"])
        df, _ = execute_join_phase(spec, _tables(spec, toy))
        assert {r.r_a for r in df.collect()} == {1, 2}

    def test_extra_condition_receives_left_df_first(self, toy):
        edges = [
            Edge(
                "R",
                ("r_a",),
                "S",
                ("s_a",),
                extra=lambda rdf, sdf: rdf["r_x"] > sdf["s_y"],
            )
        ]
        spec = _spec(toy, edges, ["R", "S"])
        df, _ = execute_join_phase(spec, _tables(spec, toy))
        # r_x is 10/20/30 and s_y is 1..4 so every equi match passes.
        assert df.count() == 3

    def test_semi_mixed_with_inner_rejected(self, toy, spark):
        U = spark.createDataFrame(pd.DataFrame({"u_a": [1], "u_b": [10]}))
        toy2 = dict(toy, U=U)
        edges = CHAIN() + [
            Edge("R", ("r_a",), "U", ("u_a",), how="semi"),
            Edge("T", ("t_b",), "U", ("u_b",)),
        ]
        spec = _spec(toy2, edges, ["R", "S", "T", "U"])
        with pytest.raises(ValueError, match="mixes"):
            execute_join_phase(spec, _tables(spec, toy2))


class TestMeasurement:
    def test_counts_per_step(self, toy):
        spec = _spec(toy, CHAIN(), ["R", "S", "T"])
        _, measures = execute_join_phase(spec, _tables(spec, toy), measure=True)
        assert [(m.step, m.table) for m in measures] == [(1, "S"), (2, "T")]
        assert measures[0].ht_rows == 4 and measures[0].pr_rows == 3
        assert measures[1].ht_rows == 3
        # after R ⋈ S: rows (1,10),(1,11),(2,12)
        assert measures[1].pr_rows == 3

    def test_no_measure_returns_empty(self, toy):
        spec = _spec(toy, CHAIN(), ["R", "S", "T"])
        _, measures = execute_join_phase(spec, _tables(spec, toy))
        assert measures == []
