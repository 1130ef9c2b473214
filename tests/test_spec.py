"""Tests for the QuerySpec layer: alias renaming and validation."""
import pandas as pd
import pytest

from repro.core.spec import Edge, QuerySpec, SubQuery, TableRef, rename_prefix, validate


@pytest.fixture(scope="module")
def dfs(spark):
    R = spark.createDataFrame(pd.DataFrame({"r_a": [1], "r_x": [1.0]}))
    S = spark.createDataFrame(pd.DataFrame({"s_a": [1], "s_b": [2]}))
    T = spark.createDataFrame(pd.DataFrame({"t_b": [2]}))
    return R, S, T


def _spec(R, S, T, **over):
    kw = dict(
        name="toy",
        tables={"R": TableRef(df=R), "S": TableRef(df=S), "T": TableRef(df=T)},
        edges=[
            Edge("R", ("r_a",), "S", ("s_a",)),
            Edge("S", ("s_b",), "T", ("t_b",)),
        ],
        join_order=["R", "S", "T"],
        finalize=lambda df, s: df,
    )
    kw.update(over)
    return QuerySpec(**kw)


class TestTableRef:
    def test_requires_exactly_one_source(self):
        with pytest.raises(ValueError):
            TableRef()
        with pytest.raises(ValueError):
            TableRef(df="x", subquery="y")


class TestRenamePrefix:
    def test_renames_matching_columns(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"l_a": [1], "l_b": [2], "other": [3]}))
        out = rename_prefix(df, "l_", "l2_")
        assert out.columns == ["l2_a", "l2_b", "other"]

    def test_data_unchanged(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"l_a": [1, 2, 3]}))
        assert sorted(r.l2_a for r in rename_prefix(df, "l_", "l2_").collect()) == [1, 2, 3]

    def test_enables_self_join(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"l_a": [1, 2]}))
        other = rename_prefix(df, "l_", "l2_")
        joined = df.join(other, df["l_a"] == other["l2_a"])
        assert joined.count() == 2


class TestValidate:
    def test_valid_spec_has_no_problems(self, dfs):
        assert validate(_spec(*dfs)) == []

    def test_join_order_must_cover_tables(self, dfs):
        assert validate(_spec(*dfs, join_order=["R", "S"]))

    def test_duplicate_join_order(self, dfs):
        assert validate(_spec(*dfs, join_order=["R", "S", "S"]))

    def test_unknown_edge_table(self, dfs):
        R, S, T = dfs
        bad = _spec(R, S, T, edges=[Edge("R", ("r_a",), "X", ("x",))])
        assert any("unknown table" in p for p in validate(bad))

    def test_missing_edge_column(self, dfs):
        R, S, T = dfs
        bad = _spec(R, S, T, edges=[
            Edge("R", ("r_missing",), "S", ("s_a",)),
            Edge("S", ("s_b",), "T", ("t_b",)),
        ])
        assert any("lacks edge columns" in p for p in validate(bad))

    def test_duplicate_columns_across_tables(self, dfs, spark):
        R, S, T = dfs
        S2 = spark.createDataFrame(pd.DataFrame({"r_a": [1], "s_b": [2]}))
        bad = _spec(R, S2, T, edges=[
            Edge("R", ("r_a",), "S", ("r_a",)),
            Edge("S", ("s_b",), "T", ("t_b",)),
        ])
        assert any("appears in both" in p for p in validate(bad))

    def test_disconnected_join_order(self, dfs):
        R, S, T = dfs
        bad = _spec(R, S, T, join_order=["R", "T", "S"])
        assert any("disconnects" in p for p in validate(bad))

    def test_semi_table_must_enter_as_right_side(self, dfs):
        R, S, T = dfs
        bad = QuerySpec(
            name="toy",
            tables={"R": TableRef(df=R), "S": TableRef(df=S)},
            edges=[Edge("R", ("r_a",), "S", ("s_a",), how="semi")],
            join_order=["S", "R"],  # outer table folded into the semi side
            finalize=lambda df, s: df,
        )
        assert any("right side" in p for p in validate(bad))

    def test_semi_table_must_be_single_edge(self, dfs):
        R, S, T = dfs
        bad = _spec(
            R, S, T,
            edges=[
                Edge("R", ("r_a",), "S", ("s_a",)),
                Edge("T", ("t_b",), "S", ("s_b",), how="semi"),
            ],
            join_order=["T", "S", "R"],
        )
        assert any("exactly one edge" in p for p in validate(bad))

    def test_unknown_subquery_reference(self, dfs):
        R, S, T = dfs
        bad = _spec(
            R, S, T,
            tables={
                "R": TableRef(df=R),
                "S": TableRef(df=S),
                "T": TableRef(subquery="nope"),
            },
        )
        assert any("unknown subquery" in p for p in validate(bad))

    def test_subquery_problems_propagate(self, dfs):
        R, S, T = dfs
        inner = _spec(R, S, T, join_order=["R", "S"])  # invalid
        outer = _spec(*dfs, subqueries=[SubQuery(name="x", spec=inner)])
        assert any(p.startswith("[x]") for p in validate(outer))

    def test_connecting_edges(self, dfs):
        spec = _spec(*dfs)
        assert len(spec.connecting_edges("S", {"R"})) == 1
        assert len(spec.connecting_edges("S", {"R", "T"})) == 2
        assert spec.connecting_edges("T", {"R"}) == []

    def test_edges_of(self, dfs):
        spec = _spec(*dfs)
        assert len(spec.edges_of("S")) == 2
        assert len(spec.edges_of("R")) == 1
