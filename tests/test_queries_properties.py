"""Static properties of every query spec: structural validity,
connectivity, oracle presence — cheap checks that run before the
expensive oracle equivalence suite."""
import pytest

from repro import queries
from repro.core.graph import bfs_join_tree
from repro.core.spec import validate


@pytest.fixture(scope="module")
def specs(tpch_small):
    return {name: queries.build(name, tpch_small.spark) for name in queries.ALL}


class TestSpecs:
    @pytest.mark.parametrize("name", queries.ALL)
    def test_validates_clean(self, specs, name):
        assert validate(specs[name]) == []

    @pytest.mark.parametrize("name", queries.ALL)
    def test_join_graph_connected(self, specs, name):
        spec = specs[name]
        # BFS from the first join-order table must reach every table.
        bfs_join_tree(list(spec.tables), spec.edges, spec.join_order[0])

    @pytest.mark.parametrize("name", queries.ALL)
    def test_oracle_sql_present_and_references_base_tables(self, specs, name):
        sql = specs[name].oracle_sql
        assert sql and "SELECT" in sql.upper()

    @pytest.mark.parametrize("name", queries.ALL)
    def test_at_least_one_local_predicate_or_subquery(self, specs, name):
        spec = specs[name]
        has_pred = any(t.predicate is not None for t in spec.tables.values())
        assert has_pred or spec.subqueries, "nothing to transfer"

    @pytest.mark.parametrize("name", queries.ALL)
    def test_multi_join_except_known_two_table_queries(self, specs, name):
        n = len(specs[name].tables)
        if name in ("q04", "q12", "q14", "q19"):
            assert n == 2
        else:
            assert n >= 3

    def test_suite_covers_the_paper_shapes(self, specs):
        # cyclic (q05 via nation-triangle, q09 via partsupp), aliases
        # (q08 two nations, q21 three lineitems), semi/anti, subqueries
        assert len(specs["q08"].tables) == 8
        hows = {e.how for e in specs["q21"].edges}
        assert {"semi", "anti"} <= hows
        assert specs["q02"].subqueries and specs["q17"].subqueries
        assert any(s.scalar for s in specs["q11"].subqueries)

    def test_q05_has_figure1_cycle(self, specs):
        # the {customer, supplier, nation} equality class is a triangle
        pairs = {frozenset((e.left, e.right)) for e in specs["q05"].edges}
        tri = [
            frozenset(("customer", "supplier")),
            frozenset(("nation", "supplier")),
            frozenset(("nation", "customer")),
        ]
        assert all(t in pairs for t in tri)

    def test_q21_anti_edge_restricted(self, specs):
        anti = [e for e in specs["q21"].edges if e.how == "anti"]
        assert len(anti) == 1 and anti[0].transfer == "ltr"

    def test_registry_complete(self):
        assert len(queries.ALL) == 14
        assert queries.ALL == sorted(queries.QUERIES)
