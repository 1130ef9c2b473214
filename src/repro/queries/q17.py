"""TPC-H Q17 (lite): small-quantity-order revenue. The correlated AVG
sub-query is decorrelated into a single-table group-by over lineitem
executed *before* the transfer phase (§3.4's prototype heuristic); its
result joins the main graph, so — as the paper highlights for Q17 —
the part predicate can pre-filter the fact table in the main block
while baselines cannot reach it."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, SubQuery, TableRef

BRAND = "Brand#23"
CONTAINER = "MED BOX"

_SUB_SQL_BODY = """
    SELECT l_partkey AS aq_partkey, 0.2 * AVG(l_quantity) AS aq_qty
    FROM lineitem GROUP BY l_partkey
"""


def _sub_spec(d) -> QuerySpec:
    return QuerySpec(
        name="q17_avgqty",
        tables={"lineitem": TableRef(df=d["lineitem"])},
        edges=[],
        join_order=["lineitem"],
        finalize=lambda df, s: df.groupBy("l_partkey")
        .agg((0.2 * F.avg("l_quantity")).alias("aq_qty"))
        .select(F.col("l_partkey").alias("aq_partkey"), "aq_qty"),
    )


def _finalize(df, scalars):
    return df.filter(F.col("l_quantity") < F.col("aq_qty")).agg(
        (F.sum("l_extendedprice") / 7.0).alias("avg_yearly")
    )


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q17",
        tables={
            "lineitem": TableRef(df=d["lineitem"]),
            "part": TableRef(
                df=d["part"],
                predicate=(F.col("p_brand") == BRAND)
                & (F.col("p_container") == CONTAINER),
            ),
            "avgqty": TableRef(subquery="avgqty"),
        },
        edges=[
            Edge("part", ("p_partkey",), "lineitem", ("l_partkey",)),
            Edge("part", ("p_partkey",), "avgqty", ("aq_partkey",)),
            Edge("avgqty", ("aq_partkey",), "lineitem", ("l_partkey",)),
        ],
        join_order=["lineitem", "part", "avgqty"],
        finalize=_finalize,
        subqueries=[SubQuery(name="avgqty", spec=_sub_spec(d))],
        oracle_sql=f"""
            WITH avgqty AS ({_SUB_SQL_BODY})
            SELECT SUM(l_extendedprice) / 7.0 AS avg_yearly
            FROM lineitem, part, avgqty
            WHERE p_partkey = l_partkey AND aq_partkey = l_partkey
              AND p_brand = '{BRAND}' AND p_container = '{CONTAINER}'
              AND l_quantity < aq_qty
        """,
    )
