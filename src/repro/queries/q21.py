"""TPC-H Q21 (lite): suppliers who kept orders waiting. Three aliases
of lineitem: l1 (the late line, original ``l_`` prefix), l2 (EXISTS —
another supplier's line on the same order → SEMI edge with a ``<>``
extra condition), l3 (NOT EXISTS — another supplier's *late* line →
ANTI edge, transfer restricted to outer→inner per §3.4: filtering l3 by
l1's order keys is sound, the reverse is not)."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, TableRef, rename_prefix

NATION = "SAUDI ARABIA"
STATUS = "F"


def _finalize(df, scalars):
    return df.groupBy("s_suppkey").agg(F.count(F.lit(1)).alias("numwait"))


def spec(d) -> QuerySpec:
    l2 = rename_prefix(d["lineitem"], "l_", "l2_").select("l2_orderkey", "l2_suppkey")
    l3 = rename_prefix(d["lineitem"], "l_", "l3_").select(
        "l3_orderkey", "l3_suppkey", "l3_receiptdate", "l3_commitdate"
    )
    return QuerySpec(
        name="q21",
        tables={
            "supplier": TableRef(df=d["supplier"]),
            "lineitem": TableRef(
                df=d["lineitem"],
                predicate=F.col("l_receiptdate") > F.col("l_commitdate"),
            ),
            "orders": TableRef(df=d["orders"], predicate=F.col("o_orderstatus") == STATUS),
            "nation": TableRef(df=d["nation"], predicate=F.col("n_name") == NATION),
            "l2": TableRef(df=l2),
            "l3": TableRef(
                df=l3, predicate=F.col("l3_receiptdate") > F.col("l3_commitdate")
            ),
        },
        edges=[
            Edge("supplier", ("s_suppkey",), "lineitem", ("l_suppkey",)),
            Edge("orders", ("o_orderkey",), "lineitem", ("l_orderkey",)),
            Edge("nation", ("n_nationkey",), "supplier", ("s_nationkey",)),
            Edge(
                "lineitem",
                ("l_orderkey",),
                "l2",
                ("l2_orderkey",),
                how="semi",
                extra=lambda l1df, l2df: l1df["l_suppkey"] != l2df["l2_suppkey"],
            ),
            Edge(
                "lineitem",
                ("l_orderkey",),
                "l3",
                ("l3_orderkey",),
                how="anti",
                transfer="ltr",
                extra=lambda l1df, l3df: l1df["l_suppkey"] != l3df["l3_suppkey"],
            ),
        ],
        join_order=["lineitem", "orders", "supplier", "nation", "l2", "l3"],
        finalize=_finalize,
        oracle_sql=f"""
            SELECT s_suppkey, COUNT(*) AS numwait
            FROM supplier, lineitem l1, orders, nation
            WHERE s_suppkey = l1.l_suppkey AND o_orderkey = l1.l_orderkey
              AND o_orderstatus = '{STATUS}'
              AND l1.l_receiptdate > l1.l_commitdate
              AND s_nationkey = n_nationkey AND n_name = '{NATION}'
              AND EXISTS (
                SELECT 1 FROM lineitem l2
                WHERE l2.l_orderkey = l1.l_orderkey
                  AND l2.l_suppkey <> l1.l_suppkey)
              AND NOT EXISTS (
                SELECT 1 FROM lineitem l3
                WHERE l3.l_orderkey = l1.l_orderkey
                  AND l3.l_suppkey <> l1.l_suppkey
                  AND l3.l_receiptdate > l3.l_commitdate)
            GROUP BY s_suppkey
        """,
    )
