"""TPC-H Q2 (lite): minimum-cost supplier. Nine logical tables once the
decorrelated min-cost sub-query joins the main block — the paper's
biggest win (45×/40× over No-Pred-Trans / Bloom Join): the part and
region predicates reach every table only under full transfer.

The correlated scalar sub-query is decorrelated the standard way into a
grouped min over (partsupp ⋈ supplier ⋈ nation ⋈ region) keyed by
partkey; the main block equi-joins it on both (partkey) and
(partkey, supplycost) — the latter a two-column transfer edge."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, SubQuery, TableRef

SIZE = 15  # size-only: adding a p_type conjunct leaves <2 parts below SF 0.01
REGION = "EUROPE"

_SUB_SQL_BODY = f"""
    SELECT ps_partkey AS mc_partkey, MIN(ps_supplycost) AS mc_cost
    FROM partsupp, supplier, nation, region
    WHERE ps_suppkey = s_suppkey AND s_nationkey = n_nationkey
      AND n_regionkey = r_regionkey AND r_name = '{REGION}'
    GROUP BY ps_partkey
"""


def _sub_finalize(df, scalars):
    return df.groupBy("ps_partkey").agg(F.min("ps_supplycost").alias("mc_cost")).select(
        F.col("ps_partkey").alias("mc_partkey"), "mc_cost"
    )


def _sub_spec(d) -> QuerySpec:
    return QuerySpec(
        name="q02_mincost",
        tables={
            "partsupp": TableRef(df=d["partsupp"]),
            "supplier": TableRef(df=d["supplier"]),
            "nation": TableRef(df=d["nation"]),
            "region": TableRef(df=d["region"], predicate=F.col("r_name") == REGION),
        },
        edges=[
            Edge("supplier", ("s_suppkey",), "partsupp", ("ps_suppkey",)),
            Edge("nation", ("n_nationkey",), "supplier", ("s_nationkey",)),
            Edge("region", ("r_regionkey",), "nation", ("n_regionkey",)),
        ],
        join_order=["partsupp", "supplier", "nation", "region"],
        finalize=_sub_finalize,
        oracle_sql=_SUB_SQL_BODY,
    )


def _finalize(df, scalars):
    return df.select(
        F.col("p_partkey").alias("a_partkey"),
        F.col("s_suppkey").alias("a_suppkey"),
        "n_name",
        "s_acctbal",
        F.col("ps_supplycost").alias("x_supplycost"),
    )


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q02",
        tables={
            "part": TableRef(
                df=d["part"],
                predicate=F.col("p_size") == SIZE,
            ),
            "partsupp": TableRef(df=d["partsupp"]),
            "supplier": TableRef(df=d["supplier"]),
            "nation": TableRef(df=d["nation"]),
            "region": TableRef(df=d["region"], predicate=F.col("r_name") == REGION),
            "mincost": TableRef(subquery="mincost"),
        },
        edges=[
            Edge("part", ("p_partkey",), "partsupp", ("ps_partkey",)),
            Edge("supplier", ("s_suppkey",), "partsupp", ("ps_suppkey",)),
            Edge("nation", ("n_nationkey",), "supplier", ("s_nationkey",)),
            Edge("region", ("r_regionkey",), "nation", ("n_regionkey",)),
            Edge("part", ("p_partkey",), "mincost", ("mc_partkey",)),
            Edge(
                "partsupp",
                ("ps_partkey", "ps_supplycost"),
                "mincost",
                ("mc_partkey", "mc_cost"),
            ),
        ],
        join_order=["partsupp", "part", "mincost", "supplier", "nation", "region"],
        finalize=_finalize,
        subqueries=[SubQuery(name="mincost", spec=_sub_spec(d))],
        oracle_sql=f"""
            WITH mincost AS ({_SUB_SQL_BODY})
            SELECT p_partkey AS a_partkey, s_suppkey AS a_suppkey,
                   n_name, s_acctbal, ps_supplycost AS x_supplycost
            FROM part, partsupp, supplier, nation, region, mincost
            WHERE p_partkey = ps_partkey AND ps_suppkey = s_suppkey
              AND s_nationkey = n_nationkey AND n_regionkey = r_regionkey
              AND r_name = '{REGION}' AND p_size = {SIZE}
              AND mc_partkey = p_partkey AND ps_supplycost = mc_cost
        """,
    )
