"""TPC-H Q11 (lite): important stock identification. The HAVING
threshold is a *scalar* sub-query — scalar aggregation blocks predicate
transfer (§3.4), so the threshold block runs first (with the same
strategy) and its value is injected into ``finalize``."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, SubQuery, TableRef

# dbgen's GERMANY draws no suppliers below SF 0.01 in the lite
# generator; MOZAMBIQUE is populated at every scale factor we run.
NATION = "MOZAMBIQUE"
FRACTION = 0.002  # larger than TPC-H's 0.0001/SF: lite partsupp is smaller

def _value():
    # built lazily: Column construction needs an active SparkContext
    return F.col("ps_supplycost") * F.col("ps_availqty")


def _tables(d):
    return {
        "partsupp": TableRef(df=d["partsupp"]),
        "supplier": TableRef(df=d["supplier"]),
        "nation": TableRef(df=d["nation"], predicate=F.col("n_name") == NATION),
    }


def _edges():
    return [
        Edge("supplier", ("s_suppkey",), "partsupp", ("ps_suppkey",)),
        Edge("nation", ("n_nationkey",), "supplier", ("s_nationkey",)),
    ]


def _sub_spec(d) -> QuerySpec:
    return QuerySpec(
        name="q11_threshold",
        tables=_tables(d),
        edges=_edges(),
        join_order=["partsupp", "supplier", "nation"],
        finalize=lambda df, s: df.agg((F.sum(_value()) * FRACTION).alias("v")),
    )


def _finalize(df, scalars):
    return (
        df.groupBy("ps_partkey")
        .agg(F.sum(_value()).alias("value"))
        .filter(F.col("value") > scalars["threshold"])
    )


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q11",
        tables=_tables(d),
        edges=_edges(),
        join_order=["partsupp", "supplier", "nation"],
        finalize=_finalize,
        subqueries=[SubQuery(name="threshold", spec=_sub_spec(d), scalar=True)],
        oracle_sql=f"""
            SELECT ps_partkey, SUM(ps_supplycost * ps_availqty) AS "value"
            FROM partsupp, supplier, nation
            WHERE ps_suppkey = s_suppkey AND s_nationkey = n_nationkey
              AND n_name = '{NATION}'
            GROUP BY ps_partkey
            HAVING SUM(ps_supplycost * ps_availqty) > (
                SELECT SUM(ps_supplycost * ps_availqty) * {FRACTION}
                FROM partsupp, supplier, nation
                WHERE ps_suppkey = s_suppkey AND s_nationkey = n_nationkey
                  AND n_name = '{NATION}')
        """,
    )
