"""Distributed Bloom build/probe tests over Spark DataFrames."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.bloom.spark_bloom import BloomSpec, bloom_filter_df, build_blooms


@pytest.fixture(scope="module")
def kv(spark):
    """10k-row table with keys 0..999 (each ~10x)."""
    pdf = pd.DataFrame({"k": [i % 1000 for i in range(10_000)], "v": range(10_000)})
    df = spark.createDataFrame(pdf).repartition(8)
    df.persist().count()
    yield df
    df.unpersist()


class TestBuild:
    def test_membership_of_built_filter(self, kv):
        (bloom,) = build_blooms(kv, [BloomSpec(("k",), 1000)])
        from repro.bloom.hashing import combine_columns, mix64

        present = mix64(combine_columns([pd.Series(range(1000))]))
        absent = mix64(combine_columns([pd.Series(range(5000, 10_000))]))
        assert bloom.contains_hashed(present).all()
        assert bloom.contains_hashed(absent).mean() < 0.05

    def test_multiple_specs_one_scan(self, kv):
        blooms = build_blooms(
            kv, [BloomSpec(("k",), 1000), BloomSpec(("v",), 10_000)]
        )
        assert len(blooms) == 2
        assert blooms[0].n_bits != blooms[1].n_bits  # sized independently

    def test_empty_specs(self, kv):
        assert build_blooms(kv, []) == []

    def test_empty_dataframe_builds_empty_filter(self, kv):
        (bloom,) = build_blooms(kv.filter("k < 0"), [BloomSpec(("k",), 10)])
        assert bloom.bit_count == 0


class TestProbe:
    def test_no_false_negatives_end_to_end(self, spark, kv):
        build = kv.filter("k < 100")
        (bloom,) = build_blooms(build, [BloomSpec(("k",), 100)])
        probe = bloom_filter_df(kv, ("k",), bloom)
        kept = {r.k for r in probe.select("k").distinct().collect()}
        assert set(range(100)) <= kept

    def test_filters_most_non_members(self, spark, kv):
        build = kv.filter("k < 100")
        (bloom,) = build_blooms(build, [BloomSpec(("k",), 100, fpp=0.01)])
        n = bloom_filter_df(kv, ("k",), bloom).count()
        # 1000 true rows + fp margin over the other 9000
        assert 1000 <= n <= 1000 + 0.05 * 9000

    def test_empty_build_side_filters_everything(self, spark, kv):
        (bloom,) = build_blooms(kv.filter("k < 0"), [BloomSpec(("k",), 10)])
        assert bloom_filter_df(kv, ("k",), bloom).count() == 0

    def test_multi_column_probe(self, spark):
        left = spark.createDataFrame(pd.DataFrame({"a": [1, 1, 2], "b": [1, 2, 1]}))
        right = spark.createDataFrame(pd.DataFrame({"a": [1], "b": [2]}))
        (bloom,) = build_blooms(right, [BloomSpec(("a", "b"), 1, fpp=0.001)])
        kept = bloom_filter_df(left, ("a", "b"), bloom).collect()
        assert {(r.a, r.b) for r in kept} == {(1, 2)}

    def test_string_keys(self, spark):
        names = spark.createDataFrame(pd.DataFrame({"n": ["ASIA", "EUROPE", "AFRICA"]}))
        build = spark.createDataFrame(pd.DataFrame({"m": ["ASIA"]}))
        (bloom,) = build_blooms(build, [BloomSpec(("m",), 1, fpp=0.001)])
        kept = bloom_filter_df(names, ("n",), bloom).collect()
        assert {r.n for r in kept} == {"ASIA"}

    def test_date_keys(self, spark):
        dates = pd.to_datetime(["1994-01-01", "1995-06-15", "1996-12-31"])
        left = spark.createDataFrame(pd.DataFrame({"d": dates}))
        build = spark.createDataFrame(pd.DataFrame({"e": dates[:1]}))
        (bloom,) = build_blooms(build, [BloomSpec(("e",), 1, fpp=0.001)])
        assert bloom_filter_df(left, ("d",), bloom).count() == 1

    def test_apply_blooms_multiple_filters_conjoin(self, spark, kv):
        from repro.bloom.spark_bloom import apply_blooms

        b1 = build_blooms(kv.filter("k < 100"), [BloomSpec(("k",), 100, 0.001)])[0]
        b2 = build_blooms(kv.filter("k >= 50"), [BloomSpec(("k",), 950, 0.001)])[0]
        out = apply_blooms(kv, [(("k",), b1), (("k",), b2)])
        kept = {r.k for r in out.select("k").distinct().collect()}
        assert set(range(50, 100)) <= kept
        assert 0 not in kept and 999 not in kept

    def test_apply_blooms_empty_list_is_identity(self, spark, kv):
        from repro.bloom.spark_bloom import apply_blooms

        assert apply_blooms(kv, []) is kv

    def test_apply_blooms_mixed_key_sets(self, spark):
        from repro.bloom.spark_bloom import apply_blooms

        df = spark.createDataFrame(
            pd.DataFrame({"a": [1, 1, 2, 3], "b": [10, 11, 12, 13]})
        )
        ba = build_blooms(df.filter("a <= 2"), [BloomSpec(("a",), 3, 0.001)])[0]
        bab = build_blooms(
            df.filter("b >= 11"), [BloomSpec(("a", "b"), 3, 0.001)]
        )[0]
        out = apply_blooms(df, [(("a",), ba), (("a", "b"), bab)])
        assert {(r.a, r.b) for r in out.collect()} == {(1, 11), (2, 12)}

    def test_probe_equivalent_to_semijoin_superset(self, spark, kv):
        """bloom-filtered ⊇ exact semi-join, and equal modulo fps."""
        build = kv.filter("k % 7 = 0").select(F.col("k").alias("bk"))
        (bloom,) = build_blooms(build, [BloomSpec(("bk",), 2000, fpp=0.01)])
        bloomed = bloom_filter_df(kv, ("k",), bloom)
        exact = kv.join(build, kv["k"] == build["bk"], "leftsemi")
        assert exact.exceptAll(bloomed.select(*kv.columns)).count() == 0
