"""Provided substrate smoke tests: synth_data generators + the DuckDB
oracle wired through a real Spark query (per the repo conventions)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestSynthData:
    def test_lineitem_shape(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        assert li.count() == 6000
        assert "l_quantity" in li.columns

    def test_orders_keys_sequential(self, spark):
        o = synth_data.orders(spark, sf=0.001).toPandas()
        assert o["o_orderkey"].min() == 1
        assert o["o_orderkey"].is_unique

    def test_zipf_skewed(self, spark):
        z = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        top = z["k"].value_counts(normalize=True).iloc[0]
        assert top > 0.05  # head key dominates under zipf

    def test_uniform_keys_cover_range(self, spark):
        u = synth_data.uniform_keys(spark, n=5000, n_keys=10).toPandas()
        assert set(u["k"]) == set(range(1, 11))


class TestOracle:
    def test_aggregation_equivalence(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.sum("l_quantity").alias("sum_qty"),
                F.count(F.lit(1)).alias("n"),
            )
        )
        assert_equivalent(
            got,
            "select l_returnflag, sum(l_quantity) as sum_qty, count(*) as n "
            "from li group by l_returnflag",
            li=li,
        )

    def test_join_equivalence(self, spark):
        li = synth_data.lineitem(spark, sf=0.0005)
        o = synth_data.orders(spark, sf=0.0005)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count(F.lit(1)).alias("n"))
        )
        assert_equivalent(
            got,
            "select o_orderpriority, count(*) as n from li "
            "join o on l_orderkey = o_orderkey group by o_orderpriority",
            li=li,
            o=o,
        )

    def test_oracle_catches_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.0005)
        wrong = li.groupBy("l_returnflag").agg(
            (F.count(F.lit(1)) + 1).alias("n")  # deliberately off by one
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "select l_returnflag, count(*) as n from li group by l_returnflag",
                li=li,
            )
