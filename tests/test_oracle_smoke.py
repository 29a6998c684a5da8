"""Smoke tests exercising the provided synth_data + oracle modules."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestSynthData:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001).toPandas()
        b = synth_data.lineitem(spark, sf=0.001).toPandas()
        assert a.equals(b)

    def test_orders_keys_unique(self, spark):
        o = synth_data.orders(spark, sf=0.001)
        assert o.count() == o.select("o_orderkey").distinct().count()


class TestOracle:
    def test_aggregation_equivalence(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.sum("l_quantity").alias("sum_qty"),
                F.count("*").alias("cnt"),
            )
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS cnt "
            "FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_join_equivalence(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("cnt"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, count(*) AS cnt FROM li "
            "JOIN o ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
            li=li,
            o=o,
        )

    def test_oracle_catches_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        wrong = li.groupBy("l_returnflag").agg(
            (F.count("*") + 1).alias("cnt")  # deliberately off by one
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, count(*) AS cnt FROM li GROUP BY l_returnflag",
                li=li,
            )
