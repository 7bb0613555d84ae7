"""Tests for the provided TPC-H-lite generators (repro.synth_data)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestGenerators:
    def test_lineitem_schema_and_size(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        assert li.count() == 6000
        assert "l_orderkey" in li.columns and "l_shipdate" in li.columns

    def test_deterministic_in_seed(self, spark):
        a = synth_data.orders(spark, sf=0.001, seed=9).toPandas()
        b = synth_data.orders(spark, sf=0.001, seed=9).toPandas()
        assert a.equals(b)

    def test_zipf_keys_skewed(self, spark):
        zdf = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        counts = zdf["k"].value_counts()
        assert counts.iloc[0] > counts.iloc[-1] * 5  # heavy head

    def test_uniform_keys_range(self, spark):
        u = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
        assert u["k"].between(1, 50).all()


class TestOracleAgreement:
    def test_orders_priority_counts(self, spark):
        o = synth_data.orders(spark, sf=0.002)
        got = o.groupBy("o_orderpriority").agg(F.count(F.lit(1)).alias("n"))
        assert_equivalent(
            got,
            "SELECT o_orderpriority, COUNT(*) AS n FROM orders GROUP BY o_orderpriority",
            orders=o,
        )

    def test_lineitem_orders_join_cardinality(self, spark):
        li = synth_data.lineitem(spark, sf=0.002)
        o = synth_data.orders(spark, sf=0.002)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .agg(F.count(F.lit(1)).alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT COUNT(*) AS n FROM li JOIN o ON li.l_orderkey = o.o_orderkey",
            li=li,
            o=o,
        )
