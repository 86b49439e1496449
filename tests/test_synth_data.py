"""Tests for the provided TPC-H-lite generators + DuckDB oracle wiring."""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestGenerators:
    def test_lineitem_row_count(self, spark):
        df = synth_data.lineitem(spark, sf=0.001)
        assert df.count() == 6000

    def test_orders_keys_sequential(self, spark):
        df = synth_data.orders(spark, sf=0.001)
        assert df.agg(F.min("o_orderkey")).first()[0] == 1

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
        top = (
            df.groupBy("k").count().orderBy(F.desc("count")).first()
        )
        assert top["k"] <= 5  # most frequent key is a low rank

    def test_er_reexports(self):
        assert hasattr(synth_data, "er_domain")
        assert hasattr(synth_data, "DOMAINS")


class TestOracle:
    def test_aggregate_equivalence(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("qty"),
            F.count(F.lit(1)).alias("n"),
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, sum(l_quantity) AS qty,
                   count(*) AS n
            FROM li GROUP BY l_returnflag
            """,
            li=li,
        )

    def test_join_equivalence(self, spark):
        li = synth_data.lineitem(spark, sf=0.0005)
        o = synth_data.orders(spark, sf=0.0005)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderstatus")
            .agg(F.sum("l_extendedprice").alias("rev"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderstatus, sum(l_extendedprice) AS rev
            FROM li JOIN o ON l_orderkey = o_orderkey
            GROUP BY o_orderstatus
            """,
            li=li,
            o=o,
        )

    def test_oracle_catches_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.0005)
        wrong = li.agg((F.count(F.lit(1)) + 1).alias("n"))
        with pytest.raises(AssertionError):
            assert_equivalent(wrong, "SELECT count(*) AS n FROM li", li=li)
