"""Smoke tests for the provided TPC-H-lite generators and DuckDB oracle
(kept from the scaffold; they guard the oracle plumbing all the EMD
tests rely on)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestOracle:
    def test_lineitem_aggregate(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        df = li.groupBy("l_returnflag").agg(
            F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
            F.count("*").alias("n"),
        )
        assert_equivalent(
            df,
            "SELECT l_returnflag, ROUND(SUM(l_quantity),2) AS sum_qty, COUNT(*) AS n "
            "FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )

    def test_join_orders_customer(self, spark):
        o = synth_data.orders(spark, sf=0.001)
        c = synth_data.customer(spark, sf=0.001)
        df = (
            o.join(c, o.o_custkey == c.c_custkey)
            .groupBy("c_mktsegment")
            .agg(F.count("*").alias("n_orders"))
        )
        assert_equivalent(
            df,
            "SELECT c_mktsegment, COUNT(*) AS n_orders FROM orders o "
            "JOIN customer c ON o.o_custkey = c.c_custkey GROUP BY c_mktsegment",
            orders=o,
            customer=c,
        )

    def test_oracle_catches_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        wrong = li.groupBy("l_returnflag").agg(
            (F.count("*") + 1).alias("n")  # off by one: oracle must fail
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )
