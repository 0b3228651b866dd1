"""Oracle checks over the provided TPC-H-lite generators at SF=0.01 —
aggregation and shuffle-join paths verified against DuckDB."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data as sd
from repro.oracle import assert_equivalent

SF = 0.005


@pytest.fixture(scope="module")
def li(spark):
    df = sd.lineitem(spark, sf=SF)
    df.persist().count()
    return df


@pytest.fixture(scope="module")
def od(spark):
    df = sd.orders(spark, sf=SF)
    df.persist().count()
    return df


class TestTpchLite:
    def test_q1_style_aggregation(self, spark, li):
        got = (
            li.groupBy("l_returnflag", "l_linestatus")
            .agg(
                F.sum("l_quantity").alias("sum_qty"),
                F.sum("l_extendedprice").alias("sum_base_price"),
                F.avg("l_discount").alias("avg_disc"),
                F.count(F.lit(1)).alias("count_order"),
            )
        )
        sql = """
            SELECT l_returnflag, l_linestatus,
                   sum(l_quantity)      AS sum_qty,
                   sum(l_extendedprice) AS sum_base_price,
                   avg(l_discount)      AS avg_disc,
                   count(*)             AS count_order
            FROM lineitem
            GROUP BY l_returnflag, l_linestatus
        """
        assert_equivalent(got, sql, lineitem=li)

    def test_shuffle_join_lineitem_orders(self, spark, li, od):
        got = (
            li.join(od, li.l_orderkey == od.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count(F.lit(1)).alias("n"), F.sum("l_extendedprice").alias("rev"))
        )
        sql = """
            SELECT o_orderpriority, count(*) AS n, sum(l_extendedprice) AS rev
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
        """
        assert_equivalent(got, sql, lineitem=li, orders=od)

    def test_customer_filter_aggregate(self, spark):
        cu = sd.customer(spark, sf=SF)
        got = (
            cu.filter(F.col("c_acctbal") > 0)
            .groupBy("c_mktsegment")
            .agg(F.avg("c_acctbal").alias("avg_bal"))
        )
        sql = """
            SELECT c_mktsegment, avg(c_acctbal) AS avg_bal
            FROM customer WHERE c_acctbal > 0 GROUP BY c_mktsegment
        """
        assert_equivalent(got, sql, customer=cu)

    def test_part_counts(self, spark):
        pt = sd.part(spark, sf=SF)
        got = pt.groupBy("p_type").agg(F.count(F.lit(1)).alias("n"))
        assert_equivalent(
            got, "SELECT p_type, count(*) AS n FROM part GROUP BY p_type", part=pt
        )
