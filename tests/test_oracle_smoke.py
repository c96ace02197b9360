"""Oracle + provided TPC-H-lite generators sanity (shuffle path exercised)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.mark.spark
class TestOracleSmoke:
    def test_lineitem_aggregate(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        q = (
            li.groupBy("l_returnflag")
            .agg(
                F.count("*").cast("long").alias("n"),
                F.round(F.sum("l_quantity"), 6).alias("sum_qty"),
            )
        )
        assert_equivalent(
            q,
            """
            SELECT l_returnflag, COUNT(*)::BIGINT AS n,
                   ROUND(SUM(l_quantity), 6) AS sum_qty
            FROM li GROUP BY l_returnflag
            """,
            li=li,
        )

    def test_orders_join_customer(self, spark):
        o = synth_data.orders(spark, sf=0.001)
        c = synth_data.customer(spark, sf=0.001)
        q = (
            o.join(c, o.o_custkey == c.c_custkey)
            .groupBy("c_mktsegment")
            .agg(F.count("*").cast("long").alias("n"))
        )
        assert_equivalent(
            q,
            """
            SELECT c_mktsegment, COUNT(*)::BIGINT AS n
            FROM o JOIN c ON o.o_custkey = c.c_custkey
            GROUP BY c_mktsegment
            """,
            o=o,
            c=c,
        )

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        counts = df.k.value_counts()
        assert counts.iloc[0] > 3 * counts.iloc[-1]

    def test_uniform_keys_cover(self, spark):
        df = synth_data.uniform_keys(spark, n=5000, n_keys=50).toPandas()
        assert df.k.nunique() > 40
