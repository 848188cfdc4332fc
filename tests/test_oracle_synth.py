"""Sanity checks of the provided synthetic data against the DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.synth_data import customer, lineitem, orders, part, zipf_keys


@pytest.fixture(scope="module")
def li(spark):
    df = lineitem(spark, sf=0.002).cache()
    df.count()
    yield df
    df.unpersist()


class TestOracleAgreement:
    def test_returnflag_rollup(self, spark, li):
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("qty"),
            F.count(F.lit(1)).cast("double").alias("cnt"),
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, sum(l_quantity) AS qty, "
            "CAST(count(*) AS DOUBLE) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_orders_priority_counts(self, spark):
        o = orders(spark, sf=0.002)
        got = o.groupBy("o_orderpriority").agg(
            F.count(F.lit(1)).cast("double").alias("cnt")
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, CAST(count(*) AS DOUBLE) AS cnt "
            "FROM o GROUP BY o_orderpriority",
            o=o,
        )

    def test_customer_segments(self, spark):
        c = customer(spark, sf=0.002)
        got = c.groupBy("c_mktsegment").agg(
            F.avg("c_acctbal").alias("bal")
        )
        assert_equivalent(
            got,
            "SELECT c_mktsegment, avg(c_acctbal) AS bal FROM c "
            "GROUP BY c_mktsegment",
            c=c,
        )

    def test_part_brand_counts(self, spark):
        p = part(spark, sf=0.002)
        got = p.groupBy("p_brand").agg(
            F.count(F.lit(1)).cast("double").alias("cnt")
        )
        assert_equivalent(
            got,
            "SELECT p_brand, CAST(count(*) AS DOUBLE) AS cnt FROM p "
            "GROUP BY p_brand",
            p=p,
        )

    def test_zipf_keys_skewed(self, spark):
        z = zipf_keys(spark, n=20_000, n_keys=1000)
        top = (
            z.groupBy("k").count().orderBy(F.desc("count")).limit(1).toPandas()
        )
        assert top["count"].iloc[0] > 3 * 20_000 / 1000
