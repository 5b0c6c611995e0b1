"""Sanity coverage-style aggregations over the provided TPC-H-lite
generators, oracle-checked — exercises the shuffle path the conftest
configures (broadcast joins disabled) on the shipped schemas."""
import pyspark.sql.functions as F

from repro import synth_data as sd
from repro.oracle import assert_equivalent


def test_lineitem_groupby_oracle(spark):
    li = sd.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag", "l_linestatus").agg(
        F.count(F.lit(1)).alias("cnt"),
        F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, l_linestatus, count(*) AS cnt, "
        "round(sum(l_quantity), 2) AS sum_qty "
        "FROM li GROUP BY l_returnflag, l_linestatus",
        li=li,
    )


def test_orders_customer_join_oracle(spark):
    o = sd.orders(spark, sf=0.001)
    c = sd.customer(spark, sf=0.001)
    got = (
        o.join(c, o.o_custkey == c.c_custkey)
        .groupBy("c_mktsegment")
        .agg(F.count(F.lit(1)).alias("cnt"))
    )
    assert_equivalent(
        got,
        "SELECT c_mktsegment, count(*) AS cnt FROM o "
        "JOIN c ON o.o_custkey = c.c_custkey GROUP BY c_mktsegment",
        o=o,
        c=c,
    )


def test_bucketized_continuous_attribute_coverage(spark):
    """§II: continuous attributes are bucketised to categorical before
    coverage analysis — do it in Spark and audit the result."""
    from repro.core.coverage import CoverageIndex
    from repro.core.deepdiver import mups_deepdiver

    p = sd.part(spark, sf=0.005)
    cat = p.select(
        F.when(F.col("p_size") <= 10, 0)
        .when(F.col("p_size") <= 25, 1)
        .otherwise(2)
        .alias("size_bucket"),
        (F.col("p_type") == "PROMO").cast("int").alias("is_promo"),
    )
    idx = CoverageIndex.from_spark(cat, ["size_bucket", "is_promo"], [3, 2])
    assert idx.n == p.count()
    mups = mups_deepdiver(idx, 1)
    assert mups == set()  # every bucket combination occurs at this size
