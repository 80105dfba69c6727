"""The DuckDB oracle itself, plus provided TPC-H-lite generators."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_oracle_passes_on_equal(spark):
    df = spark.createDataFrame([(1, "a"), (2, "b")], ["n", "s"])
    assert_equivalent(df, "SELECT n, s FROM d", d=df)


def test_oracle_ignores_projection_order(spark):
    df = spark.createDataFrame([(1, "a")], ["n", "s"])
    assert_equivalent(df.select("s", "n"), "SELECT n, s FROM d", d=df)


def test_oracle_fails_on_value_diff(spark):
    df = spark.createDataFrame([(1,)], ["n"])
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT n + 1 AS n FROM d", d=df)


def test_oracle_fails_on_column_mismatch(spark):
    df = spark.createDataFrame([(1,)], ["n"])
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT n AS other FROM d", d=df)


def test_lineitem_aggregation_oracle(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(
        F.count("*").cast("long").alias("n"),
        F.round(F.sum("l_quantity"), 2).alias("qty"),
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, count(*)::BIGINT AS n, round(sum(l_quantity), 2) AS qty "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_join_oracle(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").cast("long").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, count(*)::BIGINT AS n FROM li "
        "JOIN o ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
        li=li, o=o,
    )


def test_synth_data_deterministic(spark):
    a = synth_data.customer(spark, sf=0.001).toPandas()
    b = synth_data.customer(spark, sf=0.001).toPandas()
    assert a.equals(b)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=2000, n_keys=100)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()
    assert top["count"] > 2000 / 100 * 3  # far above uniform share
