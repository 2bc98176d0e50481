"""Provided TPC-H-lite scaffold: generators stay deterministic and the
Spark aggregation path agrees with the DuckDB oracle (shuffle path —
broadcast joins are disabled by the session fixture)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002, seed=0).cache()


def test_lineitem_shape(li):
    assert li.count() == 12000
    assert "l_quantity" in li.columns


def test_generators_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    b = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    import pandas as pd
    pd.testing.assert_frame_equal(a, b)


def test_q1_style_aggregate_matches_oracle(spark, li):
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count(F.lit(1)).alias("n"),
        )
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, sum(l_quantity) AS sum_qty, "
        "count(*) AS n FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_join_aggregate_matches_oracle(spark):
    o = synth_data.orders(spark, sf=0.002)
    c = synth_data.customer(spark, sf=0.002)
    got = (
        o.join(c, o.o_custkey == c.c_custkey)
        .groupBy("c_mktsegment")
        .agg(F.sum("o_totalprice").alias("rev"))
    )
    assert_equivalent(
        got,
        "SELECT c_mktsegment, sum(o_totalprice) AS rev FROM o "
        "JOIN c ON o_custkey = c_custkey GROUP BY c_mktsegment",
        o=o, c=c,
    )


def test_zipf_keys_are_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20000, n_keys=1000)
    top = (df.groupBy("k").count().orderBy(F.desc("count"))
           .limit(1).collect()[0])
    assert top["k"] == 1            # rank-1 key dominates
    assert top["count"] > 20000 / 1000 * 5


def test_uniform_keys_are_flat(spark):
    df = synth_data.uniform_keys(spark, n=20000, n_keys=100)
    counts = [r["count"] for r in df.groupBy("k").count().collect()]
    assert max(counts) < 2.0 * (20000 / 100)
