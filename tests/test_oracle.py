"""The DuckDB oracle itself: catches wrong results, not just 'it ran'."""
import pandas as pd
import pytest

from repro.benchdata.base import to_spark_strings
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def pdf():
    return pd.DataFrame({"k": ["a", "a", "b"], "v": [1.0, 2.0, 3.0]})


def test_passes_on_equivalent_results(spark, pdf):
    df = spark.createDataFrame(pdf)
    got = df.groupBy("k").sum("v").withColumnRenamed("sum(v)", "s")
    assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_fails_on_wrong_rows(spark, pdf):
    df = spark.createDataFrame(pdf)
    wrong = df.where("v > 1").groupBy("k").sum("v") \
              .withColumnRenamed("sum(v)", "s")
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT k, sum(v) AS s FROM t GROUP BY k",
                          t=pdf)


def test_fails_on_column_mismatch(spark, pdf):
    df = spark.createDataFrame(pdf)
    got = df.groupBy("k").sum("v").withColumnRenamed("sum(v)", "other")
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k",
                          t=pdf)


def test_accepts_spark_inputs_as_tables(spark, pdf):
    df = to_spark_strings(spark, pdf.astype(str).assign(row_id=["0", "1", "2"]))
    assert_equivalent(df.select("k", "v"), "SELECT k, v FROM t", t=df)
