"""Profiling substrate vs. pandas ground truth (Spark aggregations)."""
import pandas as pd
import pytest

from repro.benchdata.base import to_spark_strings
from repro.profiling import (
    duplicate_rows,
    numeric_min_max,
    profile_column,
    profile_table,
    unique_ratio,
)


@pytest.fixture(scope="module")
def toy(spark):
    pdf = pd.DataFrame({
        "row_id": [str(i) for i in range(10)],
        "city": ["Birmingham"] * 5 + ["Boston"] * 3 + ["Boaz", None],
        "score": ["85.0", "90.0", "85.0", "150.0", None,
                  "85.0", "90.0", "85.0", "85.0", "90.0"],
        "mixed": ["5", "x", "7", "9", "9", "9", "2", "1", "3", "4"],
    })
    return pdf, to_spark_strings(spark, pdf)


def test_profile_column_counts(toy):
    _pdf, df = toy
    p = profile_column(df, "city")
    assert p.total == 10 and p.nulls == 1 and p.n_distinct == 3
    assert p.top_values[0] == ("Birmingham", 5)
    assert p.top_values[1] == ("Boston", 3)
    assert p.non_null == 9
    assert p.null_ratio == pytest.approx(0.1)
    assert p.unique_ratio == pytest.approx(3 / 9)


def test_profile_column_top_k(toy):
    _pdf, df = toy
    p = profile_column(df, "mixed", top_k=2)
    assert len(p.top_values) == 2
    assert p.top_values[0] == ("9", 3)


def test_profile_column_deterministic_tiebreak(toy):
    _pdf, df = toy
    p = profile_column(df, "mixed")
    singles = [v for v, c in p.top_values if c == 1]
    assert singles == sorted(singles)  # value-ordered among equal counts


def test_profile_table_matches_per_column(toy):
    _pdf, df = toy
    profs = profile_table(df, ["city", "score", "mixed"], top_k=100)
    for col in ("city", "score", "mixed"):
        single = profile_column(df, col, top_k=100)
        assert profs[col] == single, col


def test_numeric_min_max(toy):
    _pdf, df = toy
    assert numeric_min_max(df, "score") == (85.0, 150.0)
    assert numeric_min_max(df, "mixed") == (1.0, 9.0)  # "x" ignored
    assert numeric_min_max(df, "city") is None


def test_duplicate_rows(spark):
    pdf = pd.DataFrame({
        "row_id": ["0", "1", "2", "3"],
        "a": ["x", "x", "x", "y"],
        "b": ["1", "1", "2", "2"],
    })
    df = to_spark_strings(spark, pdf)
    surplus, samples = duplicate_rows(df, subset=["a", "b"])
    assert surplus == 1
    assert len(samples) == 1 and "x" in samples[0]
    no_dupes, _ = duplicate_rows(df)  # row_id makes rows unique
    assert no_dupes == 0


def test_unique_ratio(toy):
    _pdf, df = toy
    assert unique_ratio(df, "city") == pytest.approx(3 / 9)
    assert unique_ratio(df, "row_id") == 1.0
