"""Direct tests for the table-level core steps (duplication,
misplacement) that need a Spark frame."""
import pandas as pd
import pytest

from repro.benchdata.base import to_spark_strings
from repro.core.duplication import clean_duplication
from repro.core.misplacement import _dominant_domain, clean_misplacement
from repro.llm import SimulatedLLM

LLM = SimulatedLLM()


# ---------------------------------------------------------------------------
# duplication (§2.1.7)
# ---------------------------------------------------------------------------

def test_duplication_detected_and_deduped(spark):
    pdf = pd.DataFrame({
        "row_id": ["0", "1", "2"],
        "a": ["x", "x", "y"], "b": ["1", "1", "2"],
    }).astype(object)
    r = clean_duplication(to_spark_strings(spark, pdf), "orders",
                          ["a", "b"], LLM)
    assert r.detected and r.surplus == 1 and r.should_dedupe


def test_duplication_acceptable_for_log_tables(spark):
    pdf = pd.DataFrame({
        "row_id": ["0", "1"],
        "a": ["x", "x"], "b": ["1", "1"],
    }).astype(object)
    r = clean_duplication(to_spark_strings(spark, pdf), "sensor_log",
                          ["a", "b"], LLM)
    assert r.detected and not r.should_dedupe


def test_duplication_none(spark):
    pdf = pd.DataFrame({
        "row_id": ["0", "1"], "a": ["x", "y"], "b": ["1", "1"],
    }).astype(object)
    r = clean_duplication(to_spark_strings(spark, pdf), "t", ["a", "b"], LLM)
    assert not r.detected and r.review is None


# ---------------------------------------------------------------------------
# misplacement domain inference
# ---------------------------------------------------------------------------

def test_dominant_domain_pure_column():
    counts = (("eng", 400), ("fre", 100))
    assert _dominant_domain(counts) == "language"


def test_dominant_domain_with_minority_pollution():
    counts = (("English", 400), ("USA", 40))
    assert _dominant_domain(counts) == "language"


def test_dominant_domain_unclassifiable():
    assert _dominant_domain((("widget", 10), ("gadget", 5))) is None


def test_dominant_domain_mixed_no_purity():
    counts = (("eng", 100), ("USA", 100))
    assert _dominant_domain(counts) is None


def test_clean_misplacement_detects_swapped_pair(spark):
    rows = [{"row_id": str(i),
             "language": "USA" if i < 5 else "eng",
             "country": "eng" if i < 5 else "USA",
             "other": "zzz"} for i in range(30)]
    pdf = pd.DataFrame(rows).astype(object)
    df = to_spark_strings(spark, pdf)
    counts = {
        "language": (("eng", 25), ("USA", 5)),
        "country": (("USA", 25), ("eng", 5)),
        "other": (("zzz", 30),),
    }
    r = clean_misplacement(df, counts, LLM)
    assert r.detected
    swap = r.swaps[0]
    assert {swap.col_a, swap.col_b} == {"language", "country"}
    assert swap.n_evidence == 5
    off = {swap.col_a: swap.a_offending, swap.col_b: swap.b_offending}
    assert off["language"] == ["USA"] and off["country"] == ["eng"]


def test_clean_misplacement_requires_row_cooccurrence(spark):
    # offending values never co-occur in the same row -> no swap
    rows = [{"row_id": str(i),
             "language": "USA" if i < 2 else "eng",
             "country": "eng" if i >= 28 else "USA"} for i in range(30)]
    pdf = pd.DataFrame(rows).astype(object)
    counts = {
        "language": (("eng", 28), ("USA", 2)),
        "country": (("USA", 28), ("eng", 2)),
    }
    r = clean_misplacement(to_spark_strings(spark, pdf), counts, LLM)
    assert not r.detected
