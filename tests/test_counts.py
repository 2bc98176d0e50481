"""Frequency-vector bookkeeping between pipeline steps."""
from repro.core.counts import apply_mapping, remove_values


def test_apply_mapping_merges_counts():
    counts = (("eng", 400), ("English", 90), ("fre", 10))
    out = apply_mapping(counts, {"English": "eng"})
    assert out == (("eng", 490), ("fre", 10))


def test_apply_mapping_empty_is_identity():
    counts = (("a", 1),)
    assert apply_mapping(counts, {}) is counts


def test_apply_mapping_reorders_by_count_then_value():
    counts = (("b", 5), ("a", 5), ("c", 1))
    out = apply_mapping(counts, {"c": "a"})
    assert out == (("a", 6), ("b", 5))


def test_remove_values():
    counts = (("a", 5), ("N/A", 2), ("b", 1))
    assert remove_values(counts, ["N/A"]) == (("a", 5), ("b", 1))


def test_remove_values_absent_noop():
    counts = (("a", 5),)
    assert remove_values(counts, ["zz"]) == counts
