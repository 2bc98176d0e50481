"""Entropy-based FD discovery (§2.1.6 substrate)."""
import pandas as pd
import pytest

from repro.benchdata.base import to_spark_strings
from repro.profiling.fd import _entropy, discover_fds, violating_groups


def test_entropy_math():
    assert _entropy([]) == 0.0
    assert _entropy([10]) == 0.0
    assert _entropy([5, 5]) == pytest.approx(1.0)
    assert _entropy([1, 1, 1, 1]) == pytest.approx(2.0)


@pytest.fixture(scope="module")
def fd_frame(spark):
    rows = []
    zips = {"35233": "Birmingham", "10001": "NYC", "60601": "Chicago"}
    i = 0
    for z, city in zips.items():
        for _ in range(20):
            rows.append({"row_id": str(i), "zip": z, "city": city,
                         "noise": str(i % 7)})
            i += 1
    # 2 violations in one group
    rows[0]["city"] = "Tucson"
    rows[1]["city"] = "Boston"
    pdf = pd.DataFrame(rows).astype(object)
    return pdf, to_spark_strings(spark, pdf)


def test_discover_fd_finds_zip_city(fd_frame):
    _pdf, df = fd_frame
    cands = discover_fds(df, ["zip", "city", "noise"],
                         n_distinct={"zip": 3, "city": 5, "noise": 7},
                         total=60)
    pairs = {(c.lhs, c.rhs) for c in cands}
    assert ("zip", "city") in pairs
    zc = next(c for c in cands if (c.lhs, c.rhs) == ("zip", "city"))
    assert zc.n_violating_groups == 1
    assert zc.violation_rate == pytest.approx(2 / 60)
    assert 0 < zc.entropy_ratio < 0.35


def test_discover_fd_skips_random_pairs(fd_frame):
    _pdf, df = fd_frame
    cands = discover_fds(df, ["zip", "city", "noise"],
                         n_distinct={"zip": 3, "city": 5, "noise": 7},
                         total=60)
    pairs = {(c.lhs, c.rhs) for c in cands}
    assert ("noise", "city") not in pairs
    assert ("zip", "noise") not in pairs


def test_discover_fd_exact_fd_not_a_candidate(spark):
    # exact FDs have nothing to clean
    pdf = pd.DataFrame({
        "row_id": [str(i) for i in range(8)],
        "a": ["x", "x", "y", "y"] * 2,
        "b": ["1", "1", "2", "2"] * 2,
    })
    df = to_spark_strings(spark, pdf)
    cands = discover_fds(df, ["a", "b"], n_distinct={"a": 2, "b": 2},
                         total=8)
    assert cands == []


def test_discover_fd_prunes_high_cardinality(fd_frame):
    _pdf, df = fd_frame
    cands = discover_fds(df, ["zip", "city"],
                         n_distinct={"zip": 3, "city": 5},
                         total=60, max_distinct=2)
    assert cands == []


def test_discover_fd_exclude_lhs_values(fd_frame):
    _pdf, df = fd_frame
    cands = discover_fds(df, ["zip", "city"],
                         n_distinct={"zip": 3, "city": 5}, total=60,
                         exclude_lhs_values=frozenset({"35233"}))
    assert cands == []  # the only violating group was excluded


def test_violating_groups(fd_frame):
    _pdf, df = fd_frame
    groups = violating_groups(df, "zip", "city")
    assert set(groups) == {"35233"}
    assert groups["35233"][0] == ("Birmingham", 18)
    assert set(groups["35233"][1:]) == {("Tucson", 1), ("Boston", 1)}


def test_violating_groups_exclusion(fd_frame):
    _pdf, df = fd_frame
    assert violating_groups(
        df, "zip", "city",
        exclude_lhs_values=frozenset({"35233"})) == {}
