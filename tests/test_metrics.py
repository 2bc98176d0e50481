"""Cell-level repair metrics — validated against hand computation and
the DuckDB oracle."""
import pandas as pd
import pytest

from repro.benchdata.base import to_spark_strings
from repro.evalharness.metrics import RepairMetrics, cells, repair_metrics
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def frames():
    dirty = pd.DataFrame({
        "row_id": ["0", "1", "2", "3"],
        "a": ["bad", "ok", "N/A", "ok"],
        "b": ["1", "2", "3", "4"],
    })
    truth = pd.DataFrame({
        "row_id": ["0", "1", "2", "3"],
        "a": ["good", "ok", None, "ok"],
        "b": ["1", "2", "3", "9"],
    })
    # cleaner fixed a[0], nulled the DMV a[2], missed b[3], broke b[0]
    cleaned = pd.DataFrame({
        "row_id": ["0", "1", "2", "3"],
        "a": ["good", "ok", None, "ok"],
        "b": ["99", "2", "3", "4"],
    })
    mask = pd.DataFrame(
        [("0", "a", "typo"), ("2", "a", "dmv"), ("3", "b", "fd")],
        columns=["row_id", "column", "error_type"])
    return dirty, cleaned, truth, mask


def _spark_frames(spark, frames):
    return tuple(to_spark_strings(spark, f) for f in frames)


def test_cells_melt(spark, frames):
    dirty = _spark_frames(spark, frames)[0]
    c = cells(dirty)
    assert c.columns == ["row_id", "column", "value"]
    assert c.count() == 8
    got = {(r["row_id"], r["column"]): r["value"] for r in c.collect()}
    assert got[("0", "a")] == "bad" and got[("3", "b")] == "4"


def test_metrics_all_types_scored(spark, frames):
    d, c, t, m = _spark_frames(spark, frames)
    r = repair_metrics(d, c, t, m)
    # changes: a0 (correct), a2 (correct), b0 (wrong). errors: 3
    assert r.n_errors == 3 and r.n_changed == 3 and r.n_correct_changes == 2
    assert r.precision == pytest.approx(2 / 3)
    assert r.recall == pytest.approx(2 / 3)
    assert r.f1 == pytest.approx(2 / 3)


def test_metrics_excluding_dmv(spark, frames):
    d, c, t, m = _spark_frames(spark, frames)
    r = repair_metrics(d, c, t, m, exclude_types=("dmv",))
    # the dmv cell vanishes from both numerator and denominator
    assert r.n_errors == 2 and r.n_changed == 2 and r.n_correct_changes == 1
    assert r.precision == 0.5 and r.recall == 0.5


def test_metrics_wrong_change_on_clean_cell_counts(spark, frames):
    d, c, t, m = _spark_frames(spark, frames)
    r = repair_metrics(d, c, t, m, exclude_types=("dmv", "typo"))
    # only the fd error remains; the wrong b0 change still hurts P
    assert r.n_errors == 1 and r.n_changed == 1
    assert r.n_correct_changes == 0 and r.precision == 0.0


def test_metrics_zero_divisions():
    m = RepairMetrics(n_errors=0, n_changed=0, n_correct_changes=0)
    assert m.precision == 0.0 and m.recall == 0.0 and m.f1 == 0.0


def test_metrics_identity_cleaner(spark, frames):
    d, _c, t, m = _spark_frames(spark, frames)
    r = repair_metrics(d, d, t, m)
    assert r.n_changed == 0 and r.recall == 0.0


def test_metrics_perfect_cleaner(spark, frames):
    d, _c, t, m = _spark_frames(spark, frames)
    r = repair_metrics(d, t, t, m)
    assert r.precision == 1.0 and r.recall == 1.0 and r.f1 == 1.0


def test_cell_melt_oracle_equivalence(spark, frames):
    """The melted cell view matches DuckDB's UNPIVOT of the same table."""
    dirty_pdf = frames[0]
    d = to_spark_strings(spark, dirty_pdf)
    sql = ('SELECT row_id, "column", value FROM '
           '(UNPIVOT t ON a, b INTO NAME "column" VALUE value)')
    assert_equivalent(cells(d), sql, t=dirty_pdf)
