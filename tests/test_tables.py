"""Table harnesses: Table 2 exact parity and a Table 1 shape check."""
import pytest

from repro.evalharness.tables import (
    DATASETS,
    PAPER_TABLE1,
    PAPER_TABLE3,
    SYSTEMS,
    format_table,
    run_table1,
    run_table2,
)


def test_paper_number_registries_complete():
    assert set(PAPER_TABLE1) == {(d, s) for d in DATASETS for s in SYSTEMS}
    assert set(PAPER_TABLE3) == {(d, s) for d in ("hospital", "movies")
                                 for s in SYSTEMS}


def test_table2_matches_paper_exactly():
    df = run_table2().set_index("dataset")
    for ds in ("hospital", "movies"):
        row = df.loc[ds]
        assert row["size"] == row["paper_size"].replace(" x ", " x ")
        import pandas as pd
        for et in ("typo", "fd", "column_type", "dmv", "misplacement"):
            measured, paper = row[et], row[f"paper_{et}"]
            if paper is None or pd.isna(paper):
                assert measured is None or pd.isna(measured)
            else:
                assert measured == paper, (ds, et, measured, paper)


def test_format_table_renders():
    txt = format_table(run_table2(), "Table 2")
    assert txt.startswith("Table 2") and "hospital" in txt


@pytest.mark.slow
def test_table1_shape_on_beers(spark):
    """One-dataset Table 1 slice: the paper's ordering holds — Cocoon >
    Raha+Baran >> HoloClean, CleanAgent/RetClean at zero."""
    df = run_table1(spark, datasets=("beers",)).set_index("system")
    assert df.at["cocoon", "F"] >= df.at["raha_baran", "F"]
    assert df.at["raha_baran", "F"] > df.at["holoclean", "F"] + 0.3
    assert df.at["cleanagent", "F"] == 0.0
    assert df.at["retclean", "F"] == 0.0
