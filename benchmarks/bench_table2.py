"""Benchmark: regenerate the paper's Table 2 (error distributions).

Times the synthetic generation + mask bookkeeping for Hospital and
Movies and asserts exact parity with the paper's reported counts.
"""
from repro.evalharness.tables import format_table, run_table2


def test_table2(benchmark):
    df = benchmark.pedantic(run_table2, rounds=1, iterations=1,
                            warmup_rounds=0)
    print(format_table(df, "Table 2 (measured vs paper)"))
    by = df.set_index("dataset")
    assert by.at["hospital", "typo"] == 213
    assert by.at["hospital", "fd"] == 331
    assert by.at["hospital", "column_type"] == 3000
    assert by.at["hospital", "dmv"] == 227
    assert by.at["movies", "typo"] == 184
    assert by.at["movies", "column_type"] == 14433
    assert by.at["movies", "dmv"] == 131
    assert by.at["movies", "misplacement"] == 938
