"""Benchmark: regenerate the paper's Table 1, timed per dataset.

Each benchmark round runs all five systems (HoloClean, Raha+Baran,
CleanAgent, RetClean, Cocoon) on one benchmark dataset and scores them
with the Table 1 convention. The measured-vs-paper rows are printed
(visible with ``pytest -s`` / in the benchmark output capture), and the
paper's headline shape is asserted.
"""
import pytest

from repro.evalharness.tables import DATASETS, format_table, run_table1


@pytest.mark.parametrize("dataset", DATASETS)
def test_table1(benchmark, spark, dataset):
    df = benchmark.pedantic(
        run_table1, args=(spark,), kwargs={"datasets": (dataset,)},
        rounds=1, iterations=1, warmup_rounds=0,
    )
    print(format_table(df, f"Table 1 [{dataset}] (measured vs paper)"))
    by = df.set_index("system")
    # baselines that the paper reports at zero stay at zero
    assert by.at["cleanagent", "F"] == 0.0
    if dataset != "rayyan":
        assert by.at["retclean", "F"] == 0.0
    if dataset == "flights":
        # the paper's crossover: Cocoon abstains on ambiguous FD groups
        assert by.at["cocoon", "R"] < 0.55
        assert by.at["raha_baran", "R"] > by.at["cocoon", "R"]
    else:
        # Cocoon wins the other four benchmarks on F1
        assert by.at["cocoon", "F"] == by["F"].max()
