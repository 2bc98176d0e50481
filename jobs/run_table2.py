"""Entrypoint reproducing the paper's Table 2 (error distributions).

Usage::

    python jobs/run_table2.py

Pure generator bookkeeping — no Spark needed: prints the error-type
distribution of the synthetic Hospital and Movies benchmarks next to the
paper's reported counts.
"""
from repro.evalharness.tables import format_table, run_table2


def main() -> None:
    print(format_table(run_table2(),
                       "Table 2: error distribution (measured vs paper)"))


if __name__ == "__main__":
    main()
