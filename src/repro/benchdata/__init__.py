"""Synthetic equivalents of the paper's five benchmarks.

The real Hospital/Flights/Beers/Rayyan/Movies CSVs are not
redistributable in this offline container, so each module generates a
seeded synthetic table with the same shape and the same error taxonomy
and mixture (Table 2 of the paper; see DESIGN.md §2 for the
substitution argument). Every generator returns a
:class:`repro.benchdata.base.Benchmark`: the dirty table, the ground
truth, and a cell-level error mask tagged by error type.
"""
from repro.benchdata.base import Benchmark, ErrorType, to_spark_strings
from repro.benchdata.registry import BENCHMARKS, load

__all__ = ["Benchmark", "ErrorType", "BENCHMARKS", "load", "to_spark_strings"]
