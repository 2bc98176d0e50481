"""Reproduction of *Data Cleaning Using Large Language Models* (Cocoon).

Subpackages: :mod:`repro.llm` (simulated-LLM substrate),
:mod:`repro.profiling` (statistical detection), :mod:`repro.core`
(the Cocoon pipeline — the paper's contribution),
:mod:`repro.benchdata` (synthetic benchmarks), :mod:`repro.baselines`
(HoloClean / Raha+Baran / CleanAgent / RetClean equivalents) and
:mod:`repro.evalharness` (metrics + Tables 1-3). See DESIGN.md.
"""
