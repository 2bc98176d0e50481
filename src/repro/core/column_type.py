"""Column type (§2.1.4): cast columns to their semantic type.

The LLM inspects the catalog type plus value sample and suggests the
semantically suitable type (the paper's "yes"/"no" -> BOOLEAN example).
Cleaning rewrites each observed rendering to the canonical rendering of
the target type ("yes" -> "True", "1 hour 40 min" -> "100.0") via CASE
WHEN; the intended ``CAST`` travels as a SQL comment since benchmark
tables are scored as text (paper §3.1 evaluation notes).

The step is skipped when the profile does not cover every distinct value
(a mapping built from a sample could silently miss renderings).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.llm.client import LLMClient, ValueCounts
from repro.llm.types import TypeSuggestion


@dataclass
class ColumnTypeResult:
    column: str
    suggestion: TypeSuggestion | None

    @property
    def mapping(self) -> dict[str, str]:
        return self.suggestion.mapping if self.suggestion else {}

    @property
    def target_type(self) -> str:
        return self.suggestion.target_type if self.suggestion else "VARCHAR"

    @property
    def detected(self) -> bool:
        return bool(self.mapping)


def clean_column_type(
    column: str,
    counts: ValueCounts,
    llm: LLMClient,
    *,
    n_distinct: int,
    current_type: str = "VARCHAR",
) -> ColumnTypeResult:
    if n_distinct > len(counts):
        return ColumnTypeResult(column=column, suggestion=None)
    return ColumnTypeResult(
        column=column,
        suggestion=llm.suggest_type(column, current_type, list(counts)),
    )
