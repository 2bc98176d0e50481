"""Disguised missing values (§2.1.3).

The LLM reviews the column's distinct values for strings that are not
NULL but semantically mean missing ("N/A", "null", "-", ...). Cleaning
is ``CASE WHEN col IN (...) THEN NULL ELSE col END``.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.llm.client import LLMClient, ValueCounts
from repro.llm.types import DMVReview


@dataclass
class DMVResult:
    column: str
    review: DMVReview

    @property
    def values(self) -> tuple[str, ...]:
        return self.review.dmv_values

    @property
    def detected(self) -> bool:
        return bool(self.review.dmv_values)


def clean_dmv(column: str, counts: ValueCounts, llm: LLMClient) -> DMVResult:
    return DMVResult(column=column, review=llm.review_dmv(column, list(counts)))
