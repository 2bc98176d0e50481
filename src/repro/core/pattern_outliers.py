"""Pattern outliers (§2.1.2): regex-level representation consistency.

The LLM derives semantically meaningful regex patterns from the value
shapes, verifies coverage, and proposes a normalization for values whose
shape departs from the dominant pattern (e.g. stray trailing characters,
a minority date format). Cleaning is a value-mapping ``CASE WHEN`` layer
— enumerable because the statistical profile bounds the distinct values.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.llm.client import LLMClient, ValueCounts
from repro.llm.types import PatternReview


@dataclass
class PatternOutlierResult:
    column: str
    review: PatternReview

    @property
    def mapping(self) -> dict[str, str]:
        return self.review.mapping

    @property
    def detected(self) -> bool:
        return self.review.inconsistent


def clean_pattern_outliers(column: str, counts: ValueCounts,
                           llm: LLMClient) -> PatternOutlierResult:
    return PatternOutlierResult(column=column,
                                review=llm.review_patterns(column, list(counts)))
