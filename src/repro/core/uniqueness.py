"""Column uniqueness (§2.1.8): near-unique key columns.

Statistical detection computes each column's unique ratio; for columns
that are *almost* unique the LLM decides whether the column should be a
key and which column prioritizes the record to keep (e.g. the latest
time). Cleaning is a window function keyed on the column.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.llm.client import LLMClient
from repro.llm.types import UniquenessReview


@dataclass
class UniquenessPlan:
    column: str
    order_by: str | None
    review: UniquenessReview


@dataclass
class UniquenessResult:
    plans: list[UniquenessPlan] = field(default_factory=list)
    responses: list[UniquenessReview] = field(default_factory=list)

    @property
    def detected(self) -> bool:
        return bool(self.plans)


def clean_uniqueness(
    columns: list[str],
    unique_ratios: dict[str, float],
    llm: LLMClient,
    *,
    min_ratio: float = 0.95,
) -> UniquenessResult:
    """Plan dedupe windows for should-be-unique columns with duplicates.

    Columns with ratio exactly 1.0 are already unique — nothing to
    clean; columns far below ``min_ratio`` are clearly not keys, so the
    LLM is not consulted (mirrors the paper's statistical pre-filter).
    """
    result = UniquenessResult()
    for col in columns:
        ratio = unique_ratios.get(col, 1.0)
        if not (min_ratio <= ratio < 1.0):
            continue
        others = [c for c in columns if c != col]
        review = llm.review_uniqueness(col, ratio, others)
        result.responses.append(review)
        if review.should_be_unique:
            result.plans.append(
                UniquenessPlan(column=col, order_by=review.order_by,
                               review=review)
            )
    return result
