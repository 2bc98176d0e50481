"""Duplication (§2.1.7): semantically erroneous duplicate rows.

Statistical detection finds exactly-duplicated rows (over the content
columns — a surrogate ``row_id`` is excluded from row identity); the LLM
judges whether duplication is semantically acceptable (e.g. coarse
logging). Erroneous duplicates are removed with a dedupe layer
equivalent to the paper's ``SELECT DISTINCT`` (a window keeps the
first-``row_id`` copy so surrogate ids stay stable).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame

from repro.llm.client import LLMClient
from repro.llm.types import DuplicationReview
from repro.profiling.duplicates import duplicate_rows


@dataclass
class DuplicationResult:
    surplus: int
    review: DuplicationReview | None
    content_cols: list[str]

    @property
    def detected(self) -> bool:
        return self.surplus > 0

    @property
    def should_dedupe(self) -> bool:
        return self.review is not None and not self.review.acceptable


def clean_duplication(
    df: DataFrame,
    table: str,
    content_cols: list[str],
    llm: LLMClient,
) -> DuplicationResult:
    surplus, samples = duplicate_rows(df, subset=content_cols)
    if surplus == 0:
        return DuplicationResult(surplus=0, review=None,
                                 content_cols=content_cols)
    review = llm.review_duplication(table, surplus, samples)
    return DuplicationResult(surplus=surplus, review=review,
                             content_cols=content_cols)
