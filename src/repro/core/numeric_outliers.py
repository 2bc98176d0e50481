"""Numeric outliers (§2.1.5): semantic range thresholding.

Statistics capture the numeric envelope (min/max); the LLM reviews the
semantically acceptable range for the column. Values outside the range
are nulled with a ``CASE WHEN`` threshold clause. Runs after the type
step (§2.1's ordering), so values are canonical numeric renderings.
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field

from repro.llm.client import LLMClient, ValueCounts
from repro.llm.types import NumericRangeReview

_NUM_RE = re.compile(r"^\s*-?\d+(\.\d+)?\s*$")


@dataclass
class NumericOutlierResult:
    column: str
    review: NumericRangeReview | None
    out_of_range: list[str] = field(default_factory=list)

    @property
    def detected(self) -> bool:
        return bool(self.out_of_range)


def clean_numeric_outliers(
    column: str,
    counts: ValueCounts,
    llm: LLMClient,
    *,
    n_distinct: int,
    min_numeric_frac: float = 0.8,
) -> NumericOutlierResult:
    """Flag enumerated out-of-range values of a numeric-looking column.

    Skipped when the column is not predominantly numeric or when the
    profile does not cover all distinct values (the out-of-range list
    must be exhaustive to be emitted as an ``IN`` clause).
    """
    numeric = [(v, c, float(v)) for v, c in counts if _NUM_RE.match(v)]
    total = sum(c for _, c in counts)
    if not numeric or n_distinct > len(counts):
        return NumericOutlierResult(column=column, review=None)
    if sum(c for _, c, _ in numeric) / max(total, 1) < min_numeric_frac:
        return NumericOutlierResult(column=column, review=None)
    lo = min(x for _, _, x in numeric)
    hi = max(x for _, _, x in numeric)
    review = llm.review_numeric_range(column, lo, hi)
    if not review.has_range:
        return NumericOutlierResult(column=column, review=review)
    out = [v for v, _, x in numeric
           if (review.lo is not None and x < review.lo)
           or (review.hi is not None and x > review.hi)]
    return NumericOutlierResult(column=column, review=review,
                                out_of_range=sorted(out))
