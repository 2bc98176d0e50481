"""Cross-column value misplacement (Rayyan/Movies error class, Table 2).

The paper's real-world benchmarks contain "value misplacement errors
like the county was incorrectly entered in the city column". Detection
is statistical + semantic: each column's dominant semantic domain is
inferred from its value distribution (knowledge-base classification of
the profiled values); for column pairs with distinct domains, a Spark
scan counts rows where *both* cells hold the other column's domain.
The LLM confirms the misplacement and cleaning swaps the cells back via
paired ``CASE WHEN`` expressions.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.llm import knowledge as kb
from repro.llm.client import LLMClient, ValueCounts
from repro.llm.types import LLMResponse


@dataclass
class SwapPlan:
    col_a: str
    col_b: str
    #: values observed in col_a that belong to col_b's domain (and v.v.)
    a_offending: list[str]
    b_offending: list[str]
    n_evidence: int


@dataclass
class MisplacementResult:
    swaps: list[SwapPlan] = field(default_factory=list)
    responses: list[LLMResponse] = field(default_factory=list)

    @property
    def detected(self) -> bool:
        return bool(self.swaps)


def _dominant_domain(counts: ValueCounts, *, min_classified: float = 0.5,
                     min_purity: float = 0.8) -> str | None:
    """The semantic domain a column's values predominantly belong to."""
    by_domain: dict[str, int] = {}
    total = 0
    for v, c in counts:
        total += c
        d = kb.domain_of(v)
        if d is not None:
            by_domain[d] = by_domain.get(d, 0) + c
    if not by_domain or total == 0:
        return None
    classified = sum(by_domain.values())
    top, top_c = max(by_domain.items(), key=lambda kv: kv[1])
    if classified / total >= min_classified and top_c / classified >= min_purity:
        return top
    return None


def clean_misplacement(
    df: DataFrame,
    counts_by_col: dict[str, ValueCounts],
    llm: LLMClient,
    *,
    min_evidence_rows: int = 3,
) -> MisplacementResult:
    result = MisplacementResult()
    domains = {
        c: d for c, counts in counts_by_col.items()
        if (d := _dominant_domain(counts)) is not None
    }
    cols = sorted(domains)
    for i, a in enumerate(cols):
        for b in cols[i + 1:]:
            da, db = domains[a], domains[b]
            if da == db:
                continue
            a_off = sorted(v for v, _ in counts_by_col[a]
                           if kb.domain_of(v) == db)
            b_off = sorted(v for v, _ in counts_by_col[b]
                           if kb.domain_of(v) == da)
            if not a_off or not b_off:
                continue
            hits = df.where(F.col(a).isin(a_off) & F.col(b).isin(b_off))
            sample = [(r[a], r[b]) for r in hits.limit(5).collect()]
            n = hits.count()
            if n < min_evidence_rows:
                continue
            review = llm.review_misplacement(a, b, n, sample)
            result.responses.append(review)
            if review.swapped:
                result.swaps.append(
                    SwapPlan(col_a=a, col_b=b, a_offending=a_off,
                             b_offending=b_off, n_evidence=n)
                )
    return result
