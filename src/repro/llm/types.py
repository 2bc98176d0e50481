"""Typed response objects for the simulated LLM.

Each response mirrors the JSON schema of the paper's prompts (Figures
2-3 and §2.1): a free-text ``reasoning`` field plus the structured
decision, and carries the rendered ``prompt`` it answered so cleaning
reports stay interpretable (paper §2.2 / Appendix A).
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class LLMResponse:
    """Base response: the rendered prompt and the model's reasoning."""

    prompt: str
    reasoning: str


@dataclass(frozen=True)
class StringOutlierReview(LLMResponse):
    """Fig. 2 response: are any sampled values typos / inconsistent?"""

    unusual: bool
    summary: str
    unusual_values: tuple[str, ...] = ()


@dataclass(frozen=True)
class StringOutlierMapping(LLMResponse):
    """Fig. 3 response: erroneous value -> correct value."""

    mapping: dict[str, str] = field(default_factory=dict)


@dataclass(frozen=True)
class PatternReview(LLMResponse):
    """§2.1.2: semantically meaningful regexes + inconsistency verdict."""

    patterns: tuple[str, ...]
    inconsistent: bool
    #: minority-representation value -> canonical-representation value
    mapping: dict[str, str] = field(default_factory=dict)


@dataclass(frozen=True)
class DMVReview(LLMResponse):
    """§2.1.3: non-NULL values that semantically mean missing."""

    dmv_values: tuple[str, ...] = ()


@dataclass(frozen=True)
class TypeSuggestion(LLMResponse):
    """§2.1.4: the semantically suitable type + value conversion map.

    ``target_type`` is a SQL type name ("BOOLEAN", "DOUBLE", "INTEGER",
    "DATE", "VARCHAR"). ``mapping`` rewrites string renderings to the
    canonical rendering of the target type (e.g. "yes" -> "True",
    "1 hour 40 min" -> "100.0"); identity entries are omitted.
    """

    target_type: str
    mapping: dict[str, str] = field(default_factory=dict)


@dataclass(frozen=True)
class NumericRangeReview(LLMResponse):
    """§2.1.5: semantically acceptable [lo, hi] range, if any."""

    has_range: bool
    lo: float | None = None
    hi: float | None = None


@dataclass(frozen=True)
class FDReview(LLMResponse):
    """§2.1.6: is a statistically strong FD semantically meaningful?"""

    meaningful: bool


@dataclass(frozen=True)
class FDRepair(LLMResponse):
    """§2.1.6: per violating LHS group, the correct RHS value (or abstain).

    ``mapping``: lhs value -> corrected rhs value. Groups the model could
    not resolve confidently are listed in ``abstained``.
    """

    mapping: dict[str, str] = field(default_factory=dict)
    abstained: tuple[str, ...] = ()


@dataclass(frozen=True)
class DuplicationReview(LLMResponse):
    """§2.1.7: are exact duplicate rows semantically acceptable?"""

    acceptable: bool


@dataclass(frozen=True)
class UniquenessReview(LLMResponse):
    """§2.1.8: should this column be unique, and how to prioritize rows?"""

    should_be_unique: bool
    order_by: str | None = None


@dataclass(frozen=True)
class MisplacementReview(LLMResponse):
    """Cross-column review: do two columns hold each other's values?"""

    swapped: bool
