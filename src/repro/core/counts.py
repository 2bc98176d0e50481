"""Driver-side bookkeeping of value-frequency vectors between steps.

The pipeline profiles each column once with Spark, then threads the
(value, count) vector through the per-column steps, folding each step's
mapping into it — §2.1's ordering constraint ("only after typos are
fixed can we detect the patterns") is implemented by these updates, not
by re-scanning the table after every step.
"""
from __future__ import annotations

Counts = tuple[tuple[str, int], ...]


def apply_mapping(counts: Counts, mapping: dict[str, str]) -> Counts:
    """Fold a value->value cleaning map into a frequency vector."""
    if not mapping:
        return counts
    merged: dict[str, int] = {}
    for v, c in counts:
        merged[mapping.get(v, v)] = merged.get(mapping.get(v, v), 0) + c
    return tuple(sorted(merged.items(), key=lambda vc: (-vc[1], vc[0])))


def remove_values(counts: Counts, values: list[str] | tuple[str, ...]) -> Counts:
    """Drop values (e.g. ones nulled as DMVs) from a frequency vector."""
    drop = set(values)
    return tuple((v, c) for v, c in counts if v not in drop)
