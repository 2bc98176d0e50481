"""Prompt templates mirroring the paper's figures.

The simulated LLM is prompted with exactly the information the paper
sends to Claude 3.5: column names, statistical profiles and value
samples. Rendering them keeps every cleaning step interpretable (the
rendered prompt + reasoning travel with each response) and keeps the
information boundary honest — the simulator's answers are functions of
these strings plus the knowledge base, never of ground truth.
"""
from __future__ import annotations


def _sample_list(values: list[tuple[str, int]], limit: int = 1000) -> str:
    return ", ".join(f"{v!r} (x{c})" for v, c in values[:limit])


def string_outlier_detection(column: str, values: list[tuple[str, int]]) -> str:
    """Fig. 2: semantic detection of string outliers for one column."""
    return (
        f"{column} has the following distinct values: "
        f"{_sample_list(values)}\n\n"
        "Please review if there are:\n"
        'Strange characters or typos (e.g., "cofffee").\n'
        "Inconsistent representations of the same concept "
        '(e.g., "New York" and "NY").\n'
        "If so, report them as unusual values.\n\n"
        "Now, respond in JSON:\n"
        '{"Reasoning": "...", "Unusualness": true/false, "Summary": "..."}'
    )


def string_outlier_cleaning(column: str, unusual: list[str],
                            frequent: list[tuple[str, int]]) -> str:
    """Fig. 3: semantic cleaning of string outliers for one column."""
    return (
        f"The column {column} contains unusual values: {unusual!r}.\n"
        f"The frequent values are: {_sample_list(frequent, 100)}.\n"
        "For each unusual value, map it to the correct value (prefer the "
        "most common representation), or keep it if actually acceptable.\n"
        'Respond in JSON: {"Reasoning": "...", "Mapping": {"bad": "good"}}'
    )


def pattern_review(column: str, shapes: list[tuple[str, int]]) -> str:
    """§2.1.2: meaningful regex patterns covering all column values."""
    return (
        f"Column {column} value shapes and counts: {_sample_list(shapes)}.\n"
        "Write a list of semantically meaningful regular expression "
        "patterns that cover all values (e.g. \\d{2}/\\d{2}/\\d{4} for "
        "dates is meaningful, .* is not). Then assess whether the "
        "patterns reveal inconsistent representations of one concept.\n"
        'Respond in JSON: {"Reasoning": "...", "Patterns": [...], '
        '"Inconsistent": true/false, "Mapping": {...}}'
    )


def dmv_review(column: str, values: list[tuple[str, int]]) -> str:
    """§2.1.3: disguised missing values."""
    return (
        f"Column {column} distinct values: {_sample_list(values)}.\n"
        "Identify values that are currently not NULL but semantically "
        'mean the value is missing (e.g. "N/A", "null").\n'
        'Respond in JSON: {"Reasoning": "...", "DMV": [...]}'
    )


def type_review(column: str, current_type: str,
                values: list[tuple[str, int]]) -> str:
    """§2.1.4: the most suitable column type."""
    return (
        f"Column {column} currently has type {current_type} with values: "
        f"{_sample_list(values)}.\n"
        "Suggest the most suitable data type semantically (BOOLEAN, "
        "INTEGER, DOUBLE, DATE, VARCHAR) and how to convert the values.\n"
        'Respond in JSON: {"Reasoning": "...", "Type": "...", '
        '"Mapping": {...}}'
    )


def numeric_range_review(column: str, lo: float, hi: float) -> str:
    """§2.1.5: acceptable numeric range."""
    return (
        f"Column {column} has minimum {lo} and maximum {hi}.\n"
        "Review the semantically acceptable range for this column.\n"
        'Respond in JSON: {"Reasoning": "...", "HasRange": true/false, '
        '"Lo": ..., "Hi": ...}'
    )


def fd_review(lhs: str, rhs: str, conditional_entropy: float) -> str:
    """§2.1.6: semantic review of a statistically strong FD."""
    return (
        f"The functional dependency {lhs} -> {rhs} is statistically "
        f"strong (conditional entropy {conditional_entropy:.4f}).\n"
        "Is this dependency semantically meaningful for real-world data?\n"
        'Respond in JSON: {"Reasoning": "...", "Meaningful": true/false}'
    )


def fd_repair(lhs: str, rhs: str,
              groups: dict[str, list[tuple[str, int]]]) -> str:
    """§2.1.6: correct mapping for groups violating the FD."""
    lines = "\n".join(
        f"  {k!r}: " + ", ".join(f"{v!r} (x{c})" for v, c in vs)
        for k, vs in groups.items()
    )
    return (
        f"The FD {lhs} -> {rhs} is violated by these groups "
        f"({lhs} value: conflicting {rhs} values with counts):\n{lines}\n"
        "For each group provide the correct value, or abstain if it is "
        "impossible to determine the true value.\n"
        'Respond in JSON: {"Reasoning": "...", "Mapping": {...}, '
        '"Abstained": [...]}'
    )


def duplication_review(table: str, n_dupes: int, sample: list[str]) -> str:
    """§2.1.7: are exact duplicate rows acceptable?"""
    return (
        f"Table {table} contains {n_dupes} exactly duplicated rows, "
        f"e.g. {sample[:5]!r}.\n"
        "Are these duplications semantically acceptable (e.g. logging "
        "with coarse time granularity), or erroneous?\n"
        'Respond in JSON: {"Reasoning": "...", "Acceptable": true/false}'
    )


def uniqueness_review(column: str, unique_ratio: float,
                      other_columns: list[str]) -> str:
    """§2.1.8: should the column be unique?"""
    return (
        f"Column {column} has unique ratio {unique_ratio:.4f}.\n"
        f"Other columns: {other_columns!r}.\n"
        "Should this column be unique (e.g. a primary key)? If so, which "
        "column prioritizes which record to keep (e.g. the latest time)?\n"
        'Respond in JSON: {"Reasoning": "...", "Unique": true/false, '
        '"OrderBy": "..."}'
    )


def misplacement_review(col_a: str, col_b: str, n_evidence: int,
                        sample: list[tuple[str, str]]) -> str:
    """Cross-column misplacement: values that belong to the other column."""
    return (
        f"In {n_evidence} rows, column {col_a} holds values that "
        f"semantically belong to column {col_b} and vice versa, e.g. "
        f"{sample[:5]!r}.\n"
        "Were these values misplaced (entered into the wrong column)?\n"
        'Respond in JSON: {"Reasoning": "...", "Swapped": true/false}'
    )
