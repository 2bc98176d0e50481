"""Seeded error injectors.

Each injector mutates the *dirty* frame in place and records the cell in
the mask; the truth frame is never touched except by DMV injection
(whose ground truth is NULL — the paper's convention) and by the final
type canonicalization. A cell is mutated at most once.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.benchdata.base import ErrorType

_DMV_POOL = ("N/A", "null", "-", "unknown", "NA", "--", "?", "missing")


class Injector:
    """Tracks mutated cells and accumulates the error mask."""

    def __init__(self, dirty: pd.DataFrame, truth: pd.DataFrame,
                 rng: np.random.Generator) -> None:
        self.dirty = dirty
        self.truth = truth
        self.rng = rng
        self.used: set[tuple[int, str]] = set()
        self.records: list[tuple[str, str, str]] = []  # row_id, col, type

    # ------------------------------------------------------------------

    def _pick_rows(self, column: str, n: int,
                   pool: np.ndarray | None = None) -> list[int]:
        cand = pool if pool is not None else self.dirty.index.to_numpy()
        cand = [i for i in cand
                if (i, column) not in self.used
                and self.dirty.at[i, column] is not None
                and not pd.isna(self.dirty.at[i, column])]
        if len(cand) < n:
            raise ValueError(
                f"cannot place {n} errors in {column}: only {len(cand)} "
                "untouched non-null cells")
        chosen = self.rng.choice(len(cand), size=n, replace=False)
        return [cand[i] for i in chosen]

    def _record(self, row: int, column: str, etype: str) -> None:
        self.used.add((row, column))
        self.records.append((self.dirty.at[row, "row_id"], column, etype))

    # ------------------------------------------------------------------

    def typo_x(self, column: str, n: int) -> None:
        """Hospital-style corruption: one alphanumeric char becomes 'x'."""
        for row in self._pick_rows(column, n):
            v = str(self.dirty.at[row, column])
            pos = [i for i, ch in enumerate(v) if ch.isalnum() and ch not in "xX"]
            if not pos:
                continue
            i = int(self.rng.choice(pos))
            self.dirty.at[row, column] = v[:i] + "x" + v[i + 1:]
            self._record(row, column, ErrorType.TYPO)

    def typo_duplicate_char(self, column: str, n: int) -> None:
        """Open-vocabulary typo: double one letter of one word
        ("cofffee"-style, the paper's Fig. 2 example)."""
        for row in self._pick_rows(column, n):
            v = str(self.dirty.at[row, column])
            pos = [i for i, ch in enumerate(v) if ch.isalpha()]
            if not pos:
                continue
            i = int(self.rng.choice(pos))
            self.dirty.at[row, column] = v[:i] + v[i] + v[i:]
            self._record(row, column, ErrorType.TYPO)

    def wrong_value(self, column: str, n: int, *, pool: list[str],
                    etype: str = ErrorType.FD) -> None:
        """Replace with a *valid but wrong* value (FD violations)."""
        for row in self._pick_rows(column, n):
            v = self.dirty.at[row, column]
            others = [p for p in pool if p != v]
            self.dirty.at[row, column] = str(self.rng.choice(others))
            self._record(row, column, etype)

    def inconsistent(self, column: str, n: int, variant_of) -> None:
        """Rewrite to an alternative representation of the same concept.

        ``variant_of(value, rng)`` returns the inconsistent rendering.
        """
        for row in self._pick_rows(column, n):
            v = str(self.dirty.at[row, column])
            alt = variant_of(v, self.rng)
            if alt is None or alt == v:
                continue
            self.dirty.at[row, column] = alt
            self._record(row, column, ErrorType.INCONSISTENCY)

    def dmv(self, column: str, n: int) -> None:
        """Disguise the cell as a placeholder; ground truth becomes NULL."""
        for row in self._pick_rows(column, n):
            self.dirty.at[row, column] = str(self.rng.choice(_DMV_POOL))
            self.truth.at[row, column] = None
            self._record(row, column, ErrorType.DMV)

    def swap(self, col_a: str, col_b: str, n: int) -> None:
        """Misplacement: the two cells of a row trade places."""
        rows_a = set(self._pick_rows(col_a, n))
        rows = [r for r in rows_a if (r, col_b) not in self.used
                and self.dirty.at[r, col_b] is not None]
        for row in rows:
            a, b = self.dirty.at[row, col_a], self.dirty.at[row, col_b]
            self.dirty.at[row, col_a] = b
            self.dirty.at[row, col_b] = a
            self._record(row, col_a, ErrorType.MISPLACEMENT)
            self._record(row, col_b, ErrorType.MISPLACEMENT)

    # ------------------------------------------------------------------

    def canonicalize_type_column(self, column: str, canon) -> None:
        """Rewrite the truth column to the canonical typed rendering and
        mask every rewritten cell as a column-type error.

        ``canon(value)`` maps the raw rendering ("yes", "85%",
        "1 hour 40 min") to the canonical one ("True", "85.0", "100.0").
        Cells already NULL in the truth (true nulls and injected DMVs)
        are skipped.
        """
        for row in self.truth.index:
            v = self.truth.at[row, column]
            if v is None or pd.isna(v):
                continue
            self.truth.at[row, column] = canon(str(v))
            self.records.append(
                (self.truth.at[row, "row_id"], column, ErrorType.COLUMN_TYPE))

    def mask_frame(self) -> pd.DataFrame:
        return pd.DataFrame(self.records,
                            columns=["row_id", "column", "error_type"])
