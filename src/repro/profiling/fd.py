"""Entropy-based functional-dependency discovery (paper §2.1.6).

Following Baran/the paper, only single-attribute FDs ``A -> B`` are
considered. The statistical strength of a candidate is its conditional
entropy ``H(B|A) = H(A,B) - H(A)`` (the entropy measurement of Beskales
et al. the paper cites): ``0`` means the FD holds exactly; small values
mean a few violating groups.

All pairwise joint distributions are computed in **one** Spark
aggregation using ``GROUPING SETS`` — one shuffle for the whole
candidate-pair lattice instead of one job per pair — and the (small)
per-pair count vectors are reduced to entropies on the driver.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class FDCandidate:
    """A statistically strong single-attribute FD candidate."""

    lhs: str
    rhs: str
    conditional_entropy: float
    #: H(B|A) / H(B) in [0, 1]: 0 = exact FD, 1 = A tells nothing about B
    entropy_ratio: float
    #: fraction of non-null rows whose RHS differs from their group's mode
    violation_rate: float
    n_violating_groups: int


def _entropy(counts: list[int]) -> float:
    n = sum(counts)
    if n == 0:
        return 0.0
    return -sum((c / n) * math.log2(c / n) for c in counts if c)


def discover_fds(
    df: DataFrame,
    columns: list[str],
    *,
    n_distinct: dict[str, int],
    total: int,
    max_distinct: int = 1000,
    max_entropy_ratio: float = 0.35,
    max_violation_rate: float = 0.45,
    exclude_lhs_values: frozenset[str] | None = None,
) -> list[FDCandidate]:
    """Find statistically strong FD candidates among ``columns``.

    ``n_distinct`` (from the column profiles) prunes the pair lattice:
    a useful LHS groups rows (not near-unique) and a useful RHS is
    low-cardinality enough to have a mode. Candidates are returned
    strongest (lowest conditional entropy) first; exact FDs with no
    violating group are dropped — there is nothing to clean.
    """
    cand = [
        c for c in columns
        if 2 <= n_distinct.get(c, total) <= min(max_distinct, int(total * 0.9))
    ]
    pairs = [(a, b) for a in cand for b in cand if a != b]
    if not pairs:
        return []

    sets_sql = ", ".join(f"(`{a}`, `{b}`)" for a, b in pairs)
    cols_sql = ", ".join(f"`{c}`" for c in cand)
    view = "_repro_fd_input"
    df.select(*cand).createOrReplaceTempView(view)
    rows = df.sparkSession.sql(
        f"SELECT {cols_sql}, grouping_id() AS _gid, count(*) AS _cnt "
        f"FROM {view} GROUP BY GROUPING SETS ({sets_sql})"
    ).collect()

    # grouping_id bit i (MSB-first over `cand`) is 0 when column i was
    # part of the grouping set — recover which pair each row belongs to.
    idx = {c: i for i, c in enumerate(cand)}
    gid_of = {
        (a, b): sum(
            1 << (len(cand) - 1 - i)
            for i in range(len(cand))
            if i not in (idx[a], idx[b])
        )
        for a, b in pairs
    }
    by_gid: dict[int, list] = {}
    for r in rows:
        by_gid.setdefault(r["_gid"], []).append(r)

    out: list[FDCandidate] = []
    for a, b in pairs:
        joint: dict[tuple[str, str], int] = {}
        for r in by_gid.get(gid_of[(a, b)], []):
            va, vb = r[a], r[b]
            if va is None or vb is None:
                continue
            if exclude_lhs_values and va in exclude_lhs_values:
                continue  # placeholder LHS values create fake groups
            joint[(va, vb)] = joint.get((va, vb), 0) + r["_cnt"]
        if not joint:
            continue
        marg_a: dict[str, int] = {}
        marg_b: dict[str, int] = {}
        groups: dict[str, list[int]] = {}
        for (va, vb), c in joint.items():
            marg_a[va] = marg_a.get(va, 0) + c
            marg_b[vb] = marg_b.get(vb, 0) + c
            groups.setdefault(va, []).append(c)
        n = sum(marg_a.values())
        h_a = _entropy(list(marg_a.values()))
        h_b = _entropy(list(marg_b.values()))
        h_ab = _entropy(list(joint.values()))
        cond = max(0.0, h_ab - h_a)
        # normalize by H(B): an FD over a high-cardinality RHS tolerates
        # more absolute conditional entropy from its dirty violations
        ratio = cond / h_b if h_b > 0 else 0.0
        violating = {k: v for k, v in groups.items() if len(v) > 1}
        viol_rows = sum(sum(v) - max(v) for v in violating.values())
        rate = viol_rows / n if n else 0.0
        if (
            violating
            and ratio <= max_entropy_ratio
            and rate <= max_violation_rate
        ):
            out.append(FDCandidate(a, b, cond, ratio, rate, len(violating)))
    out.sort(key=lambda f: (f.entropy_ratio, f.lhs, f.rhs))
    return out


def violating_groups(
    df: DataFrame, lhs: str, rhs: str, *, max_groups: int = 500,
    exclude_lhs_values: frozenset[str] | None = None,
) -> dict[str, list[tuple[str, int]]]:
    """RHS value distribution of every LHS group violating ``lhs -> rhs``.

    Returns ``{lhs_value: [(rhs_value, count), ...]}`` with counts
    descending, deterministic tie-break on value — the exact structure
    the §2.1.6 repair prompt shows the LLM.
    """
    rows = (
        df.where(F.col(lhs).isNotNull() & F.col(rhs).isNotNull())
        .groupBy(lhs, rhs)
        .agg(F.count(F.lit(1)).alias("cnt"))
        .collect()
    )
    groups: dict[str, list[tuple[str, int]]] = {}
    for r in rows:
        if exclude_lhs_values and r[lhs] in exclude_lhs_values:
            continue
        groups.setdefault(r[lhs], []).append((r[rhs], r["cnt"]))
    out = {
        k: sorted(v, key=lambda vc: (-vc[1], vc[0]))
        for k, v in sorted(groups.items())
        if len(v) > 1
    }
    if len(out) > max_groups:
        out = dict(list(out.items())[:max_groups])
    return out
