"""CleanAgent-style baseline: LLM-agent format standardization.

CleanAgent (Qi & Wang) standardizes column formats (dates, phones,
emails) via Dataprep-style type functions. The paper's finding — near
zero precision/recall on repair benchmarks — follows from its mechanism:
its edits are format rewrites, not error repairs, so they rarely match
the ground truth cell values. We reproduce exactly that: recognized
phone columns are rewritten to "(XXX) XXX-XXXX", ISO dates to US
format and US dates to ISO, 12-hour clock times to 24-hour "HH:MM".

``max_rows`` reproduces the paper's 2 MB input cap (Movies is processed
as its first 1000 rows).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

_PHONE = r"^\d{3}-\d{3}-\d{4}$"
_ISO_DATE = r"^\d{4}-\d{2}-\d{2}$"
_US_DATE = r"^\d{1,2}/\d{1,2}/\d{4}$"
_CLOCK12 = r"^\d{1,2}:\d{2} (a\.m\.|p\.m\.)$"


def _majority_matches(df: DataFrame, col: str, pattern: str,
                      threshold: float = 0.6) -> bool:
    row = df.agg(
        F.avg(F.col(col).rlike(pattern).cast("double")).alias("frac")
    ).collect()[0]
    return (row["frac"] or 0.0) >= threshold


def cleanagent_clean(dirty: DataFrame, *, max_rows: int | None = None,
                     row_id: str = "row_id") -> DataFrame:
    df = dirty
    scoped = df
    rest = None
    if max_rows is not None:
        in_scope = F.col(row_id).cast("long") < max_rows
        scoped, rest = df.where(in_scope), df.where(~in_scope)

    for col in [c for c in df.columns if c != row_id]:
        c = F.col(col)
        if _majority_matches(scoped, col, _PHONE):
            std = F.concat(
                F.lit("("), F.substring(c, 1, 3), F.lit(") "),
                F.substring(c, 5, 8),
            )
            scoped = scoped.withColumn(
                col, F.when(c.rlike(_PHONE), std).otherwise(c))
        elif _majority_matches(scoped, col, _ISO_DATE):
            std = F.concat(
                F.substring(c, 6, 2), F.lit("/"), F.substring(c, 9, 2),
                F.lit("/"), F.substring(c, 1, 4),
            )
            scoped = scoped.withColumn(
                col, F.when(c.rlike(_ISO_DATE), std).otherwise(c))
        elif _majority_matches(scoped, col, _US_DATE):
            parts = F.split(c, "/")
            std = F.concat(
                parts.getItem(2), F.lit("-"),
                F.lpad(parts.getItem(0), 2, "0"), F.lit("-"),
                F.lpad(parts.getItem(1), 2, "0"),
            )
            scoped = scoped.withColumn(
                col, F.when(c.rlike(_US_DATE), std).otherwise(c))
        elif _majority_matches(scoped, col, _CLOCK12):
            hm = F.split(F.split(c, " ").getItem(0), ":")
            h = hm.getItem(0).cast("int")
            h24 = F.when(
                c.rlike(r"p\.m\.$"), (h % 12) + 12
            ).otherwise(h % 12)
            std = F.concat(F.lpad(h24.cast("string"), 2, "0"), F.lit(":"),
                           hm.getItem(1))
            scoped = scoped.withColumn(
                col, F.when(c.rlike(_CLOCK12), std).otherwise(c))

    return scoped.unionByName(rest) if rest is not None else scoped
