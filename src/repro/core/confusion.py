"""Per-group confusion profiles as Spark aggregations (§3.3, Appendix B).

Unlike plain classification, a matching pair contributes its outcome to
*every distinct group appearing on either side* (single fairness) or to
*every unordered group pair across the two sides* (pairwise fairness) —
Example 5 / Figure 15 of the paper. The heavy lifting (explode +
group-by over up to ~10^6 pairs) stays in Catalyst; results are tiny
(one row per group) and are collected to pandas for measure arithmetic.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.em_data.meta import L_GROUPS, LABEL, R_GROUPS, SCORE

#: Separator in pairwise group keys ("g1|g2", lexicographically sorted).
PAIR_SEP = "|"


def prediction(threshold: float) -> Column:
    """h(e, e'): the matcher's decision at the given threshold (§5.1.4:
    match iff similarity strictly greater than the threshold)."""
    return (F.col(SCORE) > threshold).cast("int")


def _outcome_aggs(h: Column) -> list[Column]:
    y = F.col(LABEL) == 1
    m = h == 1
    return [
        F.sum((m & y).cast("long")).alias("tp"),
        F.sum((m & ~y).cast("long")).alias("fp"),
        F.sum((~m & y).cast("long")).alias("fn"),
        F.sum((~m & ~y).cast("long")).alias("tn"),
    ]


def single_group_col() -> Column:
    """Groups a pair is legitimate for under *single* fairness: every
    distinct group of either record."""
    return F.array_distinct(F.array_union(F.col(L_GROUPS), F.col(R_GROUPS)))


def pairwise_group_col() -> Column:
    """Groups a pair is legitimate for under *pairwise* fairness: every
    distinct unordered (s, s') with s from one side and s' from the
    other — symmetric, per §3.2.2."""
    crossed = F.flatten(
        F.transform(
            F.col(L_GROUPS),
            lambda lg: F.transform(
                F.col(R_GROUPS),
                lambda rg: F.concat_ws(PAIR_SEP, F.array_sort(F.array(lg, rg))),
            ),
        )
    )
    return F.array_distinct(crossed)


def group_col(mode: str) -> Column:
    if mode == "single":
        return single_group_col()
    if mode == "pairwise":
        return pairwise_group_col()
    raise ValueError(f"unknown fairness mode: {mode}")


def overall_confusion(scored: DataFrame, threshold: float) -> dict[str, int]:
    """TP/FP/FN/TN over all pairs (each pair counted once)."""
    row = scored.agg(*_outcome_aggs(prediction(threshold))).collect()[0]
    return {k: int(row[k] or 0) for k in ("tp", "fp", "fn", "tn")}


def group_confusion(
    scored: DataFrame, threshold: float, mode: str = "single"
) -> pd.DataFrame:
    """Confusion counts per group (or group pair): pandas frame with
    columns ``group, tp, fp, fn, tn`` — one row per group."""
    ex = scored.select(
        F.explode(group_col(mode)).alias("group"), LABEL, SCORE
    )
    out = (
        ex.groupBy("group")
        .agg(*_outcome_aggs(prediction(threshold)))
        .orderBy("group")
        .toPandas()
    )
    for c in ("tp", "fp", "fn", "tn"):
        out[c] = out[c].fillna(0).astype("int64")
    return out
