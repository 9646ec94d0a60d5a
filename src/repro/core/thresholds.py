"""Matching-threshold sweeps and the sensitivity metric of §5.3.4.

The paper defines a matcher's *threshold sensitivity* on a dataset as
the ℓ2 distance over adjacent thresholds of the number of groups the
matcher is unfair for (Table 7). The sweep is one Spark pass: all
thresholds' confusion counts are computed as conditional aggregates
over a single explode + groupBy.
"""
from __future__ import annotations

import math

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import disparity, measures
from repro.core.confusion import group_col
from repro.em_data.meta import LABEL, SCORE

DEFAULT_THRESHOLDS: tuple[float, ...] = tuple(
    round(0.5 + 0.05 * i, 2) for i in range(10)
)  # 0.5 … 0.95


def _sweep_aggs(thresholds) -> list:
    aggs = []
    y = F.col(LABEL) == 1
    for i, t in enumerate(thresholds):
        m = F.col(SCORE) > float(t)
        aggs += [
            F.sum((m & y).cast("long")).alias(f"tp_{i}"),
            F.sum((m & ~y).cast("long")).alias(f"fp_{i}"),
            F.sum((~m & y).cast("long")).alias(f"fn_{i}"),
            F.sum((~m & ~y).cast("long")).alias(f"tn_{i}"),
        ]
    return aggs


def sweep_confusions(
    scored: DataFrame, *, thresholds=DEFAULT_THRESHOLDS, mode: str = "single"
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """(per-group, overall) confusion counts at every threshold.

    Per-group frame: one row per group, columns ``tp_i/fp_i/fn_i/tn_i``
    per threshold index i. Overall frame: a single row.
    """
    ex = scored.select(F.explode(group_col(mode)).alias("group"), LABEL, SCORE)
    per_group = ex.groupBy("group").agg(*_sweep_aggs(thresholds)).orderBy("group").toPandas()
    overall = scored.agg(*_sweep_aggs(thresholds)).toPandas()
    return per_group, overall


def unfair_counts(
    per_group: pd.DataFrame,
    overall: pd.DataFrame,
    *,
    thresholds=DEFAULT_THRESHOLDS,
    measure: str = "TPRP",
    tau: float = 0.2,
    op: str = "sub",
) -> list[int]:
    """#groups unfair w.r.t. ``measure`` at each threshold."""
    m = measures.MEASURES[measure]
    counts = []
    for i in range(len(thresholds)):
        conf_o = {k: float(overall.iloc[0][f"{k}_{i}"]) for k in ("tp", "fp", "fn", "tn")}
        ov = measures.rate(m.rate_kind, **conf_o)
        n = 0
        for _, row in per_group.iterrows():
            conf_g = {k: float(row[f"{k}_{i}"]) for k in ("tp", "fp", "fn", "tn")}
            gv = measures.rate(m.rate_kind, **conf_g)
            if disparity.is_unfair(ov, gv, higher_better=m.higher_better,
                                   op=op, tau=tau):
                n += 1
        counts.append(n)
    return counts


def overall_rates(
    overall: pd.DataFrame, *, thresholds=DEFAULT_THRESHOLDS, rate_kind: str = "tpr"
) -> list[float]:
    """The overall rate (e.g. TPR for Figure 14 cell values) per threshold."""
    out = []
    for i in range(len(thresholds)):
        conf = {k: float(overall.iloc[0][f"{k}_{i}"]) for k in ("tp", "fp", "fn", "tn")}
        out.append(measures.rate(rate_kind, **conf))
    return out


def sensitivity(counts: list[int]) -> float:
    """ℓ2 distance of #unfair-groups between adjacent thresholds."""
    if len(counts) < 2:
        return 0.0
    diffs = np.diff(np.asarray(counts, dtype=float))
    return float(math.sqrt(float(np.sum(diffs**2))))


def threshold_sensitivity(
    scored: DataFrame,
    *,
    thresholds=DEFAULT_THRESHOLDS,
    measure: str = "TPRP",
    tau: float = 0.2,
    op: str = "sub",
    mode: str = "single",
) -> float:
    """End-to-end: one matcher's Table 7 cell for one dataset/measure."""
    per_group, overall = sweep_confusions(scored, thresholds=thresholds, mode=mode)
    counts = unfair_counts(per_group, overall, thresholds=thresholds,
                           measure=measure, tau=tau, op=op)
    return sensitivity(counts)
