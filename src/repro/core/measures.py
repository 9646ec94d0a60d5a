"""The 11 fairness measures of Table 2, as rates over confusion counts.

Each parity measure compares one *rate* (computed from a group's
confusion profile) against the same rate computed overall. ``EO``
(Equalized Odds) is the conjunction of TPRP and FPRP (footnote 6 of the
paper: its unfair set is the union of the two rows).

``higher_better`` records the direction used by §3.6: for measures
where a *lower* probability is preferred (FPR, FNR, FDR, FOR) the
disparity subtraction/division is flipped (Eq. 4).
"""
from __future__ import annotations

import math
from dataclasses import dataclass


def _div(num: float, den: float) -> float:
    return math.nan if den == 0 else num / den


def rate(kind: str, tp: float, fp: float, fn: float, tn: float) -> float:
    """One confusion-derived rate; NaN when the denominator is empty."""
    n = tp + fp + fn + tn
    if kind == "accuracy":
        return _div(tp + tn, n)
    if kind == "match_rate":
        return _div(tp + fp, n)
    if kind == "tpr":
        return _div(tp, tp + fn)
    if kind == "fpr":
        return _div(fp, fp + tn)
    if kind == "fnr":
        return _div(fn, tp + fn)
    if kind == "tnr":
        return _div(tn, fp + tn)
    if kind == "ppv":
        return _div(tp, tp + fp)
    if kind == "npv":
        return _div(tn, tn + fn)
    if kind == "fdr":
        return _div(fp, tp + fp)
    if kind == "for":
        return _div(fn, tn + fn)
    raise ValueError(f"unknown rate: {kind}")


@dataclass(frozen=True)
class Measure:
    name: str
    rate_kind: str  # '' for composites (EO)
    higher_better: bool
    description: str


MEASURES: dict[str, Measure] = {
    m.name: m
    for m in [
        Measure("AP", "accuracy", True, "Accuracy Parity"),
        Measure("SP", "match_rate", True, "Statistical Parity"),
        Measure("TPRP", "tpr", True, "True Positive Rate Parity (Equal Opportunity)"),
        Measure("FPRP", "fpr", False, "False Positive Rate Parity"),
        Measure("FNRP", "fnr", False, "False Negative Rate Parity"),
        Measure("TNRP", "tnr", True, "True Negative Rate Parity"),
        Measure("EO", "", True, "Equalized Odds (TPRP ∧ FPRP)"),
        Measure("PPVP", "ppv", True, "Positive Predictive Value Parity"),
        Measure("NPVP", "npv", True, "Negative Predictive Value Parity"),
        Measure("FDRP", "fdr", False, "False Discovery Rate Parity"),
        Measure("FORP", "for", False, "False Omission Rate Parity"),
    ]
}

ALL_MEASURES: tuple[str, ...] = tuple(MEASURES)

#: Measures footnoted in Table 2 as meaningful only for single fairness
#: (or pairwise with overlapping groups): they rely on TPs/FNs, which are
#: structurally zero for non-overlapping pairwise groups.
TP_FN_BASED: frozenset[str] = frozenset(
    {"TPRP", "FNRP", "EO", "PPVP", "NPVP", "FDRP", "FORP"}
)
