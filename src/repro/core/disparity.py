"""Disparity computation (§3.6, Eqs. 1–4) and the 20 % rule.

``signed_disparity`` returns the raw (unclamped) value exactly as the
paper prints in Tables 5/6 (where negative entries mean the audited
group did *better* than average); ``is_unfair`` applies the
``max(0, ·) > τ`` clamp-and-threshold of Eq. 1/3 with the EEOC 80 %
rule default τ = 0.2.
"""
from __future__ import annotations

import math


def signed_disparity(
    overall: float, group: float, *, higher_better: bool, op: str = "sub"
) -> float:
    """Raw disparity of a group rate vs the overall rate.

    ``op='sub'`` → Eq. 1 (Eq. 4 when lower-is-better);
    ``op='div'`` → Eq. 3 (with numerator/denominator swapped when
    lower-is-better). NaN when either rate is undefined.
    """
    if math.isnan(overall) or math.isnan(group):
        return math.nan
    if op == "sub":
        return overall - group if higher_better else group - overall
    if op == "div":
        if higher_better:
            return math.nan if overall == 0 else 1.0 - group / overall
        return math.nan if group == 0 else 1.0 - overall / group
    raise ValueError(f"unknown disparity op: {op}")


def clamped_disparity(
    overall: float, group: float, *, higher_better: bool, op: str = "sub"
) -> float:
    """max(0, signed disparity) — the F of Eqs. 1/3."""
    d = signed_disparity(overall, group, higher_better=higher_better, op=op)
    return d if math.isnan(d) else max(0.0, d)


def is_unfair(
    overall: float, group: float, *, higher_better: bool,
    op: str = "sub", tau: float = 0.2,
) -> bool:
    """EEOC 80 % rule (§5.1.4): unfair iff clamped disparity exceeds τ."""
    d = clamped_disparity(overall, group, higher_better=higher_better, op=op)
    # small epsilon so e.g. 0.9 - 0.7 (== 0.2 + 5.6e-17 in IEEE) is tolerated
    return (not math.isnan(d)) and d > tau + 1e-9
