"""The fairness audit (Algorithm 1 of the paper).

``audit`` turns a scored pairs DataFrame into a per-(group, measure)
table with group rate, overall rate, signed disparity, and the unfair
flag under the 20 % rule. ``run_algorithm1`` is the end-to-end loop:
split → fit → score → audit single & pairwise → discriminated groups.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame

from repro.core import confusion, disparity, measures
from repro.em_data.pairs import test_split, train_split


def _measure_rows(
    group: str,
    conf: dict[str, int],
    overall: dict[str, int],
    *,
    op: str,
    tau: float,
    use: tuple[str, ...],
) -> list[dict]:
    rows = []
    by_name: dict[str, dict] = {}
    for name in use:
        m = measures.MEASURES[name]
        if not m.rate_kind:  # EO — composite, resolved after the loop
            continue
        gv = measures.rate(m.rate_kind, **conf)
        ov = measures.rate(m.rate_kind, **overall)
        d = disparity.signed_disparity(ov, gv, higher_better=m.higher_better, op=op)
        row = {
            "group": group,
            "measure": name,
            "group_value": gv,
            "overall_value": ov,
            "disparity": d,
            "unfair": disparity.is_unfair(
                ov, gv, higher_better=m.higher_better, op=op, tau=tau
            ),
        }
        by_name[name] = row
        rows.append(row)
    if "EO" in use:
        tprp, fprp = by_name.get("TPRP"), by_name.get("FPRP")
        rows.append(
            {
                "group": group,
                "measure": "EO",
                "group_value": math.nan,
                "overall_value": math.nan,
                "disparity": math.nan,
                "unfair": bool(
                    (tprp and tprp["unfair"]) or (fprp and fprp["unfair"])
                ),
            }
        )
    return rows


def audit(
    scored: DataFrame,
    *,
    threshold: float = 0.5,
    tau: float = 0.2,
    mode: str = "single",
    op: str = "sub",
    use_measures: tuple[str, ...] = measures.ALL_MEASURES,
    min_legitimate: int = 1,
) -> pd.DataFrame:
    """Audit a scored pairs DataFrame (must contain ``score``, ``label``,
    ``l_groups``, ``r_groups``).

    Returns one row per (group, measure). The overall rates are computed
    over *all* pairs (each pair once); group rates over the pairs
    legitimate for that group under ``mode``. Groups with fewer than
    ``min_legitimate`` legitimate pairs are dropped.
    """
    overall = confusion.overall_confusion(scored, threshold)
    per_group = confusion.group_confusion(scored, threshold, mode)
    rows: list[dict] = []
    for rec in per_group.to_dict("records"):
        conf = {k: int(rec[k]) for k in ("tp", "fp", "fn", "tn")}
        if sum(conf.values()) < min_legitimate:
            continue
        rows.append({"group": rec["group"], "n": sum(conf.values()), **conf})
    conf_df = pd.DataFrame(rows)
    out: list[dict] = []
    for rec in rows:
        conf = {k: rec[k] for k in ("tp", "fp", "fn", "tn")}
        out.extend(
            _measure_rows(rec["group"], conf, overall, op=op, tau=tau,
                          use=use_measures)
        )
    result = pd.DataFrame(
        out,
        columns=["group", "measure", "group_value", "overall_value",
                 "disparity", "unfair"],
    )
    result.attrs["overall_confusion"] = overall
    result.attrs["group_confusion"] = conf_df
    return result


def discriminated_groups(audit_df: pd.DataFrame, measure: str) -> list[str]:
    """Groups flagged unfair for one measure (a g_single / g_pairwise
    list of Algorithm 1)."""
    sel = audit_df[(audit_df["measure"] == measure) & audit_df["unfair"]]
    return sorted(sel["group"].tolist())


@dataclass
class Algorithm1Result:
    single: pd.DataFrame
    pairwise: pd.DataFrame
    g_single: dict[str, list[str]]
    g_pairwise: dict[str, list[str]]


def run_algorithm1(
    pairs: DataFrame,
    matcher,
    *,
    threshold: float = 0.5,
    tau: float = 0.2,
    op: str = "sub",
    use_measures: tuple[str, ...] = measures.ALL_MEASURES,
) -> Algorithm1Result:
    """Algorithm 1 end to end: fit on the train split, score the test
    split, audit single and pairwise fairness, and return the
    discriminated-group lists per measure."""
    matcher.fit(train_split(pairs))
    scored = matcher.score(test_split(pairs))
    single = audit(scored, threshold=threshold, tau=tau, mode="single",
                   op=op, use_measures=use_measures)
    pairwise = audit(scored, threshold=threshold, tau=tau, mode="pairwise",
                     op=op, use_measures=use_measures)
    return Algorithm1Result(
        single=single,
        pairwise=pairwise,
        g_single={m: discriminated_groups(single, m) for m in use_measures},
        g_pairwise={m: discriminated_groups(pairwise, m) for m in use_measures},
    )
