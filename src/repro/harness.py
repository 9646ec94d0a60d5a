"""Experiment harness: datasets × matchers × tables.

Builds each dataset at a named scale, trains each applicable matcher
once per (dataset, matcher) with session-lifetime caching, and exposes
one builder per evaluation-section table:

* ``table4`` — dataset overview (sizes, positive rate, attrs)
* ``table5`` — NoFlyCompas TPR/FDR per race group + disparities
* ``table6`` — FacultyMatch TPR/PPV per country group + disparities
* ``table7`` — threshold sensitivity (TPRP & PPVP) on 4 datasets
* ``table9`` — overall Accuracy/F-1 of all 13 matchers × 8 datasets

Tables 5/6 report *between-group* disparity exactly as the paper's
tables do: ``sub`` = advantaged − disadvantaged rate (sign flipped for
lower-is-better rates) and ``div`` = ratio − 1.
"""
from __future__ import annotations

import math
from typing import Callable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import confusion, measures, thresholds
from repro.em_data import benchmark, social
from repro.em_data.meta import DatasetMeta
from repro.em_data.pairs import test_split, train_split
from repro.matchers import ALL_MATCHERS, TABLE_MATCHERS, make_matcher

#: dataset name → scale name → generator kwargs
_SCALES: dict[str, dict[str, dict]] = {
    "NoFlyCompas": {
        "unit": dict(n_nofly=60, n_passengers=120, n_overlap=40),
        "bench": dict(n_nofly=200, n_passengers=500, n_overlap=150),
    },
    "FacultyMatch": {
        "unit": dict(n_cn=40, n_de=30),
        "bench": dict(n_cn=260, n_de=200),
    },
    "iTunes-Amazon": {"unit": dict(n_pairs=200), "bench": dict(n_pairs=430)},
    "DBLP-ACM": {"unit": dict(n_pairs=400), "bench": dict(n_pairs=2670)},
    "DBLP-Scholar": {"unit": dict(n_pairs=325), "bench": dict(n_pairs=325)},
    "Cricket": {"unit": dict(n_pairs=400), "bench": dict(n_pairs=3290)},
    "Shoes": {"unit": dict(n_pairs=500), "bench": dict(n_pairs=5600)},
    "Cameras": {"unit": dict(n_pairs=400), "bench": dict(n_pairs=2800)},
}

_BUILDERS: dict[str, Callable] = {
    "NoFlyCompas": social.nofly_compas,
    "FacultyMatch": social.faculty_match,
    "iTunes-Amazon": benchmark.itunes_amazon,
    "DBLP-ACM": benchmark.dblp_acm,
    "DBLP-Scholar": benchmark.dblp_scholar,
    "Cricket": benchmark.cricket,
    "Shoes": benchmark.shoes,
    "Cameras": benchmark.cameras,
}

DATASETS: tuple[str, ...] = tuple(_BUILDERS)
SOCIAL_DATASETS: tuple[str, ...] = ("NoFlyCompas", "FacultyMatch")
TABLE7_DATASETS: tuple[str, ...] = (
    "iTunes-Amazon", "Cameras", "DBLP-ACM", "DBLP-Scholar",
)


class Harness:
    """Caches datasets and scored test splits for one Spark session."""

    def __init__(self, spark: SparkSession, *, scale: str = "bench",
                 seed: int = 0, neural_epochs: int | None = None):
        self.spark = spark
        self.scale = scale
        self.seed = seed
        self.neural_epochs = neural_epochs or (25 if scale == "bench" else 8)
        self._datasets: dict[str, tuple[DataFrame, DatasetMeta]] = {}
        self._scored: dict[tuple[str, str], DataFrame] = {}

    # ------------------------------------------------------------- datasets
    def dataset(self, name: str) -> tuple[DataFrame, DatasetMeta]:
        if name not in self._datasets:
            kwargs = _SCALES[name][self.scale]
            pairs, meta = _BUILDERS[name](self.spark, **kwargs)
            self._datasets[name] = (pairs.cache(), meta)
        return self._datasets[name]

    # ------------------------------------------------------------- matchers
    def applicable(self, dataset: str, matcher: str) -> bool:
        _, meta = self.dataset(dataset)
        return matcher != "Dedupe" or meta.dedupe_scales

    def scored(self, dataset: str, matcher: str) -> DataFrame:
        """Scored *test* split for (dataset, matcher), cached."""
        key = (dataset, matcher)
        if key not in self._scored:
            pairs, meta = self.dataset(dataset)
            m = make_matcher(matcher, meta, seed=self.seed)
            if hasattr(m, "epochs"):
                m.epochs = self.neural_epochs
            m.fit(train_split(pairs))
            self._scored[key] = m.score(test_split(pairs)).cache()
        return self._scored[key]

    def unpersist(self) -> None:
        for df, _ in self._datasets.values():
            df.unpersist()
        for df in self._scored.values():
            df.unpersist()
        self._datasets.clear()
        self._scored.clear()


# ===================================================================== T4
def table4(h: Harness) -> pd.DataFrame:
    """Dataset overview (paper Table 4)."""
    rows = []
    for name in DATASETS:
        pairs, meta = h.dataset(name)
        n_train = train_split(pairs).count()
        n_test = test_split(pairs).count()
        n_pos = pairs.filter("label = 1").count()
        rows.append(
            {
                "Name": name,
                "Domain": meta.domain,
                "Type": meta.dtype,
                "Train": n_train,
                "Test": n_test,
                "% Pos.": round(100.0 * n_pos / max(1, n_train + n_test), 2),
                "# Attr.": len(meta.attrs),
                "Sens. Attr.": meta.sens_attr,
                "Sens. Attr. Type": meta.sens_type,
            }
        )
    return pd.DataFrame(rows)


# ================================================================= T5 / T6
def _group_rates(
    scored: DataFrame, threshold: float, rate_kind: str
) -> dict[str, float]:
    conf = confusion.group_confusion(scored, threshold, "single")
    return {
        r["group"]: measures.rate(
            rate_kind, tp=r["tp"], fp=r["fp"], fn=r["fn"], tn=r["tn"]
        )
        for r in conf.to_dict("records")
    }


def _between(disadv: float, adv: float, *, higher_better: bool) -> tuple[float, float]:
    """(sub, div) disparity between the disadvantaged and advantaged
    group rates, as printed in the paper's Tables 5/6."""
    if math.isnan(disadv) or math.isnan(adv):
        return math.nan, math.nan
    if higher_better:
        sub = adv - disadv
        div = math.nan if disadv == 0 else adv / disadv - 1.0
    else:
        sub = disadv - adv
        div = math.nan if adv == 0 else disadv / adv - 1.0
    return sub, div


def _social_table(
    h: Harness,
    dataset: str,
    *,
    disadvantaged: str,
    advantaged: str,
    rate_a: tuple[str, str, bool],
    rate_b: tuple[str, str, bool],
    matchers: tuple[str, ...] = TABLE_MATCHERS,
) -> pd.DataFrame:
    _, meta = h.dataset(dataset)
    rows = []
    for m in matchers:
        scored = h.scored(dataset, m)
        row: dict = {"Matcher": m}
        for label, kind, hb in (rate_a, rate_b):
            rates = _group_rates(scored, meta.threshold, kind)
            d = rates.get(disadvantaged, math.nan)
            a = rates.get(advantaged, math.nan)
            sub, div = _between(d, a, higher_better=hb)
            row[f"{label} {disadvantaged}"] = round(d, 2)
            row[f"{label} {advantaged}"] = round(a, 2)
            row[f"{label} sub"] = round(sub, 2)
            row[f"{label} div"] = round(div, 2)
        rows.append(row)
    return pd.DataFrame(rows)


def table5(h: Harness) -> pd.DataFrame:
    """NoFlyCompas: TPR and FDR per race group + disparities (Table 5)."""
    return _social_table(
        h,
        "NoFlyCompas",
        disadvantaged="African-American",
        advantaged="Caucasian",
        rate_a=("TPR", "tpr", True),
        rate_b=("FDR", "fdr", False),
    )


def table6(h: Harness) -> pd.DataFrame:
    """FacultyMatch: TPR and PPV per country group + disparities (Table 6)."""
    return _social_table(
        h,
        "FacultyMatch",
        disadvantaged="cn",
        advantaged="de",
        rate_a=("TPR", "tpr", True),
        rate_b=("PPV", "ppv", True),
    )


# ===================================================================== T7
def table7(
    h: Harness,
    *,
    matchers: tuple[str, ...] = ("BooleanRuleMatcher",) + TABLE_MATCHERS,
    datasets: tuple[str, ...] = TABLE7_DATASETS,
) -> pd.DataFrame:
    """Threshold sensitivity of TPRP and PPVP unfairness (Table 7)."""
    rows = []
    for measure in ("TPRP", "PPVP"):
        for ds in datasets:
            row: dict = {"Measure": measure, "Dataset": ds}
            for m in matchers:
                if not h.applicable(ds, m):
                    row[m] = math.nan
                    continue
                scored = h.scored(ds, m)
                row[m] = round(
                    thresholds.threshold_sensitivity(scored, measure=measure),
                    1,
                )
            rows.append(row)
    return pd.DataFrame(rows)


# ===================================================================== T9
def _acc_f1(scored: DataFrame, threshold: float) -> tuple[float, float]:
    c = confusion.overall_confusion(scored, threshold)
    n = sum(c.values())
    acc = (c["tp"] + c["tn"]) / n if n else math.nan
    denom = 2 * c["tp"] + c["fp"] + c["fn"]
    f1 = 2 * c["tp"] / denom if denom else 0.0
    return acc, f1


def table9(
    h: Harness,
    *,
    matchers: tuple[str, ...] = ALL_MATCHERS,
    datasets: tuple[str, ...] = DATASETS,
) -> pd.DataFrame:
    """Overall Accuracy and F-1 of every matcher × dataset (Table 9).
    Cells are "-" where Dedupe did not scale (as in the paper)."""
    rows = []
    for m in matchers:
        row: dict = {"Matcher": m}
        for ds in datasets:
            _, meta = h.dataset(ds)
            if not h.applicable(ds, m):
                row[f"{ds} Acc"] = "-"
                row[f"{ds} F1"] = "-"
                continue
            acc, f1 = _acc_f1(h.scored(ds, m), meta.threshold)
            row[f"{ds} Acc"] = round(acc, 2)
            row[f"{ds} F1"] = round(f1, 2)
        rows.append(row)
    return pd.DataFrame(rows)


# ============================================================== Fig. 4 bonus
def synergies(
    h: Harness,
    *,
    datasets: tuple[str, ...] = DATASETS,
    matchers: tuple[str, ...] = TABLE_MATCHERS,
    f1_cutoff: float = 0.8,
) -> pd.DataFrame:
    """Fairness × accuracy quadrants (paper Figure 4/16): per (matcher,
    dataset), whether the matcher is accurate (F-1 ≥ cutoff) and the
    measures (if any) under which it is unfair for some group."""
    from repro.core.audit import audit, discriminated_groups

    rows = []
    for ds in datasets:
        _, meta = h.dataset(ds)
        for m in matchers:
            if not h.applicable(ds, m):
                continue
            scored = h.scored(ds, m)
            _, f1 = _acc_f1(scored, meta.threshold)
            a = audit(scored, threshold=meta.threshold, mode="single")
            unfair_measures = sorted(
                {
                    msr
                    for msr in measures.ALL_MEASURES
                    if discriminated_groups(a, msr)
                }
            )
            rows.append(
                {
                    "Dataset": ds,
                    "Matcher": m,
                    "Accurate": f1 >= f1_cutoff,
                    "Fair": not unfair_measures,
                    "Unfair measures": ", ".join(unfair_measures),
                }
            )
    return pd.DataFrame(rows)
