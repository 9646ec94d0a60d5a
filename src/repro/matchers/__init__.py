"""The 13 entity matchers of Table 3, behind a single registry.

``make_matcher(name, meta)`` builds a fresh matcher for a dataset; the
name lists mirror the paper's taxonomy (1 rule-based, 7 non-neural,
5 neural).
"""
from __future__ import annotations

from repro.em_data.meta import DatasetMeta
from repro.matchers.base import Matcher

RULE_BASED: tuple[str, ...] = ("BooleanRuleMatcher",)
NON_NEURAL: tuple[str, ...] = (
    "Dedupe",
    "DTMatcher",
    "SVMMatcher",
    "RFMatcher",
    "LogRegMatcher",
    "LinRegMatcher",
    "NBMatcher",
)
NEURAL: tuple[str, ...] = ("DeepMatcher", "Ditto", "GNEM", "HierMatcher", "MCAN")
ALL_MATCHERS: tuple[str, ...] = RULE_BASED + NON_NEURAL + NEURAL

#: The 11 matchers of Tables 5/6/7 (all but BooleanRuleMatcher & Dedupe).
TABLE_MATCHERS: tuple[str, ...] = tuple(
    m for m in ALL_MATCHERS if m not in ("BooleanRuleMatcher", "Dedupe")
)


def make_matcher(name: str, meta: DatasetMeta, *, seed: int = 0) -> Matcher:
    """Instantiate matcher ``name`` configured for dataset ``meta``."""
    from repro.matchers import dedupe_like, ml, rule_based
    from repro.matchers.neural import models as neural

    if name == "BooleanRuleMatcher":
        return rule_based.BooleanRuleMatcher(meta)
    if name == "Dedupe":
        return dedupe_like.DedupeMatcher(meta, seed=seed)
    if name in ml.FACTORIES:
        return ml.SparkMLMatcher(name, meta, seed=seed)
    if name in neural.FEATURIZERS:
        return neural.NeuralMatcher(name, meta, seed=seed)
    raise KeyError(f"unknown matcher: {name}")
