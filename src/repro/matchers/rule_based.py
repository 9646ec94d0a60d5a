"""BooleanRuleMatcher — declarative conjunction of similarity predicates.

Following §5.1.4: exact match for short/atomic attributes and a
distance-based feature with a 0.5 similarity threshold for longer
attributes. The matcher's ``score`` is the *minimum* of the per-rule
similarities, so ``score > 0.5`` is exactly the conjunction of all
rules — and threshold sweeps remain meaningful.

Name-like short strings use Levenshtein similarity rather than exact
match (as the paper does for perturbed-name attributes), while numeric
attributes use exact equality.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.em_data.meta import SCORE, DatasetMeta
from repro.matchers.base import Matcher
from repro.text import similarity as sim


def _rule(a) -> Column:
    l, r = f"l_{a.name}", f"r_{a.name}"
    if a.kind == "numeric":
        return sim.exact_sim(l, r)
    if a.kind == "short_str":
        return sim.levenshtein_sim(l, r)
    return sim.qgram_jaccard(l, r)


class BooleanRuleMatcher(Matcher):
    """Conjunction of per-attribute matching conditions (no training)."""

    def __init__(self, meta: DatasetMeta):
        self.name = "BooleanRuleMatcher"
        self.meta = meta

    def fit(self, train: DataFrame) -> "BooleanRuleMatcher":
        return self  # declarative: nothing to learn

    def score(self, pairs: DataFrame) -> DataFrame:
        rules = [_rule(a) for a in self.meta.attrs]
        expr = rules[0] if len(rules) == 1 else F.least(*rules)
        return pairs.withColumn(SCORE, expr.cast("double"))
