"""The six Magellan-style non-neural ML matchers, on ``pyspark.ml``.

Each matcher is a pipeline: Magellan-style feature generation
(``repro.features``) → a Spark ML estimator → a calibrated ``score`` in
[0, 1]:

* probabilistic classifiers (DT, RF, LogReg, NB) → P(match),
* LinearSVC → sigmoid of the margin,
* LinearRegression → prediction clipped to [0, 1] (the paper's
  LinRegMatcher thresholds the regression output).
"""
from __future__ import annotations

from typing import Callable

from pyspark.ml.classification import (
    DecisionTreeClassifier,
    LinearSVC,
    LogisticRegression,
    NaiveBayes,
    RandomForestClassifier,
)
from pyspark.ml.functions import vector_to_array
from pyspark.ml.regression import LinearRegression
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.em_data.meta import SCORE, DatasetMeta
from repro.features import add_features
from repro.matchers.base import Matcher

_LABEL = "label_d"


def _prob_score(df: DataFrame) -> DataFrame:
    return df.withColumn(SCORE, vector_to_array(F.col("probability"))[1])


def _margin_score(df: DataFrame) -> DataFrame:
    margin = vector_to_array(F.col("rawPrediction"))[1]
    return df.withColumn(SCORE, F.lit(1.0) / (F.lit(1.0) + F.exp(-margin)))


def _clip_score(df: DataFrame) -> DataFrame:
    return df.withColumn(
        SCORE, F.least(F.greatest(F.col("prediction"), F.lit(0.0)), F.lit(1.0))
    )


_WEIGHT = "w"

FACTORIES: dict[str, tuple[Callable, Callable[[DataFrame], DataFrame]]] = {
    "DTMatcher": (
        lambda seed: DecisionTreeClassifier(
            labelCol=_LABEL, weightCol=_WEIGHT, maxDepth=5, seed=seed
        ),
        _prob_score,
    ),
    "RFMatcher": (
        lambda seed: RandomForestClassifier(
            labelCol=_LABEL, weightCol=_WEIGHT, numTrees=20, maxDepth=6,
            seed=seed,
        ),
        _prob_score,
    ),
    "LogRegMatcher": (
        lambda seed: LogisticRegression(
            labelCol=_LABEL, weightCol=_WEIGHT, maxIter=60
        ),
        _prob_score,
    ),
    "NBMatcher": (
        lambda seed: NaiveBayes(
            labelCol=_LABEL, weightCol=_WEIGHT, modelType="gaussian"
        ),
        _prob_score,
    ),
    "SVMMatcher": (
        lambda seed: LinearSVC(
            labelCol=_LABEL, weightCol=_WEIGHT, maxIter=60, regParam=0.01
        ),
        _margin_score,
    ),
    "LinRegMatcher": (
        lambda seed: LinearRegression(
            labelCol=_LABEL, weightCol=_WEIGHT, regParam=0.01
        ),
        _clip_score,
    ),
}


class SparkMLMatcher(Matcher):
    """One non-neural matcher = feature generation + a Spark ML model."""

    def __init__(self, name: str, meta: DatasetMeta, *, seed: int = 0):
        if name not in FACTORIES:
            raise KeyError(f"not a Spark ML matcher: {name}")
        self.name = name
        self.meta = meta
        self.seed = seed
        self.model = None

    def _featurize(self, pairs: DataFrame) -> DataFrame:
        return add_features(pairs, self.meta.attrs)

    def fit(self, train: DataFrame) -> "SparkMLMatcher":
        make, _ = FACTORIES[self.name]
        feat = self._featurize(train).withColumn(
            _LABEL, F.col("label").cast("double")
        )
        # Balanced instance weights: EM's O(n) class imbalance (§3.5)
        # otherwise drives margin/least-squares models to all-negative.
        # SVM/LinReg get sqrt-damped weights: the full ratio drags their
        # single linear boundary far into the negatives (mass FPs).
        n = feat.count()
        n_pos = feat.filter(F.col(_LABEL) == 1.0).count()
        ratio = (n - n_pos) / max(1, n_pos) if 0 < n_pos < n else 1.0
        damp = 0.5 if self.name in ("SVMMatcher", "LinRegMatcher") else 1.0
        pos_w = min(100.0, ratio**damp)
        feat = feat.withColumn(
            _WEIGHT,
            F.when(F.col(_LABEL) == 1.0, F.lit(float(pos_w))).otherwise(1.0),
        )
        self.model = make(self.seed).fit(feat)
        return self

    def score(self, pairs: DataFrame) -> DataFrame:
        if self.model is None:
            raise RuntimeError(f"{self.name}.score() before fit()")
        _, to_score = FACTORIES[self.name]
        out = to_score(self.model.transform(self._featurize(pairs)))
        return out.select(*pairs.columns, SCORE)
