"""NeuralMatcher: featurizer + numpy MLP, scored via mapInPandas.

Training happens driver-side on (at most ``max_train`` rows of) the
train split — all positives plus a capped negative sample, mirroring
the balanced-batch construction real neural matchers rely on under EM's
class imbalance. Scoring runs distributed: model parameters and the
featurizer travel to executors in a mapInPandas closure.

GNEM's candidate-set context needs all pairs of a left record in one
batch, so its input is repartitioned by left-record hash first.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType, StructType

from repro.em_data.meta import SCORE, DatasetMeta
from repro.matchers.base import Matcher
from repro.matchers.neural.featurize import FEATURIZERS
from repro.matchers.neural.nn_core import MLP


def _remap_scores(raw: np.ndarray, t: float, target: float) -> np.ndarray:
    """Piecewise-linear monotone map sending the calibrated cut ``t`` to
    the dataset's matching threshold ``target`` (0.5 everywhere except
    CRICKET's 0.9, §5.1.4), keeping [0, 1] and score order intact."""
    t = float(min(max(t, 1e-6), 1 - 1e-6))
    below = target * raw / t
    above = target + (1.0 - target) * (raw - t) / (1.0 - t)
    return np.clip(np.where(raw <= t, below, above), 0.0, 1.0)


class NeuralMatcher(Matcher):
    """One of the five simulated neural matchers of Table 3."""

    def __init__(
        self,
        name: str,
        meta: DatasetMeta,
        *,
        seed: int = 0,
        epochs: int = 30,
        hidden: tuple[int, ...] = (32, 16),
        max_train: int = 40_000,
        neg_ratio: int = 20,
    ):
        if name not in FEATURIZERS:
            raise KeyError(f"not a neural matcher: {name}")
        self.name = name
        self.meta = meta
        self.seed = seed
        self.epochs = epochs
        self.hidden = hidden
        self.max_train = max_train
        self.neg_ratio = neg_ratio
        self.model: MLP | None = None

    def _needed_cols(self) -> list[str]:
        return [f"{s}_{a.name}" for a in self.meta.attrs for s in ("l", "r")]

    def _subsample(self, pdf: pd.DataFrame) -> pd.DataFrame:
        """Cap the train set at ``max_train`` rows, keeping all positives
        (mirrors the candidate-set capping real neural matchers train on).
        Featurization happens on the *full* (capped) split so one-to-set
        context features (GNEM) see realistic candidate sets."""
        if len(pdf) <= self.max_train:
            return pdf.reset_index(drop=True)
        pos = pdf[pdf["label"] == 1]
        neg = pdf[pdf["label"] != 1].sample(
            n=max(0, self.max_train - len(pos)), random_state=self.seed
        )
        return (
            pd.concat([pos, neg])
            .sample(frac=1.0, random_state=self.seed)
            .reset_index(drop=True)
        )

    def fit(self, train: DataFrame) -> "NeuralMatcher":
        pdf = train.select(*self._needed_cols(), "label").toPandas()
        pdf = self._subsample(pdf)
        X = FEATURIZERS[self.name](pdf, self.meta)
        y = pdf["label"].to_numpy()
        # Hold out 30% of the train split for threshold calibration — the
        # analogue of the paper's validation set (§5.1.4). Calibrating
        # in-sample would pick a threshold inside the (overfit) training
        # margin and flood the test split with false positives.
        g = np.random.default_rng(self.seed + 17)
        order = g.permutation(len(y))
        n_cal = max(1, int(0.3 * len(y)))
        cal_idx, fit_idx = order[:n_cal], order[n_cal:]
        if y[cal_idx].sum() < 3 or y[fit_idx].sum() < 3:  # tiny datasets
            cal_idx = fit_idx = order
        n_pos = max(1, int(y[fit_idx].sum()))
        # Damped positive weight: full neg/pos ratio buys recall at the
        # cost of the precision the paper's neural matchers do retain.
        pos_weight = float(
            min(10.0, max(1.0, ((len(fit_idx) - n_pos) / n_pos) ** 0.5))
        )
        self.model = MLP(
            X.shape[1], self.hidden, seed=self.seed, epochs=self.epochs
        ).fit(X[fit_idx], y[fit_idx], pos_weight=pos_weight)
        self._calibrate(self.model.predict(X[cal_idx]), y[cal_idx])
        return self

    # Stand-in for the paper's §5.1.4 validation-set tuning: an affine,
    # order-preserving remap of the score so the F1-optimal cut sits at
    # 0.5 (the real systems' sigmoid outputs are trained to be roughly
    # calibrated; a raw small-MLP score is not).
    def _calibrate(self, scores: np.ndarray, y: np.ndarray) -> None:
        cands = np.unique(np.quantile(scores, np.linspace(0.0, 1.0, 201)))
        best_ts, best_f1 = [0.5], -1.0
        for t in cands:
            pred = scores > t
            tp = int((pred & (y == 1)).sum())
            fp = int((pred & (y == 0)).sum())
            fn = int((~pred & (y == 1)).sum())
            denom = 2 * tp + fp + fn
            f1 = 2 * tp / denom if denom else 0.0
            if f1 > best_f1 + 1e-12:
                best_f1, best_ts = f1, [float(t)]
            elif abs(f1 - best_f1) <= 1e-12:
                best_ts.append(float(t))
        # middle of the optimal plateau: robust when train is separable
        self._cal_t = float(np.median(best_ts))

    def _remap(self, scores: np.ndarray) -> np.ndarray:
        return _remap_scores(
            scores, getattr(self, "_cal_t", 0.5), self.meta.threshold
        )

    def score(self, pairs: DataFrame) -> DataFrame:
        if self.model is None:
            raise RuntimeError(f"{self.name}.score() before fit()")
        featurizer = FEATURIZERS[self.name]
        model, meta = self.model, self.meta
        cal_t, target = self._cal_t, self.meta.threshold

        out_schema = StructType(list(pairs.schema.fields)).add(SCORE, DoubleType())

        def score_batches(batches):
            for pdf in batches:
                if len(pdf) == 0:
                    pdf[SCORE] = pd.Series(dtype=float)
                    yield pdf
                    continue
                X = featurizer(pdf, meta)
                pdf = pdf.copy()
                raw = model.predict(X)
                pdf[SCORE] = _remap_scores(raw, cal_t, target)
                yield pdf

        src = pairs
        if self.name == "GNEM":
            # Keep each left record's candidate set within one partition
            # so the one-to-set context is complete.
            key = F.xxhash64(
                *[F.coalesce(F.col(f"l_{a.name}").cast("string"), F.lit(""))
                  for a in meta.attrs]
            )
            n_parts = max(1, min(16, pairs.sparkSession.sparkContext.defaultParallelism))
            src = pairs.repartition(n_parts, key)
        return src.mapInPandas(score_batches, schema=out_schema)
