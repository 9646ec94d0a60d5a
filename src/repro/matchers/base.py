"""Matcher protocol.

A matcher is fit on a train pairs DataFrame and emits a confidence
``score`` in [0, 1] per pair; thresholding is decoupled and applied by
the audit (§3.1: "we decouple the choice of a threshold from the
outcome of the matching").
"""
from __future__ import annotations

from abc import ABC, abstractmethod

from pyspark.sql import DataFrame


class Matcher(ABC):
    """fit/score interface shared by all 13 matchers."""

    name: str

    @abstractmethod
    def fit(self, train: DataFrame) -> "Matcher":
        """Train on labelled pairs; returns self for chaining."""

    @abstractmethod
    def score(self, pairs: DataFrame) -> DataFrame:
        """Return ``pairs`` with an added ``score`` double in [0, 1]."""
