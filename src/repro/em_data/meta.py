"""Dataset metadata shared by generators, featurizers, and the harness."""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class AttrSpec:
    """One matching attribute of a pair schema.

    ``kind`` drives Magellan-style feature generation: ``short_str`` gets
    exact + Levenshtein features, ``long_str`` gets token/q-gram/cosine/
    Monge-Elkan features, ``numeric`` gets exact + scaled-difference.
    """

    name: str
    kind: str  # 'short_str' | 'long_str' | 'numeric'

    def __post_init__(self) -> None:
        if self.kind not in ("short_str", "long_str", "numeric"):
            raise ValueError(f"unknown attr kind: {self.kind}")


@dataclass(frozen=True)
class DatasetMeta:
    """Static description of one EM dataset (one row of the paper's Table 4)."""

    name: str
    domain: str
    dtype: str  # 'structured' | 'dirty' | 'textual'
    attrs: tuple[AttrSpec, ...]
    sens_attr: str
    sens_type: str  # 'binary' | 'multi' | 'setwise'
    threshold: float = 0.5  # paper uses 0.9 for CRICKET, 0.5 elsewhere
    dedupe_scales: bool = True  # paper: Dedupe did not scale on 4 datasets

    @property
    def attr_names(self) -> tuple[str, ...]:
        return tuple(a.name for a in self.attrs)

    def attr(self, name: str) -> AttrSpec:
        for a in self.attrs:
            if a.name == name:
                return a
        raise KeyError(name)


#: Canonical column layout of a pairs DataFrame.
PAIR_ID = "pair_id"
LABEL = "label"
L_GROUPS = "l_groups"
R_GROUPS = "r_groups"
IS_TRAIN = "is_train"
SCORE = "score"


def pair_columns(meta: DatasetMeta) -> list[str]:
    """All expected columns of a pairs DataFrame for ``meta``."""
    cols = [PAIR_ID]
    for side in ("l", "r"):
        cols += [f"{side}_{a}" for a in meta.attr_names]
    return cols + [LABEL, L_GROUPS, R_GROUPS, IS_TRAIN]
