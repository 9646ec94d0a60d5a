"""Automatic per-attribute feature generation (Magellan stand-in).

For every matching attribute of a pair schema the generator emits
similarity features chosen by attribute class, mirroring
``py_entitymatching``'s automatic feature generator used by the paper
for all non-neural matchers (§5.1.4):

* ``numeric``    → exact match, scaled absolute difference
* ``short_str``  → exact match, Levenshtein similarity
* ``long_str``   → word Jaccard, 3-gram Jaccard, hashed cosine,
                   Monge–Elkan, Levenshtein similarity

All features are plain double columns assembled into a ``features``
vector for ``pyspark.ml`` estimators.
"""
from __future__ import annotations

from pyspark.ml.feature import VectorAssembler
from pyspark.sql import Column, DataFrame

from repro.em_data.meta import AttrSpec
from repro.text import similarity as sim


def _attr_features(a: AttrSpec) -> dict[str, Column]:
    l, r = f"l_{a.name}", f"r_{a.name}"
    if a.kind == "numeric":
        return {
            f"f_{a.name}_exact": sim.exact_sim(l, r),
            f"f_{a.name}_numsim": sim.numeric_sim(l, r),
        }
    if a.kind == "short_str":
        return {
            f"f_{a.name}_exact": sim.exact_sim(l, r),
            f"f_{a.name}_lev": sim.levenshtein_sim(l, r),
        }
    return {
        f"f_{a.name}_jac_w": sim.word_jaccard(l, r),
        f"f_{a.name}_jac_q3": sim.qgram_jaccard(l, r),
        f"f_{a.name}_cos": sim.cosine_hash(l, r),
        f"f_{a.name}_me": sim.monge_elkan(l, r),
        f"f_{a.name}_lev": sim.levenshtein_sim(l, r),
    }


def feature_names(attrs: tuple[AttrSpec, ...]) -> list[str]:
    names: list[str] = []
    for a in attrs:
        names.extend(_attr_features(a).keys())
    return names


def add_features(
    pairs: DataFrame, attrs: tuple[AttrSpec, ...], *, out_col: str = "features"
) -> DataFrame:
    """Append the per-attribute feature columns and their assembled
    ``out_col`` vector to a pairs DataFrame."""
    df = pairs
    cols: list[str] = []
    for a in attrs:
        for name, expr in _attr_features(a).items():
            df = df.withColumn(name, expr)
            cols.append(name)
    assembler = VectorAssembler(inputCols=cols, outputCol=out_col)
    return assembler.transform(df)
