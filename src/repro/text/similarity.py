"""Similarity measures as Spark ``Column`` expressions / pandas UDFs.

These are the primitives used by the rule-based matcher (§4.1 of the
paper) and the Magellan-style automatic feature generator (§5.1.4):
Levenshtein, word/q-gram Jaccard, hashed-token cosine, Monge–Elkan,
exact match, and scaled numeric distance. Where Spark has a builtin
(``levenshtein``, array set ops) we stay inside Catalyst; the rest are
vectorized pandas UDFs.

All string similarities treat NULL as the empty string and return a
value in [0, 1]; the empty-vs-empty case is defined as 0.0 so missing
values in dirty datasets never look like strong evidence of a match.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType


def _s(c: str | Column) -> Column:
    col = F.col(c) if isinstance(c, str) else c
    return F.coalesce(col.cast("string"), F.lit(""))


def exact_sim(l: str | Column, r: str | Column) -> Column:
    """1.0 iff both sides are non-empty and equal (case-insensitive)."""
    a, b = F.lower(F.trim(_s(l))), F.lower(F.trim(_s(r)))
    return ((a == b) & (F.length(a) > 0)).cast("double")


def levenshtein_sim(l: str | Column, r: str | Column) -> Column:
    """1 - edit_distance / max(len); 0 when either side is empty."""
    a, b = F.lower(_s(l)), F.lower(_s(r))
    denom = F.greatest(F.length(a), F.length(b))
    return F.when(denom == 0, F.lit(0.0)).otherwise(
        1.0 - F.levenshtein(a, b) / denom.cast("double")
    )


def _word_tokens(c: str | Column) -> Column:
    cleaned = F.lower(F.regexp_replace(_s(c), r"[^a-z0-9\s]", " "))
    return F.array_remove(F.split(F.trim(cleaned), r"\s+"), "")


def _jaccard(a: Column, b: Column) -> Column:
    a, b = F.array_distinct(a), F.array_distinct(b)
    inter = F.size(F.array_intersect(a, b)).cast("double")
    union = F.size(F.array_union(a, b)).cast("double")
    return F.when(union == 0, F.lit(0.0)).otherwise(inter / union)


def word_jaccard(l: str | Column, r: str | Column) -> Column:
    """Jaccard similarity over lowercase word tokens."""
    return _jaccard(_word_tokens(l), _word_tokens(r))


def qgram_tokens(c: str | Column, q: int = 3) -> Column:
    """Array of character q-grams of the lowercased string (SQL transform)."""
    col = F.lower(_s(c))
    return F.when(
        F.length(col) == 0, F.array().cast("array<string>")
    ).when(F.length(col) < q, F.array(col)).otherwise(
        F.transform(
            F.sequence(F.lit(1), F.length(col) - (q - 1)),
            lambda i: col.substr(i, F.lit(q)),
        )
    )


def qgram_jaccard(l: str | Column, r: str | Column, q: int = 3) -> Column:
    """Jaccard similarity over character q-grams (default trigrams)."""
    return _jaccard(qgram_tokens(l, q), qgram_tokens(r, q))


def numeric_sim(l: str | Column, r: str | Column) -> Column:
    """1 - |a-b| / max(|a|, |b|, 1); 0 when either side is NULL."""
    a = (F.col(l) if isinstance(l, str) else l).cast("double")
    b = (F.col(r) if isinstance(r, str) else r).cast("double")
    denom = F.greatest(F.abs(a), F.abs(b), F.lit(1.0))
    sim = 1.0 - F.abs(a - b) / denom
    return F.when(a.isNull() | b.isNull(), F.lit(0.0)).otherwise(
        F.greatest(sim, F.lit(0.0))
    )


# ---------------------------------------------------------------- python side
def _tok(s: str) -> list[str]:
    out, cur = [], []
    for ch in (s or "").lower():
        if ch.isalnum():
            cur.append(ch)
        elif cur:
            out.append("".join(cur))
            cur = []
    if cur:
        out.append("".join(cur))
    return out


def _lev(a: str, b: str) -> int:
    """Plain DP Levenshtein distance (row-rolling)."""
    if a == b:
        return 0
    if not a:
        return len(b)
    if not b:
        return len(a)
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i]
        for j, cb in enumerate(b, 1):
            cur.append(min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + (ca != cb)))
        prev = cur
    return prev[-1]


def lev_sim_py(a: str, b: str) -> float:
    """Python-side Levenshtein similarity (shared with Monge–Elkan)."""
    a, b = (a or "").lower(), (b or "").lower()
    m = max(len(a), len(b))
    return 0.0 if m == 0 else 1.0 - _lev(a, b) / m


def monge_elkan_py(a: str, b: str) -> float:
    """Mean over tokens of ``a`` of the best Levenshtein sim in ``b``."""
    ta, tb = _tok(a), _tok(b)
    if not ta or not tb:
        return 0.0
    return float(np.mean([max(lev_sim_py(x, y) for y in tb) for x in ta]))


def _hash_vector(tokens: list[str], dim: int = 64) -> np.ndarray:
    v = np.zeros(dim)
    for t in tokens:
        v[hash(t) % dim] += 1.0
    return v


def cosine_hash_py(a: str, b: str, dim: int = 64) -> float:
    """Cosine over hashed token-count vectors (TF-IDF-lite)."""
    va, vb = _hash_vector(_tok(a), dim), _hash_vector(_tok(b), dim)
    na, nb = np.linalg.norm(va), np.linalg.norm(vb)
    if na == 0 or nb == 0:
        return 0.0
    return float(np.dot(va, vb) / (na * nb))


@F.pandas_udf(DoubleType())
def monge_elkan_udf(l: pd.Series, r: pd.Series) -> pd.Series:
    return pd.Series(
        [monge_elkan_py(a, b) for a, b in zip(l.fillna(""), r.fillna(""))]
    )


@F.pandas_udf(DoubleType())
def cosine_hash_udf(l: pd.Series, r: pd.Series) -> pd.Series:
    return pd.Series(
        [cosine_hash_py(a, b) for a, b in zip(l.fillna(""), r.fillna(""))]
    )


def monge_elkan(l: str | Column, r: str | Column) -> Column:
    return monge_elkan_udf(_s(l), _s(r))


def cosine_hash(l: str | Column, r: str | Column) -> Column:
    return cosine_hash_udf(_s(l), _s(r))
