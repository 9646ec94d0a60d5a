"""Pair featurizers encoding each neural matcher's inductive bias.

Every featurizer maps a pandas batch of pairs (``l_<attr>``/``r_<attr>``
columns) to a dense float matrix over simulated-LM embeddings
(``repro.text.embeddings``). The five differ exactly where the paper
says the real systems differ (§5.3.3):

* **Ditto** serializes the whole record into one text block — structure
  blind, so cross-attribute token similarity leaks into the score.
* **DeepMatcher** (hybrid) compares attribute by attribute, plus a
  serialized summary.
* **HierMatcher** aligns tokens across attributes (attribute-aware
  attention + token alignment).
* **MCAN** mixes self-, pair-, and global-attention summaries with a
  gating feature.
* **GNEM** is one-to-set: each pair sees aggregate context of the other
  candidates sharing its left record.

All functions are top-level (picklable) so mapInPandas can ship them to
executors; embeddings are cached per process.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.em_data.meta import DatasetMeta
from repro.text import embeddings as emb

_MAX_TOKENS = 16


def _txt(v) -> str:
    if v is None:
        return ""
    if isinstance(v, float) and np.isnan(v):
        return ""
    return str(v)


def _col_texts(pdf: pd.DataFrame, col: str) -> list[str]:
    return [_txt(v) for v in pdf[col].tolist()]


def _embed(texts: list[str]) -> np.ndarray:
    return emb.embed_texts(texts)


def serialize(pdf: pd.DataFrame, meta: DatasetMeta, side: str) -> list[str]:
    """Ditto-style record serialization into one text block.

    Real Ditto emits ``COL a VAL v …`` and lets the transformer attend
    past the template tokens; with mean-pooled embeddings the constant
    template would dominate every record's vector and wash out the
    values, so the simulated serialization keeps the values only. The
    structure-blindness (all attributes merged into one bag) is what
    matters for the paper's §5.3.3 analysis, and is preserved.
    """
    parts = [
        [_txt(v) for v in pdf[f"{side}_{a.name}"].tolist()] for a in meta.attrs
    ]
    return [" ".join(p).strip() for p in zip(*parts)]


def _pair_summary(L: np.ndarray, R: np.ndarray) -> np.ndarray:
    """4 summary features per attribute: cosine, mean |Δ|, ‖Δ‖, both-empty."""
    cos = np.sum(L * R, axis=1)
    diff = L - R
    l1 = np.abs(diff).mean(axis=1)
    l2 = np.linalg.norm(diff, axis=1)
    empty = ((np.linalg.norm(L, axis=1) < 1e-9) | (np.linalg.norm(R, axis=1) < 1e-9))
    return np.stack([cos, l1, l2, empty.astype(float)], axis=1)


def _serialized_vecs(pdf: pd.DataFrame, meta: DatasetMeta) -> tuple[np.ndarray, np.ndarray]:
    return (
        _embed(serialize(pdf, meta, "l")),
        _embed(serialize(pdf, meta, "r")),
    )


def ditto_features(pdf: pd.DataFrame, meta: DatasetMeta) -> np.ndarray:
    """Structure-blind: |Δ| ⊕ Hadamard ⊕ cosine ⊕ token alignment of the
    serialized texts (alignment plays the role of token-level
    cross-attention in the real transformer — still blind to which
    attribute a token came from)."""
    L, R = _serialized_vecs(pdf, meta)
    cos = np.sum(L * R, axis=1, keepdims=True)
    l_ser, r_ser = serialize(pdf, meta, "l"), serialize(pdf, meta, "r")
    align = np.array([_align_score(x, y) for x, y in zip(l_ser, r_ser)])
    return np.concatenate([np.abs(L - R), L * R, cos, align], axis=1)


def deepmatcher_features(pdf: pd.DataFrame, meta: DatasetMeta) -> np.ndarray:
    """Attribute-aware summaries + a serialized-text summary.

    (Summaries rather than the raw |Δ| ⊕ Hadamard block: with EM's few
    positive examples a 2·DIM-dimensional block drowns the per-attribute
    signal and destabilizes training — DeepMatcher is the attribute-
    aware model; the raw block belongs to structure-blind Ditto.)"""
    per_attr = [
        _pair_summary(
            _embed(_col_texts(pdf, f"l_{a.name}")),
            _embed(_col_texts(pdf, f"r_{a.name}")),
        )
        for a in meta.attrs
    ]
    L, R = _serialized_vecs(pdf, meta)
    return np.concatenate([*per_attr, _pair_summary(L, R)], axis=1)


def _align_score(a: str, b: str) -> tuple[float, float]:
    """(mean-max cosine a→b, b→a) over token embeddings — soft alignment."""
    A = emb.token_matrix(a)[:_MAX_TOKENS]
    B = emb.token_matrix(b)[:_MAX_TOKENS]
    if len(A) == 0 or len(B) == 0:
        return 0.0, 0.0
    sims = A @ B.T
    return float(sims.max(axis=1).mean()), float(sims.max(axis=0).mean())


def hiermatcher_features(pdf: pd.DataFrame, meta: DatasetMeta) -> np.ndarray:
    """Per-attribute token alignment + length ratio + serialized cosine."""
    cols = []
    for a in meta.attrs:
        lt, rt = _col_texts(pdf, f"l_{a.name}"), _col_texts(pdf, f"r_{a.name}")
        ab = np.array([_align_score(x, y) for x, y in zip(lt, rt)])
        ratio = np.array(
            [min(len(x), len(y)) / max(len(x), len(y), 1) for x, y in zip(lt, rt)]
        ).reshape(-1, 1)
        cols.append(np.concatenate([ab, ratio], axis=1))
    L, R = _serialized_vecs(pdf, meta)
    cos = np.sum(L * R, axis=1, keepdims=True)
    return np.concatenate([*cols, cos], axis=1)


def _self_redundancy(text: str) -> float:
    """Mean pairwise token cosine within one text (self-attention proxy)."""
    M = emb.token_matrix(text)[:_MAX_TOKENS]
    if len(M) < 2:
        return 0.0
    sims = M @ M.T
    n = len(M)
    return float((sims.sum() - np.trace(sims)) / (n * (n - 1)))


def mcan_features(pdf: pd.DataFrame, meta: DatasetMeta) -> np.ndarray:
    """Self- + pair- + global-attention summaries with a gate feature."""
    per_attr_cos = []
    for a in meta.attrs:
        L = _embed(_col_texts(pdf, f"l_{a.name}"))
        R = _embed(_col_texts(pdf, f"r_{a.name}"))
        per_attr_cos.append(np.sum(L * R, axis=1, keepdims=True))
    attr_cos = np.concatenate(per_attr_cos, axis=1)
    Ls, Rs = _serialized_vecs(pdf, meta)
    global_cos = np.sum(Ls * Rs, axis=1, keepdims=True)
    l_ser, r_ser = serialize(pdf, meta, "l"), serialize(pdf, meta, "r")
    pair_align = np.array([_align_score(x, y) for x, y in zip(l_ser, r_ser)])
    self_l = np.array([_self_redundancy(t) for t in l_ser]).reshape(-1, 1)
    self_r = np.array([_self_redundancy(t) for t in r_ser]).reshape(-1, 1)
    gate = attr_cos.mean(axis=1, keepdims=True) * global_cos
    return np.concatenate(
        [attr_cos, global_cos, pair_align, self_l, self_r, gate], axis=1
    )


def _left_keys(pdf: pd.DataFrame, meta: DatasetMeta) -> pd.Series:
    key = pdf[f"l_{meta.attrs[0].name}"].map(_txt)
    for a in meta.attrs[1:]:
        key = key + "\x1f" + pdf[f"l_{a.name}"].map(_txt)
    return key


def gnem_features(pdf: pd.DataFrame, meta: DatasetMeta) -> np.ndarray:
    """One-to-set: pair summaries + candidate-set context per left record
    (mean / max / count of serialized cosine across the left record's
    candidates — the graph-propagation signal of GNEM)."""
    base_attr = [
        _pair_summary(
            _embed(_col_texts(pdf, f"l_{a.name}")),
            _embed(_col_texts(pdf, f"r_{a.name}")),
        )
        for a in meta.attrs
    ]
    L, R = _serialized_vecs(pdf, meta)
    cos = np.sum(L * R, axis=1)
    keys = _left_keys(pdf, meta)
    grp = pd.Series(cos).groupby(keys.values)
    # mean/max/relative context only: candidate-set *size* differs
    # between train and test splits and would shift the feature scale.
    ctx_mean = grp.transform("mean").to_numpy().reshape(-1, 1)
    ctx_max = grp.transform("max").to_numpy().reshape(-1, 1)
    rel = cos.reshape(-1, 1) - ctx_mean
    return np.concatenate(
        [*base_attr, cos.reshape(-1, 1), ctx_mean, ctx_max, rel], axis=1
    )


FEATURIZERS = {
    "DeepMatcher": deepmatcher_features,
    "Ditto": ditto_features,
    "GNEM": gnem_features,
    "HierMatcher": hiermatcher_features,
    "MCAN": mcan_features,
}
