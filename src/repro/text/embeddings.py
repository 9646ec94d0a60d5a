"""Simulated pre-trained word embeddings (fastText / DistilBERT stand-in).

The paper's neural matchers consume pre-trained embeddings or language
models (fastText for DeepMatcher/HierMatcher/MCAN, DistilBERT for Ditto).
The container has no torch and no network, so this module provides a
deterministic *simulated LM* whose failure modes mirror the ones the
paper attributes to real pre-trained models (§5.3.3):

* **Subword composition** — a word's vector is the normalized sum of
  hashed character-trigram vectors (fastText-style), so typos and close
  spellings land near each other.
* **Semantic smoothing** — a small synonym lexicon collapses
  semantically close words onto one canonical form before hashing,
  reproducing the paper's *"Likes Me" / "Loves Me"* and
  *"efficient" / "effective"* false-positive traps.
* **English-centric coverage** — words in a (generator-known) foreign
  vocabulary get high-variance noise vectors, reproducing the paper's
  poor-Dutch-coverage false negative on CAMERAS (*Prices* vs *Prijzen*).

Everything is seeded by stable hashes (md5), so embeddings are identical
across processes/executors — a requirement for mapInPandas scoring.
"""
from __future__ import annotations

import hashlib
from functools import lru_cache

import numpy as np

DIM = 64

#: Semantic smoothing: surface form -> canonical form. Mirrors the
#: paper's examples of embedding-space collisions.
SYNONYMS = {
    "loves": "likes",
    "love": "like",
    "wants": "likes",
    "effective": "efficient",
    "effectively": "efficiently",
    "colour": "color",
    "grey": "gray",
    "mens": "men",
    "womens": "women",
    "sneaker": "shoe",
    "sneakers": "shoes",
    "trainer": "shoe",
    "trainers": "shoes",
    "ft": "feat",
    "featuring": "feat",
    # marketplace abbreviations a pre-trained LM resolves but an
    # edit-distance feature cannot
    "blk": "black",
    "wht": "white",
    "gry": "gray",  # same canonical form as "grey" -> "gray"
    "nvy": "navy",
    "grn": "green",
    "blu": "blue",
    "auth": "authentic",
}

#: Simulated out-of-coverage vocabulary: the pre-trained model "has not
#: seen" these (Dutch/German) words, so their vectors are noise. The
#: CAMERAS generator uses exactly these tokens for its @nl records.
OOV_WORDS = frozenset(
    {
        "prijzen", "zwart", "wit", "zilver", "goedkoopste", "aanbieding",
        "vergelijk", "beoordelingen", "kopen", "tweakers", "digitale",
        "spiegelreflexcamera", "systeemcamera", "preisvergleich",
        "guenstig", "angebote", "schwarz", "kaufen", "bewertungen",
    }
)


def _stable_seed(s: str) -> int:
    return int.from_bytes(hashlib.md5(s.encode()).digest()[:8], "little")


@lru_cache(maxsize=200_000)
def _ngram_vec(ngram: str) -> np.ndarray:
    g = np.random.default_rng(_stable_seed("ng:" + ngram))
    v = g.standard_normal(DIM)
    v.flags.writeable = False
    return v


def _normalize_word(w: str) -> str:
    w = "".join(ch for ch in w.lower() if ch.isalnum())
    return SYNONYMS.get(w, w)


@lru_cache(maxsize=500_000)
def word_vector(word: str) -> np.ndarray:
    """Embedding of one word; zero vector for empty/punctuation-only."""
    w = _normalize_word(word)
    if not w:
        return np.zeros(DIM)
    if w in OOV_WORDS:
        # Out-of-coverage: per-word random direction, unrelated to any
        # translation or near-spelling — simulated missing coverage.
        g = np.random.default_rng(_stable_seed("oov:" + w))
        v = g.standard_normal(DIM) * 2.0
    else:
        padded = f"<{w}>"
        grams = (
            [padded[i : i + 3] for i in range(len(padded) - 2)]
            if len(padded) >= 3
            else [padded]
        )
        v = np.sum([_ngram_vec(ng) for ng in grams], axis=0)
    n = np.linalg.norm(v)
    out = v / n if n > 0 else v
    out.flags.writeable = False
    return out


def tokenize(text: str) -> list[str]:
    out, cur = [], []
    for ch in (text or "").lower():
        if ch.isalnum():
            cur.append(ch)
        elif cur:
            out.append("".join(cur))
            cur = []
    if cur:
        out.append("".join(cur))
    return out


def text_vector(text: str) -> np.ndarray:
    """Mean word vector of a text; zero vector for empty text."""
    toks = tokenize(text)
    if not toks:
        return np.zeros(DIM)
    v = np.mean([word_vector(t) for t in toks], axis=0)
    n = np.linalg.norm(v)
    return v / n if n > 0 else v


def token_matrix(text: str) -> np.ndarray:
    """(n_tokens, DIM) matrix of word vectors; (0, DIM) when empty."""
    toks = tokenize(text)
    if not toks:
        return np.zeros((0, DIM))
    return np.stack([word_vector(t) for t in toks])


def embed_texts(texts) -> np.ndarray:
    """(n, DIM) matrix of text vectors for an iterable of strings."""
    return np.stack([text_vector(t if isinstance(t, str) else "") for t in texts])
