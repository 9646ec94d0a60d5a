"""Unit tests for the simulated-LM embedding substrate."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.text import embeddings as emb


def test_dimensions():
    assert emb.word_vector("huang").shape == (emb.DIM,)
    assert emb.text_vector("qing ming huang").shape == (emb.DIM,)
    assert emb.token_matrix("a b c").shape == (3, emb.DIM)
    assert emb.token_matrix("").shape == (0, emb.DIM)


def test_determinism():
    a = emb.word_vector("stonebraker")
    b = emb.word_vector("stonebraker")
    np.testing.assert_array_equal(a, b)


def test_unit_norm():
    assert np.linalg.norm(emb.word_vector("database")) == pytest.approx(1.0)


def test_empty_word_is_zero():
    assert np.linalg.norm(emb.word_vector("")) == 0.0
    assert np.linalg.norm(emb.word_vector("!!!")) == 0.0


@pytest.mark.parametrize("a,b", [("likes", "loves"), ("efficient", "effective"),
                                 ("mens", "men"), ("ft", "featuring")])
def test_semantic_smoothing_collides(a, b):
    # synonym lexicon: near-identical vectors (the paper's LM-collision traps)
    assert float(emb.word_vector(a) @ emb.word_vector(b)) == pytest.approx(1.0)


@pytest.mark.parametrize("a,b,lo", [("brown", "browne", 0.5),
                                    ("linlin", "linlim", 0.5),
                                    ("qingming", "qinghu", 0.3)])
def test_subword_composition_close_spellings(a, b, lo):
    # char-trigram composition: typos/close spellings stay similar
    assert float(emb.word_vector(a) @ emb.word_vector(b)) > lo


def test_unrelated_words_far():
    assert abs(float(emb.word_vector("guitar") @ emb.word_vector("warehouse"))) < 0.5


@pytest.mark.parametrize("word", ["prijzen", "zwart", "goedkoopste", "tweakers"])
def test_oov_words_unrelated_to_translations(word):
    # simulated poor coverage: Dutch tokens don't land near English ones
    for en in ("prices", "black", "cheapest"):
        assert abs(float(emb.word_vector(word) @ emb.word_vector(en))) < 0.4


def test_text_vector_order_insensitive():
    a = emb.text_vector("james brown")
    b = emb.text_vector("brown james")
    assert float(a @ b) == pytest.approx(1.0)


def test_embed_texts_batch():
    out = emb.embed_texts(["a b", "", None, "qing huang"])
    assert out.shape == (4, emb.DIM)
    assert np.linalg.norm(out[1]) == 0.0
    assert np.linalg.norm(out[2]) == 0.0


@given(st.text(alphabet=st.characters(min_codepoint=97, max_codepoint=122),
               min_size=1, max_size=12))
@settings(max_examples=40, deadline=None)
def test_word_vector_norm_is_unit(w):
    n = np.linalg.norm(emb.word_vector(w))
    assert n == pytest.approx(1.0) or n == 0.0


def test_tokenize():
    assert emb.tokenize("Sony Cyber-shot RX100@en") == ["sony", "cyber", "shot",
                                                        "rx100", "en"]
