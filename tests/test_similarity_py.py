"""Unit tests for the python-side similarity primitives."""
import math

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.text.similarity import (
    _lev,
    _tok,
    cosine_hash_py,
    lev_sim_py,
    monge_elkan_py,
)


@pytest.mark.parametrize(
    "a,b,expected",
    [
        ("", "", 0),
        ("a", "", 1),
        ("", "abc", 3),
        ("abc", "abc", 0),
        ("kitten", "sitting", 3),
        ("flaw", "lawn", 2),
        ("abc", "abd", 1),
        ("ab", "ba", 2),
        ("book", "back", 2),
        ("abcdef", "azcdef", 1),
    ],
)
def test_lev_distance(a, b, expected):
    assert _lev(a, b) == expected


@pytest.mark.parametrize(
    "a,b,expected",
    [
        ("abc", "abc", 1.0),
        ("abc", "abd", 1 - 1 / 3),
        ("", "", 0.0),
        ("ABC", "abc", 1.0),  # case-insensitive
        ("a", "b", 0.0),
    ],
)
def test_lev_sim(a, b, expected):
    assert lev_sim_py(a, b) == pytest.approx(expected)


@given(st.text(max_size=20), st.text(max_size=20))
@settings(max_examples=60, deadline=None)
def test_lev_sim_properties(a, b):
    s = lev_sim_py(a, b)
    assert 0.0 <= s <= 1.0
    assert lev_sim_py(b, a) == pytest.approx(s)  # symmetric
    if a and a == b:
        assert s == 1.0


@pytest.mark.parametrize(
    "text,tokens",
    [
        ("Hello World", ["hello", "world"]),
        ("a-b c!", ["a", "b", "c"]),
        ("", []),
        ("  spaced   out ", ["spaced", "out"]),
        ("123 abc", ["123", "abc"]),
        ("don't", ["don", "t"]),
    ],
)
def test_tokenizer(text, tokens):
    assert _tok(text) == tokens


def test_monge_elkan_identical():
    assert monge_elkan_py("jennifer widom", "jennifer widom") == 1.0


def test_monge_elkan_token_reorder_insensitive():
    # each left token finds its best right token regardless of order
    assert monge_elkan_py("widom jennifer", "jennifer widom") == 1.0


def test_monge_elkan_partial():
    v = monge_elkan_py("jennifer widom", "jennifer smith")
    assert 0.5 < v < 1.0


@pytest.mark.parametrize("a,b", [("", ""), ("abc", ""), ("", "abc")])
def test_monge_elkan_empty(a, b):
    assert monge_elkan_py(a, b) == 0.0


def test_cosine_hash_identical():
    assert cosine_hash_py("data base systems", "data base systems") == pytest.approx(1.0)


def test_cosine_hash_disjoint_is_low():
    assert cosine_hash_py("aaa bbb", "ccc ddd") <= 0.5


def test_cosine_hash_empty():
    assert cosine_hash_py("", "anything") == 0.0


@given(st.text(max_size=30), st.text(max_size=30))
@settings(max_examples=40, deadline=None)
def test_cosine_hash_bounds_and_symmetry(a, b):
    v = cosine_hash_py(a, b)
    assert 0.0 <= v <= 1.0 + 1e-9
    assert cosine_hash_py(b, a) == pytest.approx(v)


@given(st.text(max_size=25))
@settings(max_examples=40, deadline=None)
def test_monge_elkan_self_is_one_or_empty(a):
    v = monge_elkan_py(a, a)
    assert v == pytest.approx(1.0) or v == 0.0
