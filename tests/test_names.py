"""Unit tests for the social name pools and perturbation."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.em_data import names


def test_chinese_name_structure():
    g = np.random.default_rng(0)
    for _ in range(50):
        n = names.chinese_full_name(g)
        assert n.split()[-1] in names.PINYIN_SURNAMES
        assert 2 <= len(n.split()) <= 3


def test_chinese_names_have_high_collision_rate():
    # small syllable inventory -> many near-identical transcriptions
    g = np.random.default_rng(1)
    surnames = [names.chinese_full_name(g).split()[-1] for _ in range(300)]
    assert len(set(surnames)) <= len(names.PINYIN_SURNAMES)


def test_german_name_structure():
    g = np.random.default_rng(2)
    n = names.german_full_name(g)
    first, last = n.split()
    assert first in names.GERMAN_FIRST and last in names.GERMAN_LAST


def test_us_name_black_pool_concentration():
    g = np.random.default_rng(3)
    afr = [names.us_name(g, "African-American")[1] for _ in range(500)]
    cauc = [names.us_name(g, "Caucasian")[1] for _ in range(500)]
    frac_afr = np.mean([s in names.SURNAMES_COMMON for s in afr])
    frac_cauc = np.mean([s in names.SURNAMES_COMMON for s in cauc])
    # over-concentration of common surnames in the Black group (§5.2.1)
    assert frac_afr > 0.7 > 0.3 > frac_cauc


def test_perturb_changes_length_by_at_most_one():
    g = np.random.default_rng(4)
    for _ in range(100):
        s = "Jennifer"
        p = names.perturb(s, g)
        assert abs(len(p) - len(s)) <= 1


def test_perturb_empty_is_noop():
    g = np.random.default_rng(5)
    assert names.perturb("", g) == ""


@given(st.text(alphabet="abcdefgh", min_size=1, max_size=15),
       st.integers(min_value=0, max_value=1000))
@settings(max_examples=60, deadline=None)
def test_perturb_edit_distance_at_most_one(s, seed):
    from repro.text.similarity import _lev

    g = np.random.default_rng(seed)
    assert _lev(s, names.perturb(s, g)) <= 1


def test_perturb_deterministic_in_generator_state():
    a = names.perturb("Margaret", np.random.default_rng(9))
    b = names.perturb("Margaret", np.random.default_rng(9))
    assert a == b


@pytest.mark.parametrize("pool", [names.PINYIN_SURNAMES, names.PINYIN_SYLLABLES,
                                  names.GERMAN_FIRST, names.GERMAN_LAST,
                                  names.US_FIRST, names.SURNAMES_COMMON,
                                  names.SURNAMES_VARIED])
def test_pools_nonempty_and_unique(pool):
    assert len(pool) == len(set(pool)) > 0


def test_common_pool_smaller_than_varied():
    assert len(names.SURNAMES_COMMON) < len(names.SURNAMES_VARIED)
