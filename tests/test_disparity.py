"""Unit tests for §3.6 disparity (Eqs. 1–4) and the 20% rule."""
import math

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import disparity as D


def test_eq1_subtraction_higher_better():
    # paper Eq. 2: overall accuracy 0.9, group 0.7 -> disparity 0.2
    assert D.signed_disparity(0.9, 0.7, higher_better=True) == pytest.approx(0.2)


def test_eq4_subtraction_lower_better():
    # FNR: group worse (higher) than overall -> positive disparity
    assert D.signed_disparity(0.1, 0.3, higher_better=False) == pytest.approx(0.2)


def test_eq3_division_higher_better():
    assert D.signed_disparity(0.8, 0.4, higher_better=True, op="div") == pytest.approx(0.5)


def test_eq3_division_lower_better_swaps():
    # FDR-style: overall 0.2, group 0.4 -> 1 - 0.2/0.4 = 0.5
    assert D.signed_disparity(0.2, 0.4, higher_better=False, op="div") == pytest.approx(0.5)


def test_negative_disparity_means_group_better():
    assert D.signed_disparity(0.8, 0.9, higher_better=True) == pytest.approx(-0.1)
    assert D.clamped_disparity(0.8, 0.9, higher_better=True) == 0.0


def test_group_better_is_never_unfair():
    # §3.6: a group doing better than average is not unfairness
    assert not D.is_unfair(0.5, 0.99, higher_better=True)
    assert not D.is_unfair(0.5, 0.01, higher_better=False)


@pytest.mark.parametrize("overall,group,unfair", [
    (0.9, 0.69, True),   # disparity 0.21 > 0.2
    (0.9, 0.71, False),  # disparity 0.19 <= 0.2
    (0.9, 0.70, False),  # exactly 0.2 is tolerated (strict >)
])
def test_twenty_percent_rule(overall, group, unfair):
    assert D.is_unfair(overall, group, higher_better=True) is unfair


def test_nan_propagates_and_is_fair():
    assert math.isnan(D.signed_disparity(math.nan, 0.5, higher_better=True))
    assert math.isnan(D.signed_disparity(0.5, math.nan, higher_better=True))
    assert not D.is_unfair(math.nan, 0.5, higher_better=True)


def test_division_by_zero_overall():
    assert math.isnan(D.signed_disparity(0.0, 0.5, higher_better=True, op="div"))


def test_division_by_zero_group_lower_better():
    assert math.isnan(D.signed_disparity(0.5, 0.0, higher_better=False, op="div"))


def test_unknown_op_raises():
    with pytest.raises(ValueError):
        D.signed_disparity(0.5, 0.5, higher_better=True, op="mul")


@given(st.floats(0.01, 1.0), st.floats(0.0, 1.0))
@settings(max_examples=80, deadline=None)
def test_sub_div_agree_on_sign(overall, group):
    s = D.signed_disparity(overall, group, higher_better=True, op="sub")
    d = D.signed_disparity(overall, group, higher_better=True, op="div")
    assert (s > 0) == (d > 0) or s == pytest.approx(0.0)


@given(st.floats(0.0, 1.0), st.floats(0.0, 1.0), st.booleans())
@settings(max_examples=80, deadline=None)
def test_clamped_nonnegative(overall, group, hb):
    c = D.clamped_disparity(overall, group, higher_better=hb)
    assert c >= 0.0
