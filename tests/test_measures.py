"""Unit tests for the Table 2 fairness measures (rates over confusion)."""
import math

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import measures

# One confusion profile, hand-computed rates.
CONF = dict(tp=6, fp=2, fn=3, tn=9)  # n = 20
EXPECTED = {
    "accuracy": 15 / 20,
    "match_rate": 8 / 20,
    "tpr": 6 / 9,
    "fpr": 2 / 11,
    "fnr": 3 / 9,
    "tnr": 9 / 11,
    "ppv": 6 / 8,
    "npv": 9 / 12,
    "fdr": 2 / 8,
    "for": 3 / 12,
}


@pytest.mark.parametrize("kind,expected", sorted(EXPECTED.items()))
def test_rates_hand_computed(kind, expected):
    assert measures.rate(kind, **CONF) == pytest.approx(expected)


@pytest.mark.parametrize("kind", sorted(EXPECTED))
def test_rates_nan_on_empty(kind):
    assert math.isnan(measures.rate(kind, tp=0, fp=0, fn=0, tn=0))


def test_tpr_nan_without_positives():
    assert math.isnan(measures.rate("tpr", tp=0, fp=3, fn=0, tn=5))


def test_ppv_nan_without_predicted_matches():
    assert math.isnan(measures.rate("ppv", tp=0, fp=0, fn=2, tn=5))


def test_unknown_rate_raises():
    with pytest.raises(ValueError):
        measures.rate("nope", **CONF)


def test_all_eleven_measures_present():
    assert set(measures.ALL_MEASURES) == {
        "AP", "SP", "TPRP", "FPRP", "FNRP", "TNRP", "EO", "PPVP", "NPVP",
        "FDRP", "FORP",
    }


@pytest.mark.parametrize("name,kind,hb", [
    ("AP", "accuracy", True), ("SP", "match_rate", True),
    ("TPRP", "tpr", True), ("FPRP", "fpr", False), ("FNRP", "fnr", False),
    ("TNRP", "tnr", True), ("PPVP", "ppv", True), ("NPVP", "npv", True),
    ("FDRP", "fdr", False), ("FORP", "for", False),
])
def test_measure_directions(name, kind, hb):
    m = measures.MEASURES[name]
    assert m.rate_kind == kind and m.higher_better is hb


def test_eo_is_composite():
    assert measures.MEASURES["EO"].rate_kind == ""


def test_tp_fn_based_footnote():
    # footnote-1 measures of Table 2 (inapplicable for disjoint pairwise groups)
    assert measures.TP_FN_BASED == {"TPRP", "FNRP", "EO", "PPVP", "NPVP",
                                    "FDRP", "FORP"}


@given(st.integers(0, 100), st.integers(0, 100), st.integers(0, 100),
       st.integers(0, 100))
@settings(max_examples=60, deadline=None)
def test_complementary_rates(tp, fp, fn, tn):
    conf = dict(tp=tp, fp=fp, fn=fn, tn=tn)
    if tp + fn > 0:
        assert measures.rate("tpr", **conf) + measures.rate("fnr", **conf) == pytest.approx(1.0)
    if fp + tn > 0:
        assert measures.rate("fpr", **conf) + measures.rate("tnr", **conf) == pytest.approx(1.0)
    if tp + fp > 0:
        assert measures.rate("ppv", **conf) + measures.rate("fdr", **conf) == pytest.approx(1.0)
    if tn + fn > 0:
        assert measures.rate("npv", **conf) + measures.rate("for", **conf) == pytest.approx(1.0)
