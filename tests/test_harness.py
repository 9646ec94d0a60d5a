"""Harness and table-builder tests at unit scale with small matcher sets."""
import math

import pytest

from repro import harness as H


@pytest.fixture(scope="module")
def h(spark):
    hh = H.Harness(spark, scale="unit", neural_epochs=6)
    yield hh
    hh.unpersist()


def test_dataset_registry_covers_table4():
    assert set(H.DATASETS) == {
        "NoFlyCompas", "FacultyMatch", "iTunes-Amazon", "DBLP-ACM",
        "DBLP-Scholar", "Cricket", "Shoes", "Cameras",
    }


def test_dataset_cached_identity(h):
    a, _ = h.dataset("DBLP-ACM")
    b, _ = h.dataset("DBLP-ACM")
    assert a is b


def test_scored_cached(h):
    a = h.scored("DBLP-ACM", "DTMatcher")
    b = h.scored("DBLP-ACM", "DTMatcher")
    assert a is b


def test_applicable_dedupe(h):
    assert h.applicable("DBLP-ACM", "Dedupe")
    assert not h.applicable("Shoes", "Dedupe")
    assert h.applicable("Shoes", "DTMatcher")


def test_table4_shape(h):
    t4 = H.table4(h)
    assert len(t4) == 8
    assert list(t4["Name"]) == list(H.DATASETS)
    assert (t4["Train"] > 0).all() and (t4["Test"] > 0).all()
    assert (t4["% Pos."] > 0).all()
    row = t4.set_index("Name").loc["Cricket"]
    assert row["Sens. Attr."] == "batting style".replace(" ", "_") or \
        row["Sens. Attr."] == "batting_style"


def test_table4_positive_rates_shapewise(h):
    t4 = H.table4(h).set_index("Name")
    # social datasets are extremely imbalanced; Cricket is match-heavy
    assert t4.loc["NoFlyCompas", "% Pos."] < 5
    assert t4.loc["FacultyMatch", "% Pos."] < 5
    assert t4.loc["Cricket", "% Pos."] > 90


def test_social_table_structure(h):
    t = H._social_table(
        h, "NoFlyCompas",
        disadvantaged="African-American", advantaged="Caucasian",
        rate_a=("TPR", "tpr", True), rate_b=("FDR", "fdr", False),
        matchers=("DTMatcher",),
    )
    assert list(t.columns) == [
        "Matcher",
        "TPR African-American", "TPR Caucasian", "TPR sub", "TPR div",
        "FDR African-American", "FDR Caucasian", "FDR sub", "FDR div",
    ]
    assert len(t) == 1


def test_between_disparity_directions():
    sub, div = H._between(0.5, 0.75, higher_better=True)
    assert sub == pytest.approx(0.25)
    assert div == pytest.approx(0.5)
    sub, div = H._between(0.2, 0.1, higher_better=False)  # FDR-style
    assert sub == pytest.approx(0.1)
    assert div == pytest.approx(1.0)
    sub, div = H._between(math.nan, 0.5, higher_better=True)
    assert math.isnan(sub) and math.isnan(div)


def test_table7_structure(h):
    t7 = H.table7(h, matchers=("DTMatcher",), datasets=("DBLP-ACM",))
    assert set(t7["Measure"]) == {"TPRP", "PPVP"}
    assert (t7["DTMatcher"] >= 0).all()


def test_table9_subset(h):
    t9 = H.table9(h, matchers=("DTMatcher", "Dedupe"),
                  datasets=("DBLP-ACM", "Shoes"))
    t9 = t9.set_index("Matcher")
    assert t9.loc["Dedupe", "Shoes Acc"] == "-"  # did not scale
    assert 0.0 <= t9.loc["DTMatcher", "DBLP-ACM Acc"] <= 1.0
    assert 0.0 <= t9.loc["DTMatcher", "DBLP-ACM F1"] <= 1.0


def test_acc_f1_hand_check(spark):
    df = spark.createDataFrame(
        [(["a"], ["a"], 0.9, 1)] * 3      # 3 TP
        + [(["a"], ["a"], 0.9, 0)] * 1    # 1 FP
        + [(["a"], ["a"], 0.1, 1)] * 2    # 2 FN
        + [(["a"], ["a"], 0.1, 0)] * 4,   # 4 TN
        ["l_groups", "r_groups", "score", "label"],
    )
    acc, f1 = H._acc_f1(df, 0.5)
    assert acc == pytest.approx(7 / 10)
    assert f1 == pytest.approx(2 * 3 / (2 * 3 + 1 + 2))


def test_synergies_subset(h):
    out = H.synergies(h, datasets=("DBLP-ACM",), matchers=("DTMatcher",))
    assert set(out.columns) == {
        "Dataset", "Matcher", "Accurate", "Fair", "Unfair measures"
    }
    assert len(out) == 1
