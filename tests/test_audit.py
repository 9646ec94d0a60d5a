"""Audit (Algorithm 1) tests on hand-crafted scored pairs."""
import math

import pytest

from repro.core.audit import audit, discriminated_groups, run_algorithm1


@pytest.fixture(scope="module")
def crafted(spark):
    """Two groups: 'maj' gets perfect predictions, 'min' gets half its
    true matches missed -> TPRP unfairness for 'min'."""
    rows = []
    # maj: 10 TP, 10 TN
    rows += [(["maj"], ["maj"], 0.9, 1)] * 10
    rows += [(["maj"], ["maj"], 0.1, 0)] * 10
    # min: 2 TP, 6 FN, 10 TN
    rows += [(["min"], ["min"], 0.9, 1)] * 2
    rows += [(["min"], ["min"], 0.1, 1)] * 6
    rows += [(["min"], ["min"], 0.1, 0)] * 10
    return spark.createDataFrame(
        rows, ["l_groups", "r_groups", "score", "label"]
    )


def test_audit_shape(crafted):
    out = audit(crafted, threshold=0.5)
    assert set(out.columns) == {
        "group", "measure", "group_value", "overall_value", "disparity", "unfair"
    }
    # 2 groups x 11 measures
    assert len(out) == 22


def test_audit_tpr_values(crafted):
    out = audit(crafted, threshold=0.5)
    row = out[(out.group == "min") & (out.measure == "TPRP")].iloc[0]
    assert row.group_value == pytest.approx(2 / 8)
    assert row.overall_value == pytest.approx(12 / 18)
    assert row.disparity == pytest.approx(12 / 18 - 2 / 8)
    assert bool(row.unfair)


def test_audit_majority_not_unfair(crafted):
    out = audit(crafted, threshold=0.5)
    maj = out[out.group == "maj"]
    assert not maj.unfair.any()


def test_discriminated_groups(crafted):
    out = audit(crafted, threshold=0.5)
    assert discriminated_groups(out, "TPRP") == ["min"]
    assert discriminated_groups(out, "FPRP") == []


def test_eo_unfair_iff_tprp_or_fprp(crafted):
    out = audit(crafted, threshold=0.5)
    for grp in ("maj", "min"):
        sel = out[out.group == grp].set_index("measure")
        assert bool(sel.loc["EO", "unfair"]) == (
            bool(sel.loc["TPRP", "unfair"]) or bool(sel.loc["FPRP", "unfair"])
        )


def test_division_disparity_op(crafted):
    out = audit(crafted, threshold=0.5, op="div")
    row = out[(out.group == "min") & (out.measure == "TPRP")].iloc[0]
    assert row.disparity == pytest.approx(1 - (2 / 8) / (12 / 18))


def test_audit_confusion_attrs(crafted):
    out = audit(crafted, threshold=0.5)
    assert out.attrs["overall_confusion"] == dict(tp=12, fp=0, fn=6, tn=20)
    gc = out.attrs["group_confusion"].set_index("group")
    assert gc.loc["min", "fn"] == 6


def test_min_legitimate_filters_groups(spark):
    df = spark.createDataFrame(
        [(["big"], ["big"], 0.9, 1)] * 10 + [(["tiny"], ["tiny"], 0.1, 1)],
        ["l_groups", "r_groups", "score", "label"],
    )
    out = audit(df, threshold=0.5, min_legitimate=5)
    assert set(out.group) == {"big"}


def test_pairwise_mode_nonoverlapping_groups_tp_measures_nan(spark):
    # disjoint groups never truly match -> TP/FN-based measures are NaN
    rows = [(["x"], ["y"], 0.9, 0)] * 5 + [(["x"], ["x"], 0.9, 1)] * 5
    df = spark.createDataFrame(rows, ["l_groups", "r_groups", "score", "label"])
    out = audit(df, threshold=0.5, mode="pairwise")
    xy = out[(out.group == "x|y")].set_index("measure")
    assert math.isnan(xy.loc["TPRP", "group_value"])
    assert not bool(xy.loc["TPRP", "unfair"])


def test_run_algorithm1_end_to_end(spark):
    from repro.em_data.social import faculty_match
    from repro.matchers import make_matcher

    pairs, meta = faculty_match(spark, n_cn=30, n_de=20)
    res = run_algorithm1(pairs, make_matcher("DTMatcher", meta))
    assert set(res.g_single) == set(res.g_pairwise)
    assert {"cn", "de"} >= set(res.single.group.unique())
    assert len(res.pairwise.group.unique()) <= 3  # cn|cn, cn|de, de|de
