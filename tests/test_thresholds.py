"""Threshold sweep and §5.3.4 sensitivity tests."""
import pytest

from repro.core import thresholds as th
from repro.core.confusion import group_confusion, overall_confusion


@pytest.mark.parametrize("counts,expected", [
    ([0, 0, 0], 0.0),
    ([1, 1, 1, 1], 0.0),
    ([0, 3, 0], (9 + 9) ** 0.5),
    ([0, 1, 2, 3], 3 ** 0.5),
    ([7], 0.0),
    ([], 0.0),
])
def test_sensitivity_l2(counts, expected):
    assert th.sensitivity(counts) == pytest.approx(expected)


@pytest.fixture(scope="module")
def scored(spark):
    rows = []
    # group a: scores spread out; group b: crisp scores
    for i in range(20):
        rows.append((["a"], ["a"], 0.5 + 0.024 * i, 1))
        rows.append((["a"], ["a"], 0.02 * i, 0))
        rows.append((["b"], ["b"], 0.99, 1))
        rows.append((["b"], ["b"], 0.01, 0))
    return spark.createDataFrame(rows, ["l_groups", "r_groups", "score", "label"])


def test_sweep_matches_single_threshold(scored):
    per_group, overall = th.sweep_confusions(scored, thresholds=(0.5, 0.7))
    # threshold index 1 (=0.7) must equal a direct confusion computation
    direct = group_confusion(scored, 0.7, "single").set_index("group")
    pg = per_group.set_index("group")
    for grp in ("a", "b"):
        for k in ("tp", "fp", "fn", "tn"):
            assert pg.loc[grp, f"{k}_1"] == direct.loc[grp, k]
    direct_o = overall_confusion(scored, 0.5)
    for k in ("tp", "fp", "fn", "tn"):
        assert overall.iloc[0][f"{k}_0"] == direct_o[k]


def test_unfair_counts_monotone_data(scored):
    per_group, overall = th.sweep_confusions(scored)
    counts = th.unfair_counts(per_group, overall, measure="TPRP")
    assert len(counts) == len(th.DEFAULT_THRESHOLDS)
    assert all(0 <= c <= 2 for c in counts)


def test_spread_scores_more_sensitive_than_crisp(spark, scored):
    # matcher with continuous scores changes unfair-set across thresholds;
    # a crisp 0/1 matcher cannot
    crisp = spark.createDataFrame(
        [(["a"], ["a"], 1.0, 1)] * 10 + [(["a"], ["a"], 0.0, 0)] * 10
        + [(["b"], ["b"], 1.0, 1)] * 10 + [(["b"], ["b"], 0.0, 0)] * 10,
        ["l_groups", "r_groups", "score", "label"],
    )
    assert th.threshold_sensitivity(crisp, measure="TPRP") == 0.0
    assert th.threshold_sensitivity(scored, measure="TPRP") >= 0.0


def test_overall_rates(scored):
    _, overall = th.sweep_confusions(scored, thresholds=(0.5,))
    (tpr,) = th.overall_rates(overall, thresholds=(0.5,), rate_kind="tpr")
    direct = overall_confusion(scored, 0.5)
    assert tpr == pytest.approx(direct["tp"] / (direct["tp"] + direct["fn"]))


def test_default_thresholds_range():
    assert th.DEFAULT_THRESHOLDS[0] == 0.5
    assert th.DEFAULT_THRESHOLDS[-1] == 0.95
    assert len(th.DEFAULT_THRESHOLDS) == 10
