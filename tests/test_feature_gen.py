"""Tests for Magellan-style automatic feature generation."""
import pytest

from repro.em_data.meta import AttrSpec
from repro.features import add_features, feature_names

ATTRS = (
    AttrSpec("name", "short_str"),
    AttrSpec("title", "long_str"),
    AttrSpec("year", "numeric"),
)


def test_feature_names_by_kind():
    names = feature_names(ATTRS)
    assert "f_name_exact" in names and "f_name_lev" in names
    assert {"f_title_jac_w", "f_title_jac_q3", "f_title_cos", "f_title_me",
            "f_title_lev"} <= set(names)
    assert "f_year_exact" in names and "f_year_numsim" in names
    # 2 + 5 + 2 features
    assert len(names) == 9


def test_feature_names_order_is_stable():
    assert feature_names(ATTRS) == feature_names(ATTRS)


@pytest.fixture(scope="module")
def featurized(spark):
    df = spark.createDataFrame(
        [
            ("anna", "anna", "data cleaning at scale", "data cleaning at scale", 2001, 2001),
            ("anna", "annb", "data cleaning", "stream processing", 2001, 2002),
            (None, "bob", None, "x", None, 5),
        ],
        ["l_name", "r_name", "l_title", "r_title", "l_year", "r_year"],
    )
    return add_features(df, ATTRS).collect()


def test_identical_pair_features(featurized):
    row = featurized[0]
    assert row["f_name_exact"] == 1.0
    assert row["f_name_lev"] == 1.0
    assert row["f_title_jac_w"] == 1.0
    assert row["f_year_exact"] == 1.0
    assert row["f_year_numsim"] == pytest.approx(1.0)


def test_different_pair_features(featurized):
    row = featurized[1]
    assert row["f_name_exact"] == 0.0
    assert row["f_name_lev"] == pytest.approx(0.75)
    assert row["f_title_jac_w"] == 0.0
    assert row["f_year_exact"] == 0.0
    assert row["f_year_numsim"] == pytest.approx(1 - 1 / 2002)


def test_null_pair_features_are_zero(featurized):
    row = featurized[2]
    assert row["f_name_exact"] == 0.0
    assert row["f_name_lev"] == 0.0
    assert row["f_title_jac_w"] == 0.0
    assert row["f_year_numsim"] == 0.0


def test_vector_column(featurized):
    row = featurized[0]
    assert len(row["features"]) == 9


def test_vector_matches_scalar_columns(featurized):
    names = feature_names(ATTRS)
    for row in featurized:
        vec = list(row["features"])
        for i, n in enumerate(names):
            assert vec[i] == pytest.approx(row[n])
