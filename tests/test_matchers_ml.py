"""Tests for the Spark-ML non-neural matchers and the rule-based matcher."""
import pytest
from pyspark.sql import functions as F

from repro.em_data.pairs import test_split, train_split
from repro.em_data.social import faculty_match
from repro.matchers import NON_NEURAL, make_matcher
from repro.matchers.ml import FACTORIES

ML_NAMES = sorted(FACTORIES)


@pytest.fixture(scope="module")
def faculty(spark):
    pairs, meta = faculty_match(spark, n_cn=40, n_de=30, seed=5)
    return pairs.cache(), meta


@pytest.fixture(scope="module")
def fitted(faculty):
    """Fit all six ML matchers once on the same train split."""
    pairs, meta = faculty
    out = {}
    for name in ML_NAMES:
        m = make_matcher(name, meta).fit(train_split(pairs))
        out[name] = m.score(test_split(pairs)).cache()
    return out


@pytest.mark.parametrize("name", ML_NAMES)
def test_score_in_unit_interval(fitted, name):
    stats = fitted[name].agg(
        F.min("score").alias("lo"), F.max("score").alias("hi")
    ).collect()[0]
    assert 0.0 <= stats["lo"] <= stats["hi"] <= 1.0


@pytest.mark.parametrize("name", ML_NAMES)
def test_separates_matches_from_non_matches(fitted, name):
    means = (
        fitted[name].groupBy("label").agg(F.avg("score").alias("m")).collect()
    )
    by_label = {r["label"]: r["m"] for r in means}
    assert by_label[1] > by_label[0]


@pytest.mark.parametrize("name", ML_NAMES)
def test_columns_preserved(faculty, fitted, name):
    pairs, _ = faculty
    assert set(fitted[name].columns) == set(pairs.columns) | {"score"}


@pytest.mark.parametrize("name", ML_NAMES)
def test_score_before_fit_raises(faculty, name):
    pairs, meta = faculty
    with pytest.raises(RuntimeError):
        make_matcher(name, meta).score(pairs)


def test_non_neural_registry():
    assert set(ML_NAMES) <= set(NON_NEURAL)


def test_unknown_matcher_raises(faculty):
    _, meta = faculty
    with pytest.raises(KeyError):
        make_matcher("GPTMatcher", meta)


def test_dt_is_nearly_perfect_on_nofly(spark):
    # §5.2.1: all non-neural matchers had perfect predictions on
    # NoFlyCompas — crisp Levenshtein features separate the classes.
    from repro.core.confusion import overall_confusion
    from repro.em_data.social import nofly_compas

    pairs, meta = nofly_compas(
        spark, n_nofly=60, n_passengers=150, n_overlap=40, seed=11
    )
    m = make_matcher("DTMatcher", meta).fit(train_split(pairs))
    conf = overall_confusion(m.score(test_split(pairs)), 0.5)
    errors = conf["fp"] + conf["fn"]
    assert errors <= 0.02 * sum(conf.values())


# ------------------------------------------------------------- rule-based
def test_rule_matcher_is_conjunction(spark, faculty):
    pairs, meta = faculty
    m = make_matcher("BooleanRuleMatcher", meta).fit(pairs)
    scored = m.score(pairs.limit(50))
    from repro.text import similarity as sim

    expected = scored.withColumn(
        "expected",
        F.least(
            sim.levenshtein_sim("l_fullName", "r_fullName"),
            sim.levenshtein_sim("l_country", "r_country"),
        ),
    )
    bad = expected.filter(
        F.abs(F.col("score") - F.col("expected")) > 1e-9
    ).count()
    assert bad == 0


def test_rule_matcher_no_training_needed(faculty):
    pairs, meta = faculty
    m = make_matcher("BooleanRuleMatcher", meta)
    assert m.fit(pairs) is m
    assert "score" in m.score(pairs.limit(5)).columns
