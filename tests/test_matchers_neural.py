"""Tests for the five simulated neural matchers."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.em_data.pairs import test_split, train_split
from repro.em_data.social import FACULTY_META, faculty_match
from repro.matchers import NEURAL, make_matcher
from repro.matchers.neural import featurize as FZ

NAMES = sorted(NEURAL)


@pytest.fixture(scope="module")
def faculty(spark):
    pairs, meta = faculty_match(spark, n_cn=40, n_de=30, seed=5)
    return pairs.cache(), meta


@pytest.fixture(scope="module")
def fitted(faculty):
    pairs, meta = faculty
    out = {}
    for name in NAMES:
        m = make_matcher(name, meta, seed=1)
        m.epochs = 8
        m.fit(train_split(pairs))
        out[name] = m.score(test_split(pairs)).cache()
    return out


@pytest.mark.parametrize("name", NAMES)
def test_score_in_unit_interval(fitted, name):
    stats = fitted[name].agg(
        F.min("score").alias("lo"), F.max("score").alias("hi")
    ).collect()[0]
    assert 0.0 <= stats["lo"] <= stats["hi"] <= 1.0


@pytest.mark.parametrize("name", NAMES)
def test_separates_classes_on_average(fitted, name):
    means = (
        fitted[name].groupBy("label").agg(F.avg("score").alias("m")).collect()
    )
    by_label = {r["label"]: r["m"] for r in means}
    assert by_label[1] > by_label[0] + 0.1


@pytest.mark.parametrize("name", NAMES)
def test_columns_preserved(faculty, fitted, name):
    pairs, _ = faculty
    assert set(fitted[name].columns) == set(pairs.columns) | {"score"}


@pytest.mark.parametrize("name", NAMES)
def test_score_before_fit_raises(faculty, name):
    pairs, meta = faculty
    with pytest.raises(RuntimeError):
        make_matcher(name, meta).score(pairs)


def test_deterministic_given_seed(faculty):
    pairs, meta = faculty
    def run():
        m = make_matcher("Ditto", meta, seed=3)
        m.epochs = 4
        m.fit(train_split(pairs))
        return (
            m.score(test_split(pairs))
            .select("pair_id", "score")
            .toPandas()
            .sort_values("pair_id")["score"]
            .to_numpy()
        )
    np.testing.assert_allclose(run(), run(), atol=1e-9)


# --------------------------------------------------------- featurizers
_PDF = pd.DataFrame(
    {
        "l_fullName": ["Qingming Huang", "LinLin Shen", "Hans Gruber"],
        "r_fullName": ["Qing-Hu Huang", "Linlin phen", "Franz Gruber"],
        "l_country": ["cn", "cn", "de"],
        "r_country": ["cn", "cn", "de"],
    }
)


@pytest.mark.parametrize("name", NAMES)
def test_featurizer_shapes(name):
    X = FZ.FEATURIZERS[name](_PDF, FACULTY_META)
    assert X.shape[0] == len(_PDF)
    assert np.isfinite(X).all()


@pytest.mark.parametrize("name", NAMES)
def test_featurizer_deterministic(name):
    a = FZ.FEATURIZERS[name](_PDF, FACULTY_META)
    b = FZ.FEATURIZERS[name](_PDF, FACULTY_META)
    np.testing.assert_array_equal(a, b)


def test_serialize_is_structure_blind():
    # all attribute values merged into one block, no structure markers
    out = FZ.serialize(_PDF, FACULTY_META, "l")
    assert out[0] == "Qingming Huang cn"


def test_ditto_similar_names_close():
    # the paper's FP trap: near-identical pinyin names look alike to Ditto
    X = FZ.ditto_features(_PDF, FACULTY_META)
    cos = X[:, -1]
    assert cos[0] > 0.75  # Qingming Huang vs Qing-Hu Huang


def test_gnem_context_features_shared_within_candidate_set():
    pdf = pd.DataFrame(
        {
            "l_fullName": ["A B", "A B", "C D"],
            "r_fullName": ["A C", "X Y", "C E"],
            "l_country": ["cn", "cn", "de"],
            "r_country": ["cn", "cn", "de"],
        }
    )
    X = FZ.gnem_features(pdf, FACULTY_META)
    # ctx_mean (col -3) identical for the two pairs sharing left record
    assert X[0, -3] == pytest.approx(X[1, -3])
    assert X[0, -3] != pytest.approx(X[2, -3])


def test_missing_values_handled():
    pdf = _PDF.copy()
    pdf.loc[0, "l_fullName"] = None
    for name in NAMES:
        X = FZ.FEATURIZERS[name](pdf, FACULTY_META)
        assert np.isfinite(X).all()
