"""Tests for the FACULTYMATCH / NOFLYCOMPAS generators (§5.1.2)."""
import pytest
from pyspark.sql import functions as F

from repro.em_data.meta import pair_columns
from repro.em_data.pairs import test_split, train_split
from repro.em_data.social import faculty_match, nofly_compas
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def faculty(spark):
    pairs, meta = faculty_match(spark, n_cn=60, n_de=45, seed=7)
    return pairs.cache(), meta


@pytest.fixture(scope="module")
def nofly(spark):
    pairs, meta = nofly_compas(
        spark, n_nofly=60, n_passengers=150, n_overlap=40, seed=11
    )
    return pairs.cache(), meta


def test_faculty_schema(faculty):
    pairs, meta = faculty
    assert set(pair_columns(meta)) <= set(pairs.columns)


def test_faculty_positives_equal_entities(faculty):
    pairs, _ = faculty
    # every entity matches exactly its perturbed copy
    assert pairs.filter("label = 1").count() == 60 + 45


def test_faculty_cn_overrepresentation(faculty):
    pairs, _ = faculty
    cn = pairs.filter(
        (F.col("l_country") == "cn") & (F.col("r_country") == "cn")
    ).count()
    de_any = pairs.filter(
        (F.col("l_country") == "de") | (F.col("r_country") == "de")
    ).count()
    # §5.2.2: cn pairs dominate after dropping de non-matches
    assert cn > 2 * de_any


def test_faculty_groups_are_country(faculty):
    pairs, _ = faculty
    row = pairs.select("l_groups", "l_country").first()
    assert row["l_groups"] == [row["l_country"]]


def test_faculty_right_side_perturbed(faculty):
    pairs, _ = faculty
    matches = pairs.filter("label = 1")
    changed = matches.filter(F.col("l_fullName") != F.col("r_fullName")).count()
    # perturbation touches nearly every right record (identity possible
    # only when add+remove cancel, which single-op perturbation forbids)
    assert changed >= 0.9 * matches.count()


def test_faculty_deterministic(spark, faculty):
    pairs, _ = faculty
    again, _ = faculty_match(spark, n_cn=60, n_de=45, seed=7)
    assert again.count() == pairs.count()
    a = sorted(pairs.select("pair_id").toPandas()["pair_id"])
    b = sorted(again.select("pair_id").toPandas()["pair_id"])
    assert a == b


def test_faculty_split_fractions(faculty):
    pairs, _ = faculty
    n = pairs.count()
    n_test = test_split(pairs).count()
    assert 0.75 <= n_test / n <= 0.85  # test_frac = 0.8


def test_faculty_class_imbalance(faculty):
    pairs, _ = faculty
    pos = pairs.filter("label = 1").count()
    assert pos / pairs.count() < 0.05  # §3.5: EM is heavily imbalanced


def test_nofly_schema(nofly):
    pairs, meta = nofly
    assert set(pair_columns(meta)) <= set(pairs.columns)
    assert meta.sens_attr == "race"


def test_nofly_positive_count_is_overlap(nofly):
    pairs, _ = nofly
    assert pairs.filter("label = 1").count() == 40


def test_nofly_race_mixes(nofly):
    pairs, _ = nofly
    # right side (no-fly list): African-Americans over-represented (~52%)
    nofly_races = (
        pairs.select("r_eid" if "r_eid" in pairs.columns else "r_race", "r_race")
        .groupBy("r_race").count().toPandas().set_index("r_race")["count"]
    )
    frac_afr = nofly_races.get("African-American", 0) / nofly_races.sum()
    assert 0.4 <= frac_afr <= 0.65
    # left side (passengers): ~20% African-American
    pass_races = (
        pairs.groupBy("l_race").count().toPandas().set_index("l_race")["count"]
    )
    frac_afr_l = pass_races.get("African-American", 0) / pass_races.sum()
    assert 0.1 <= frac_afr_l <= 0.3


def test_nofly_overlap_too_large_raises(spark):
    with pytest.raises(ValueError):
        nofly_compas(spark, n_nofly=10, n_passengers=50, n_overlap=20)


def test_nofly_race_counts_vs_duckdb(spark, nofly):
    pairs, _ = nofly
    got = pairs.groupBy("l_race", "r_race").agg(
        F.count("*").alias("n"), F.sum("label").alias("pos")
    )
    flat = pairs.select("l_race", "r_race", "label").toPandas()
    assert_equivalent(
        got,
        """SELECT l_race, r_race, COUNT(*) AS n, SUM(label) AS pos
           FROM pairs GROUP BY l_race, r_race""",
        pairs=flat,
    )


def test_nofly_class_imbalance(nofly):
    pairs, _ = nofly
    assert pairs.filter("label=1").count() / pairs.count() < 0.02
