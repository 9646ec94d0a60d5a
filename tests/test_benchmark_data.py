"""Tests for the six complementary benchmark dataset generators."""
import pytest
from pyspark.sql import functions as F

from repro.em_data import benchmark as B
from repro.em_data.meta import pair_columns

GENERATORS = {
    "iTunes-Amazon": (B.itunes_amazon, dict(n_pairs=200), 0.247),
    "DBLP-ACM": (B.dblp_acm, dict(n_pairs=400), 0.179),
    "DBLP-Scholar": (B.dblp_scholar, dict(n_pairs=325), 0.19),
    "Cricket": (B.cricket, dict(n_pairs=400), 0.965),
    "Shoes": (B.shoes, dict(n_pairs=500), 0.103),
    "Cameras": (B.cameras, dict(n_pairs=400), 0.172),
}


@pytest.fixture(scope="module")
def built(spark):
    out = {}
    for name, (fn, kwargs, _) in GENERATORS.items():
        pairs, meta = fn(spark, **kwargs)
        out[name] = (pairs.cache(), meta)
    return out


@pytest.mark.parametrize("name", list(GENERATORS))
def test_schema_matches_meta(built, name):
    pairs, meta = built[name]
    assert set(pair_columns(meta)) <= set(pairs.columns)
    assert meta.name == name


@pytest.mark.parametrize("name", list(GENERATORS))
def test_pair_count(built, name):
    pairs, _ = built[name]
    assert pairs.count() == GENERATORS[name][1]["n_pairs"]


@pytest.mark.parametrize("name", list(GENERATORS))
def test_positive_rate(built, name):
    pairs, _ = built[name]
    target = GENERATORS[name][2]
    frac = pairs.filter("label = 1").count() / pairs.count()
    assert frac == pytest.approx(target, abs=0.01)


@pytest.mark.parametrize("name", list(GENERATORS))
def test_groups_nonempty(built, name):
    pairs, _ = built[name]
    bad = pairs.filter(
        (F.size("l_groups") == 0) | (F.size("r_groups") == 0)
    ).count()
    assert bad == 0


@pytest.mark.parametrize("name", list(GENERATORS))
def test_deterministic(spark, built, name):
    fn, kwargs, _ = GENERATORS[name]
    pairs, _ = built[name]
    again, _ = fn(spark, **kwargs)
    a = pairs.select("pair_id", "label").toPandas().sort_values("pair_id")
    b = again.select("pair_id", "label").toPandas().sort_values("pair_id")
    assert a.reset_index(drop=True).equals(b.reset_index(drop=True))


def test_itunes_genre_is_setwise(built):
    pairs, meta = built["iTunes-Amazon"]
    assert meta.sens_type == "setwise"
    multi = pairs.filter(F.size("l_groups") > 1).count()
    assert multi > 0  # some songs carry several genre groups


def test_itunes_country_cluster_present(built):
    pairs, _ = built["iTunes-Amazon"]
    groups = {
        g
        for row in pairs.select("l_groups").toPandas()["l_groups"]
        for g in row
    }
    assert "Country" in groups and ("Honky Tonk" in groups or "Cont. Country" in groups)


def test_dblp_acm_guest_editorial_trap(built):
    pairs, _ = built["DBLP-ACM"]
    trap = pairs.filter(
        (F.col("l_title") == F.col("r_title"))
        & (F.col("label") == 0)
        & F.col("l_venue").isin("SIGMOD Rec.", "VLDBJ")
    ).count()
    assert trap > 0  # same-title non-matches exist (§5.3.3)


def test_dblp_acm_extended_version_trap(built):
    pairs, _ = built["DBLP-ACM"]
    trap = pairs.filter(
        (F.col("l_venue") == "VLDB") & (F.col("r_venue") == "VLDBJ")
        & (F.col("label") == 0)
    ).count()
    assert trap > 0


@pytest.mark.parametrize("name", ["DBLP-Scholar", "Cricket"])
def test_dirty_datasets_have_missing_values(built, name):
    pairs, meta = built[name]
    assert meta.dtype == "dirty"
    some_attr = [a for a in meta.attrs if a.name not in
                 ("title", "entry_type", "name", "batting_style")][0]
    nulls = pairs.filter(F.col(f"r_{some_attr.name}").isNull()).count()
    assert nulls > 0


def test_cricket_match_heavy(built):
    pairs, meta = built["Cricket"]
    assert meta.threshold == 0.9  # §5.1.4 choice for CRICKET
    assert pairs.filter("label=1").count() > 0.9 * pairs.count()


def test_cricket_left_handed_minority(built):
    pairs, _ = built["Cricket"]
    left = pairs.filter(F.col("l_batting_style") == "Left Handed").count()
    assert 0 < left < 0.5 * pairs.count()


@pytest.mark.parametrize("name", ["Shoes", "Cameras"])
def test_textual_single_attribute(built, name):
    pairs, meta = built[name]
    assert meta.dtype == "textual"
    assert len(meta.attrs) == 1
    assert not meta.dedupe_scales  # paper: Dedupe did not scale


def test_cameras_dutch_listings_present(built):
    pairs, _ = built["Cameras"]
    nl = pairs.filter(F.col("r_title").contains("@NL")).count()
    assert nl > 0


def test_shoes_brand_groups_valid(built):
    pairs, _ = built["Shoes"]
    brands = {
        g
        for row in pairs.select("l_groups").toPandas()["l_groups"]
        for g in row
    }
    assert brands <= set(B._SHOE_BRANDS)


def test_shoes_hard_negatives_same_brand(built):
    pairs, _ = built["Shoes"]
    neg = pairs.filter("label = 0")
    same_brand = neg.filter(F.col("l_groups")[0] == F.col("r_groups")[0]).count()
    assert same_brand > 0.5 * neg.count()
