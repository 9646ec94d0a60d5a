"""Spark-side similarity expressions, checked against hand values and
the python implementations."""
import pytest

from repro.text import similarity as sim

CASES = [
    # (id, left, right)
    ("identical", "jennifer widom", "jennifer widom"),
    ("case", "ABC", "abc"),
    ("one_edit", "brown", "browne"),
    ("disjoint", "alpha beta", "gamma delta"),
    ("reorder", "widom jennifer", "jennifer widom"),
    ("empty_l", "", "abc"),
    ("empty_both", "", ""),
    ("null_l", None, "abc"),
    ("overlap", "data base systems", "data base theory"),
    ("short", "ab", "ba"),
]


@pytest.fixture(scope="module")
def sims(spark):
    """Evaluate every similarity on every case in one Spark job."""
    df = spark.createDataFrame(
        [(cid, l, r) for cid, l, r in CASES], ["cid", "l", "r"]
    )
    out = df.select(
        "cid",
        sim.exact_sim("l", "r").alias("exact"),
        sim.levenshtein_sim("l", "r").alias("lev"),
        sim.word_jaccard("l", "r").alias("jac_w"),
        sim.qgram_jaccard("l", "r").alias("jac_q3"),
        sim.cosine_hash("l", "r").alias("cos"),
        sim.monge_elkan("l", "r").alias("me"),
    ).collect()
    return {r["cid"]: r.asDict() for r in out}


@pytest.mark.parametrize("fn", ["exact", "lev", "jac_w", "jac_q3", "cos", "me"])
@pytest.mark.parametrize("cid", [c[0] for c in CASES])
def test_bounds(sims, fn, cid):
    assert 0.0 <= sims[cid][fn] <= 1.0 + 1e-9


@pytest.mark.parametrize("fn,expected", [
    ("exact", 1.0), ("lev", 1.0), ("jac_w", 1.0), ("jac_q3", 1.0),
    ("cos", 1.0), ("me", 1.0),
])
def test_identical(sims, fn, expected):
    assert sims["identical"][fn] == pytest.approx(expected)


def test_case_insensitive(sims):
    assert sims["case"]["exact"] == 1.0
    assert sims["case"]["lev"] == 1.0


def test_one_edit_levenshtein(sims):
    assert sims["one_edit"]["lev"] == pytest.approx(1 - 1 / 6)


def test_one_edit_matches_python(sims):
    assert sims["one_edit"]["lev"] == pytest.approx(
        sim.lev_sim_py("brown", "browne")
    )


def test_disjoint_is_zero_overlap(sims):
    assert sims["disjoint"]["jac_w"] == 0.0
    assert sims["disjoint"]["cos"] == 0.0


def test_token_reorder(sims):
    assert sims["reorder"]["jac_w"] == 1.0
    assert sims["reorder"]["me"] == 1.0
    assert sims["reorder"]["exact"] == 0.0


@pytest.mark.parametrize("fn", ["exact", "lev", "jac_w", "jac_q3", "cos", "me"])
@pytest.mark.parametrize("cid", ["empty_l", "empty_both", "null_l"])
def test_empty_and_null_are_zero(sims, fn, cid):
    assert sims[cid][fn] == 0.0


def test_word_jaccard_partial(sims):
    # {data, base, systems} vs {data, base, theory}: 2/4
    assert sims["overlap"]["jac_w"] == pytest.approx(0.5)


def test_qgram_short_string_fallback(sims):
    # strings shorter than q compare as whole tokens
    assert sims["short"]["jac_q3"] == 0.0


def test_numeric_sim(spark):
    from pyspark.sql import functions as F

    df = spark.createDataFrame(
        [(10.0, 10.0), (10.0, 5.0), (0.0, 0.0), (None, 3.0), (-5.0, 5.0)],
        ["a", "b"],
    )
    vals = [
        r[0]
        for r in df.select(sim.numeric_sim(F.col("a"), F.col("b"))).collect()
    ]
    assert vals[0] == pytest.approx(1.0)
    assert vals[1] == pytest.approx(0.5)
    assert vals[2] == pytest.approx(1.0)
    assert vals[3] == 0.0
    assert vals[4] == 0.0  # clamped at 0
