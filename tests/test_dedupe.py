"""Tests for the Dedupe stand-in (LR + agglomerative clustering)."""
import pytest
from pyspark.sql import functions as F

from repro.em_data.benchmark import dblp_acm
from repro.em_data.pairs import test_split, train_split
from repro.em_data.social import FACULTY_META
from repro.matchers import make_matcher
from repro.matchers.dedupe_like import _UnionFind


@pytest.fixture(scope="module")
def acm(spark):
    pairs, meta = dblp_acm(spark, n_pairs=300, seed=23)
    return pairs.cache(), meta


def test_union_find():
    uf = _UnionFind()
    uf.union("a", "b")
    uf.union("b", "c")
    assert uf.find("a") == uf.find("c")
    assert uf.find("d") == "d"


def test_dedupe_fit_score(acm):
    pairs, meta = acm
    m = make_matcher("Dedupe", meta).fit(train_split(pairs))
    scored = m.score(test_split(pairs)).cache()
    stats = scored.agg(F.min("score"), F.max("score")).collect()[0]
    assert 0.0 <= stats[0] <= stats[1] <= 1.0
    means = {r["label"]: r["m"] for r in
             scored.groupBy("label").agg(F.avg("score").alias("m")).collect()}
    assert means[1] > means[0]


def test_dedupe_refuses_non_scaling_dataset(spark):
    # paper §5.1.4: Dedupe did not scale for FacultyMatch et al.
    m = make_matcher("Dedupe", FACULTY_META)
    with pytest.raises(RuntimeError, match="did not scale"):
        m.fit(spark.range(1).toDF("x"))


def test_dedupe_columns_preserved(acm):
    pairs, meta = acm
    m = make_matcher("Dedupe", meta).fit(train_split(pairs))
    out = m.score(test_split(pairs))
    assert set(out.columns) == set(pairs.columns) | {"score"}
