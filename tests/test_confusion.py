"""Group confusion profiles: the paper's Example 5 plus DuckDB oracle
checks of the Spark aggregations."""
import numpy as np
import pandas as pd
import pytest

from repro.core import confusion
from repro.oracle import assert_equivalent

# ------------------------------------------------------------- Example 5
EX5 = [
    # (l_groups, r_groups, h-as-score, y)  — Figure 15 rows
    (["g1"], ["g1"], 1.0, 0),  # FP
    (["g2"], ["g1"], 0.0, 0),  # TN
    (["g1"], ["g1"], 1.0, 1),  # TP
    (["g1"], ["g2"], 0.0, 1),  # FN
]


@pytest.fixture(scope="module")
def ex5_df(spark):
    return spark.createDataFrame(
        [(l, r, s, y) for l, r, s, y in EX5],
        ["l_groups", "r_groups", "score", "label"],
    )


def test_example5_overall(ex5_df):
    assert confusion.overall_confusion(ex5_df, 0.5) == dict(tp=1, fp=1, fn=1, tn=1)


def test_example5_group_confusion_matches_figure15(ex5_df):
    out = confusion.group_confusion(ex5_df, 0.5, "single").set_index("group")
    # Figure 15(b): g1 has one of each; (c): g2 has TN=1, FN=1
    assert out.loc["g1"].to_dict() == dict(tp=1, fp=1, fn=1, tn=1)
    assert out.loc["g2"].to_dict() == dict(tp=0, fp=0, fn=1, tn=1)


def test_example5_pairwise(ex5_df):
    out = confusion.group_confusion(ex5_df, 0.5, "pairwise").set_index("group")
    assert out.loc["g1|g1"].to_dict() == dict(tp=1, fp=1, fn=0, tn=0)
    assert out.loc["g1|g2"].to_dict() == dict(tp=0, fp=0, fn=1, tn=1)


def test_pair_counted_once_per_distinct_group(spark):
    # both sides in the same group -> the pair contributes once, not twice
    df = spark.createDataFrame(
        [(["a"], ["a"], 1.0, 1)], ["l_groups", "r_groups", "score", "label"]
    )
    out = confusion.group_confusion(df, 0.5, "single").set_index("group")
    assert out.loc["a"].to_dict() == dict(tp=1, fp=0, fn=0, tn=0)


def test_setwise_pairwise_groups(spark):
    df = spark.createDataFrame(
        [(["a", "b"], ["c"], 1.0, 1)],
        ["l_groups", "r_groups", "score", "label"],
    )
    out = confusion.group_confusion(df, 0.5, "pairwise")
    assert sorted(out["group"]) == ["a|c", "b|c"]


def test_pairwise_key_is_unordered(spark):
    df = spark.createDataFrame(
        [(["b"], ["a"], 1.0, 1), (["a"], ["b"], 0.0, 1)],
        ["l_groups", "r_groups", "score", "label"],
    )
    out = confusion.group_confusion(df, 0.5, "pairwise").set_index("group")
    # both rows land on the same unordered key a|b
    assert out.loc["a|b"].to_dict() == dict(tp=1, fp=0, fn=1, tn=0)


def test_threshold_is_strict(spark):
    df = spark.createDataFrame(
        [(["a"], ["a"], 0.5, 1)], ["l_groups", "r_groups", "score", "label"]
    )
    assert confusion.overall_confusion(df, 0.5) == dict(tp=0, fp=0, fn=1, tn=0)


# --------------------------------------------------------- oracle checks
@pytest.fixture(scope="module")
def random_scored(spark):
    """200 random pairs with 1-2 groups per side, plus flat pandas views
    for DuckDB."""
    g = np.random.default_rng(42)
    universe = ["g1", "g2", "g3", "g4"]
    rows = []
    for i in range(200):
        lg = sorted({str(x) for x in g.choice(universe, size=g.integers(1, 3), replace=False)})
        rg = sorted({str(x) for x in g.choice(universe, size=g.integers(1, 3), replace=False)})
        rows.append((i, lg, rg, float(g.random()), int(g.random() < 0.3)))
    df = spark.createDataFrame(
        rows, ["pair_id", "l_groups", "r_groups", "score", "label"]
    )
    flat = pd.DataFrame(
        [(i, s, y) for i, _, _, s, y in rows],
        columns=["pair_id", "score", "label"],
    )
    single = pd.DataFrame(
        [(i, grp) for i, lg, rg, _, _ in rows for grp in sorted(set(lg) | set(rg))],
        columns=["pair_id", "grp"],
    )
    pairwise = pd.DataFrame(
        [
            (i, "|".join(sorted((a, b))))
            for i, lg, rg, _, _ in rows
            for a, b in {tuple(sorted((x, y))) for x in lg for y in rg}
        ],
        columns=["pair_id", "grp"],
    )
    return df, flat, single, pairwise


_CONF_SQL = """
    SELECT g.grp AS group,
           SUM(CASE WHEN s.score > 0.5 AND s.label = 1 THEN 1 ELSE 0 END) AS tp,
           SUM(CASE WHEN s.score > 0.5 AND s.label = 0 THEN 1 ELSE 0 END) AS fp,
           SUM(CASE WHEN s.score <= 0.5 AND s.label = 1 THEN 1 ELSE 0 END) AS fn,
           SUM(CASE WHEN s.score <= 0.5 AND s.label = 0 THEN 1 ELSE 0 END) AS tn
    FROM groups g JOIN scored s USING (pair_id)
    GROUP BY g.grp
"""


def test_single_confusion_vs_duckdb(spark, random_scored):
    df, flat, single, _ = random_scored
    got = confusion.group_confusion(df, 0.5, "single")
    assert_equivalent(
        spark.createDataFrame(got), _CONF_SQL, scored=flat, groups=single
    )


def test_pairwise_confusion_vs_duckdb(spark, random_scored):
    df, flat, _, pairwise = random_scored
    got = confusion.group_confusion(df, 0.5, "pairwise")
    assert_equivalent(
        spark.createDataFrame(got), _CONF_SQL, scored=flat, groups=pairwise
    )


def test_overall_confusion_vs_duckdb(spark, random_scored):
    df, flat, _, _ = random_scored
    got = confusion.overall_confusion(df, 0.5)
    got_df = spark.createDataFrame(pd.DataFrame([got]))
    assert_equivalent(
        got_df,
        """SELECT
             SUM(CASE WHEN score > 0.5 AND label = 1 THEN 1 ELSE 0 END) AS tp,
             SUM(CASE WHEN score > 0.5 AND label = 0 THEN 1 ELSE 0 END) AS fp,
             SUM(CASE WHEN score <= 0.5 AND label = 1 THEN 1 ELSE 0 END) AS fn,
             SUM(CASE WHEN score <= 0.5 AND label = 0 THEN 1 ELSE 0 END) AS tn
           FROM scored""",
        scored=flat,
    )


def test_group_totals_conserved(random_scored):
    # every pair appears exactly once per distinct group it legitimates
    df, flat, single, _ = random_scored
    out = confusion.group_confusion(df, 0.5, "single")
    assert out[["tp", "fp", "fn", "tn"]].to_numpy().sum() == len(single)
