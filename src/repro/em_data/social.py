"""The two semi-synthetic social datasets of §5.1.2.

FACULTYMATCH — CSRankings-style faculty records (fullName, country),
two groups cn/de, right side perturbed, cartesian-product labels on
scholarID, 80 % of non-match pairs involving a ``de`` member dropped so
cn pairs dominate (the paper reports >6×).

NOFLYCOMPAS — COMPAS-style person records (firstName, lastName, race):
a no-fly list with 48 % Caucasian / 52 % African-American and a
passenger list with 80 % / 20 % (U.S. census), matched on personID,
right (no-fly) side perturbed.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.em_data import names
from repro.em_data.meta import AttrSpec, DatasetMeta
from repro.em_data.pairs import add_split, cross_pairs

FACULTY_META = DatasetMeta(
    name="FacultyMatch",
    domain="Population",
    dtype="structured",
    attrs=(AttrSpec("fullName", "short_str"), AttrSpec("country", "short_str")),
    sens_attr="country",
    sens_type="binary",
    dedupe_scales=False,
)

NOFLY_META = DatasetMeta(
    name="NoFlyCompas",
    domain="Population",
    dtype="structured",
    attrs=(
        AttrSpec("firstName", "short_str"),
        AttrSpec("lastName", "short_str"),
        AttrSpec("race", "short_str"),
    ),
    sens_attr="race",
    sens_type="binary",
    dedupe_scales=False,
)


def faculty_match(
    spark: SparkSession,
    *,
    n_cn: int = 260,
    n_de: int = 200,
    de_nonmatch_keep: float = 0.1,
    test_frac: float = 0.8,
    seed: int = 7,
) -> tuple[DataFrame, DatasetMeta]:
    """Build the FACULTYMATCH pairs DataFrame (left × perturbed right)."""
    g = np.random.default_rng(seed)
    rows = [(i, names.chinese_full_name(g), "cn") for i in range(n_cn)]
    rows += [(n_cn + i, names.german_full_name(g), "de") for i in range(n_de)]
    ent = pd.DataFrame(rows, columns=["eid", "fullName", "country"])

    left = ent.rename(columns={"fullName": "l_fullName", "country": "l_country"})
    right = ent.copy()
    right["fullName"] = [names.perturb(s, g) for s in right["fullName"]]
    right = right.rename(columns={"fullName": "r_fullName", "country": "r_country"})

    pairs = cross_pairs(spark.createDataFrame(left), spark.createDataFrame(right))
    # Drop 80% (keep `de_nonmatch_keep`) of non-match pairs that involve a
    # German faculty member on either side (§5.2.2) — deterministically,
    # keyed on pair_id.
    keep_bucket = F.pmod(F.xxhash64(F.col("pair_id"), F.lit(seed + 1)), F.lit(1000))
    involves_de = (F.col("l_country") == "de") | (F.col("r_country") == "de")
    pairs = pairs.filter(
        (F.col("label") == 1)
        | ~involves_de
        | (keep_bucket < int(de_nonmatch_keep * 1000))
    )
    pairs = (
        pairs.withColumn("l_groups", F.array(F.col("l_country")))
        .withColumn("r_groups", F.array(F.col("r_country")))
        .drop("l_eid", "r_eid")
    )
    return add_split(pairs, test_frac=test_frac, seed=seed + 2), FACULTY_META


def _us_people(
    g: np.random.Generator,
    start_id: int,
    n_afr: int,
    n_cauc: int,
    taken: set[tuple[str, str]] | None = None,
) -> pd.DataFrame:
    """Distinct people carry clearly distinct names, as in COMPAS.

    A candidate name is rejected if an existing person is within one
    edit in *both* fields: such pairs are unresolvable for any matcher
    once the right side is perturbed, which would break the paper's
    "non-neural matchers were perfect on NoFlyCompas" finding. Shared
    surnames with different first names remain frequent (the paper's
    common-Black-surname phenomenon that confuses embedding matchers).
    """
    from repro.text.similarity import _lev

    taken = taken if taken is not None else set()
    rows = []
    for k in range(n_afr + n_cauc):
        race = "African-American" if k < n_afr else "Caucasian"
        for _ in range(300):
            first, last = names.us_name(g, race)
            if not any(
                _lev(first.lower(), f.lower()) <= 1
                and _lev(last.lower(), l.lower()) <= 1
                for f, l in taken
            ):
                break
        taken.add((first, last))
        rows.append((start_id + k, first, last, race))
    return pd.DataFrame(rows, columns=["eid", "firstName", "lastName", "race"])


def nofly_compas(
    spark: SparkSession,
    *,
    n_nofly: int = 200,
    n_passengers: int = 500,
    n_overlap: int = 150,
    test_frac: float = 0.8,
    seed: int = 11,
) -> tuple[DataFrame, DatasetMeta]:
    """Build the NOFLYCOMPAS pairs DataFrame (passengers × no-fly list).

    The overlap (= true matches) and the extra no-fly records follow the
    no-fly race mix (52 % African-American); extra passengers are chosen
    so the whole passenger list approaches the census 80/20 mix.
    """
    if n_overlap > min(n_nofly, n_passengers):
        raise ValueError("overlap cannot exceed either list size")
    g = np.random.default_rng(seed)
    taken: set[tuple[str, str]] = set()

    n_ov_afr = round(0.52 * n_overlap)
    overlap = _us_people(g, 0, n_ov_afr, n_overlap - n_ov_afr, taken)

    n_extra_nofly = n_nofly - n_overlap
    n_enf_afr = round(0.52 * n_extra_nofly)
    extra_nofly = _us_people(g, 10_000, n_enf_afr, n_extra_nofly - n_enf_afr, taken)

    n_extra_pass = n_passengers - n_overlap
    n_ep_afr = max(0, round(0.20 * n_passengers) - n_ov_afr)
    n_ep_afr = min(n_ep_afr, n_extra_pass)
    extra_pass = _us_people(g, 20_000, n_ep_afr, n_extra_pass - n_ep_afr, taken)

    passengers = pd.concat([overlap, extra_pass], ignore_index=True)
    nofly = pd.concat([overlap, extra_nofly], ignore_index=True)
    nofly = nofly.copy()
    nofly["firstName"] = [names.perturb(s, g) for s in nofly["firstName"]]
    nofly["lastName"] = [names.perturb(s, g) for s in nofly["lastName"]]

    left = passengers.rename(columns={c: f"l_{c}" for c in passengers.columns if c != "eid"})
    right = nofly.rename(columns={c: f"r_{c}" for c in nofly.columns if c != "eid"})

    pairs = cross_pairs(spark.createDataFrame(left), spark.createDataFrame(right))
    pairs = (
        pairs.withColumn("l_groups", F.array(F.col("l_race")))
        .withColumn("r_groups", F.array(F.col("r_race")))
        .drop("l_eid", "r_eid")
    )
    return add_split(pairs, test_frac=test_frac, seed=seed + 2), NOFLY_META
