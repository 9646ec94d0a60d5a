"""Helpers to assemble canonical pairs DataFrames.

A pairs DataFrame (the unit of work of the whole reproduction) has:

``pair_id`` • ``l_<attr>``/``r_<attr>`` for every matching attribute •
``label`` (1 = true match) • ``l_groups``/``r_groups``
(array<string> sensitive groups; setwise attrs contribute several) •
``is_train`` (deterministic split).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.em_data.meta import IS_TRAIN, PAIR_ID


def add_split(df: DataFrame, *, test_frac: float, seed: int) -> DataFrame:
    """Deterministic train/test split keyed on a stable hash of pair_id.

    Using ``xxhash64(pair_id, seed)`` rather than ``rand`` keeps the
    split stable under repartitioning/recomputation.
    """
    bucket = F.pmod(F.xxhash64(F.col(PAIR_ID), F.lit(seed)), F.lit(1000))
    return df.withColumn(IS_TRAIN, bucket >= int(test_frac * 1000))


def train_split(pairs: DataFrame) -> DataFrame:
    return pairs.filter(F.col(IS_TRAIN))


def test_split(pairs: DataFrame) -> DataFrame:
    return pairs.filter(~F.col(IS_TRAIN))


# not a pytest test, despite the name pytest would otherwise collect
test_split.__test__ = False  # type: ignore[attr-defined]


def pairs_from_pandas(
    spark: SparkSession, pdf: pd.DataFrame, *, test_frac: float, seed: int
) -> DataFrame:
    """Create a pairs DataFrame from generator output (pandas), adding
    pair ids and the deterministic split."""
    pdf = pdf.reset_index(drop=True).copy()
    pdf[PAIR_ID] = pdf.index.astype("int64")
    df = spark.createDataFrame(pdf)
    return add_split(df, test_frac=test_frac, seed=seed)


def cross_pairs(
    left: DataFrame, right: DataFrame, *, id_col: str = "eid"
) -> DataFrame:
    """Cartesian product of two entity tables whose columns are already
    ``l_``/``r_`` prefixed except the id, labelling identical ids as
    matches. Used by the social datasets (§5.1.2: "perform a Cartesian
    product … label each pair as a match if left and right records have
    identical IDs")."""
    l = left.withColumnRenamed(id_col, f"l_{id_col}")
    r = right.withColumnRenamed(id_col, f"r_{id_col}")
    out = l.crossJoin(r)
    out = out.withColumn(
        "label", (F.col(f"l_{id_col}") == F.col(f"r_{id_col}")).cast("int")
    )
    return out.withColumn(
        PAIR_ID,
        F.xxhash64(F.col(f"l_{id_col}").cast("string"),
                   F.col(f"r_{id_col}").cast("string")),
    )
