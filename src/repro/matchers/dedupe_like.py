"""Dedupe stand-in: regularized logistic regression + agglomerative
pair clustering.

The real Dedupe library [28] trains a regularized logistic regression
over field-similarity features (its active-learning step is bypassed by
the paper — the full training set is fed in directly, §5.1.4) and then
greedily clusters records whose pairwise match probability passes a
threshold; pairs landing in the same cluster are matches. We mirror
that: the LR score is lifted for any pair whose two sides end up in the
same transitive cluster of high-scoring pairs.

As in the paper, Dedupe is not run on FACULTYMATCH, NOFLYCOMPAS,
SHOES, CAMERAS (``meta.dedupe_scales`` is False there) — the harness
reports "-" for those cells.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.em_data.meta import PAIR_ID, SCORE, DatasetMeta
from repro.matchers.base import Matcher
from repro.matchers.ml import SparkMLMatcher


class _UnionFind:
    def __init__(self):
        self.parent: dict = {}

    def find(self, x):
        self.parent.setdefault(x, x)
        while self.parent[x] != x:
            self.parent[x] = self.parent[self.parent[x]]
            x = self.parent[x]
        return x

    def union(self, a, b):
        ra, rb = self.find(a), self.find(b)
        if ra != rb:
            self.parent[rb] = ra


def _side_key(side: str, attrs) -> F.Column:
    return F.concat_ws("", *[F.coalesce(F.col(f"{side}_{a.name}").cast("string"), F.lit("")) for a in attrs])


class DedupeMatcher(Matcher):
    """Regularized LR + greedy transitive clustering of confident pairs."""

    def __init__(self, meta: DatasetMeta, *, seed: int = 0,
                 cluster_threshold: float = 0.5):
        self.name = "Dedupe"
        self.meta = meta
        self.cluster_threshold = cluster_threshold
        # internal scorer; regularized LR is what Dedupe itself fits
        self._lr = SparkMLMatcher("LogRegMatcher", meta, seed=seed)

    def fit(self, train: DataFrame) -> "DedupeMatcher":
        if not self.meta.dedupe_scales:
            raise RuntimeError(
                f"Dedupe did not scale for {self.meta.name} (paper §5.1.4)"
            )
        self._lr.fit(train)
        return self

    def score(self, pairs: DataFrame) -> DataFrame:
        scored = self._lr.score(pairs)
        key_l, key_r = _side_key("l", self.meta.attrs), _side_key("r", self.meta.attrs)
        scored = scored.withColumn("_kl", key_l).withColumn("_kr", key_r)
        # Agglomerate: union the two sides of every confident pair, then
        # lift the score of any pair whose sides share a cluster.
        confident = (
            scored.filter(F.col(SCORE) > self.cluster_threshold)
            .select("_kl", "_kr")
            .collect()
        )
        uf = _UnionFind()
        for row in confident:
            uf.union("l:" + row["_kl"], "r:" + row["_kr"])
        roots = {k: uf.find(k) for k in list(uf.parent)}
        spark = pairs.sparkSession
        if roots:
            roots_df = spark.createDataFrame(
                [(k, v) for k, v in roots.items()], ["_key", "_root"]
            )
            scored = (
                scored.withColumn("_lk", F.concat(F.lit("l:"), F.col("_kl")))
                .withColumn("_rk", F.concat(F.lit("r:"), F.col("_kr")))
                .join(roots_df.withColumnRenamed("_root", "_root_l"),
                      F.col("_lk") == F.col("_key"), "left").drop("_key")
                .join(roots_df.withColumnRenamed("_root", "_root_r"),
                      F.col("_rk") == F.col("_key"), "left").drop("_key")
            )
            same = F.col("_root_l").isNotNull() & (
                F.col("_root_l") == F.col("_root_r")
            )
            scored = scored.withColumn(
                SCORE,
                F.when(same, F.greatest(F.col(SCORE), F.lit(0.95))).otherwise(
                    F.col(SCORE)
                ),
            )
        return scored.select(*pairs.columns, SCORE)
