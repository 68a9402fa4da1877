"""Similarity-to-probability calibration (Section 5.1.2).

The two-step method of the paper: (1) divide candidate pairs into ``k``
equal-width buckets over their similarity values; (2) within each bucket,
set the match probability to the fraction of true matches among a labeled
sample of the bucket's pairs. Labels come from the gold evidence mapping
(the paper labels a sample against its gold standard too).

Buckets the labeled sample never hits fall back to the bucket's midpoint
similarity as a prior. Pairs whose calibrated probability is 0 are dropped
— Definition 2.4 requires ``p in (0, 1]``.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from repro.core.similarity import SIM_COL

P_COL = "p"


def calibrate(
    sims: DataFrame,
    gold_pairs: DataFrame,
    *,
    buckets: int = 50,
    label_fraction: float = 0.5,
    seed: int = 7,
) -> DataFrame:
    """Turn ``(key1, key2, sim)`` into the initial mapping ``(key1, key2, p)``.

    gold_pairs: DataFrame ``(key1, key2)`` of true matches used as labels.
    label_fraction: fraction of candidate pairs whose label is consulted
        (deterministic in ``seed``), mimicking partial labeling.
    """
    b = F.least(
        F.lit(buckets - 1), F.floor(F.col(SIM_COL) * buckets).cast("int")
    ).alias("bucket")
    labeled = (
        sims.select("key1", "key2", SIM_COL, b)
        .join(
            gold_pairs.select("key1", "key2", F.lit(True).alias("is_true")),
            ["key1", "key2"],
            "left",
        )
        .withColumn("is_true", F.coalesce("is_true", F.lit(False)))
        # Hash-based sampling: deterministic in (pair, seed) regardless of
        # partition layout, unlike F.rand(seed).
        .withColumn(
            "in_sample",
            (F.pmod(F.hash("key1", "key2", F.lit(seed)), F.lit(10_000)))
            < int(label_fraction * 10_000),
        )
    )
    stats = (
        labeled.where("in_sample")
        .groupBy("bucket")
        .agg(
            F.count("*").alias("n"),
            F.sum(F.col("is_true").cast("int")).alias("n_true"),
        )
        # Empirical true-match ratio; buckets whose labeled sample holds no
        # true match get a small floor (rule-of-succession style) instead
        # of 0 — the paper's initial mappings likewise retain huge numbers
        # of low-probability matches rather than dropping them, and those
        # edges are exactly what smart partitioning exists to cut.
        .select(
            "bucket",
            F.when(F.col("n_true") > 0, F.col("n_true") / F.col("n"))
            .otherwise(F.lit(1.0) / (F.col("n") + 2))
            .alias("bucket_p"),
        )
    )
    midpoint = (F.col("bucket") + 0.5) / buckets
    return (
        labeled.join(stats, "bucket", "left")
        .select(
            "key1",
            "key2",
            F.coalesce(F.col("bucket_p"), midpoint).alias(P_COL),
        )
        .where(F.col(P_COL) > 0)
    )
