"""Evaluation metrics exactly as defined in §VI-A.2.

tp: pair marked duplicate in both test set and result;
fp: non-duplicate in test set, duplicate in result;
fn: duplicate in test set, non-duplicate in result.
P = tp/(tp+fp), R = tp/(tp+fn), F1 = 2PR/(P+R).

Two protocols: `topk_prf` scores a neighbour-search result against the
test pairs (Table IV/VII: a test pair counts as predicted-duplicate iff
it appears among the retrieved top-k pairs of either side), and
`matcher_prf` scores classifier probabilities (Tables V/VIII).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class PRF:
    precision: float
    recall: float
    f1: float
    tp: int
    fp: int
    fn: int


def prf_from_counts(tp: int, fp: int, fn: int) -> PRF:
    p = tp / (tp + fp) if tp + fp else 0.0
    r = tp / (tp + fn) if tp + fn else 0.0
    f1 = 2 * p * r / (p + r) if p + r else 0.0
    return PRF(p, r, f1, tp, fp, fn)


def topk_prf(neighbours: DataFrame, test: DataFrame) -> PRF:
    """Score retrieved (id_a, id_b) pairs against labeled test pairs."""
    pred = neighbours.select("id_a", "id_b").dropDuplicates().withColumn(
        "pred", F.lit(1)
    )
    joined = test.select("id_a", "id_b", "label").join(
        pred, ["id_a", "id_b"], "left"
    ).withColumn("pred", F.coalesce("pred", F.lit(0)))
    counts = joined.agg(
        F.sum(((F.col("label") == 1) & (F.col("pred") == 1)).cast("int")).alias("tp"),
        F.sum(((F.col("label") == 0) & (F.col("pred") == 1)).cast("int")).alias("fp"),
        F.sum(((F.col("label") == 1) & (F.col("pred") == 0)).cast("int")).alias("fn"),
    ).first()
    return prf_from_counts(int(counts["tp"]), int(counts["fp"]), int(counts["fn"]))


def matcher_prf(
    y_true: np.ndarray, prob: np.ndarray, threshold: float = 0.5
) -> PRF:
    """Score classifier probabilities on labeled pairs (driver-side)."""
    pred = (prob > threshold).astype(int)
    tp = int(((y_true == 1) & (pred == 1)).sum())
    fp = int(((y_true == 0) & (pred == 1)).sum())
    fn = int(((y_true == 1) & (pred == 0)).sum())
    return prf_from_counts(tp, fp, fn)
