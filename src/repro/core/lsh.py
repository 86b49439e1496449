"""Top-k nearest-neighbour search over entity representations (§V-A, §VI-B).

The paper searches on ``mu`` vectors with Euclidean LSH (licensed by the
W2 <-> Euclidean-on-means correlation of §V-A) and re-orders results by
the full W2 distance. We implement the same two-stage scheme as a
broadcast block-nearest-neighbour join:

  stage 1 (candidates): project mu to ``proj_dim`` dimensions with a
    seeded Gaussian random projection (a p-stable LSH sketch), broadcast
    the smaller side's sketch matrix, and scan the other side's
    partitions with numpy top-``k*oversample`` lookups;
  stage 2 (re-rank): join candidates back to the full (mu, sigma)
    vectors, compute exact W2 per pair in `mapInPandas`, and keep the
    top-k per side with a window.

``exact=True`` skips the sketch (projection = identity, oversample = all
candidates), giving the brute-force oracle used by tests.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def _project(X: np.ndarray, proj_dim: int, seed: int) -> np.ndarray:
    d = X.shape[1]
    if proj_dim >= d:
        return X.astype(np.float32)
    R = np.random.default_rng(seed).normal(0, 1.0 / np.sqrt(proj_dim), (d, proj_dim))
    return (X @ R).astype(np.float32)


def _candidates_one_direction(
    reps: DataFrame,
    probe_table: str,
    index_pdf: pd.DataFrame,
    *,
    n_cand: int,
    proj_dim: int,
    seed: int,
) -> DataFrame:
    """Scan ``probe_table`` partitions against the broadcast index sketch."""
    spark = reps.sparkSession
    idx_ids = index_pdf["id"].to_numpy()
    idx_proj = _project(np.stack(index_pdf["mu"].to_numpy()), proj_dim, seed)
    idx_sq = (idx_proj**2).sum(axis=1)
    b = spark.sparkContext.broadcast((idx_ids, idx_proj, idx_sq))
    probe_is_a = probe_table == "a"

    def part(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        ids_i, P_i, sq_i = b.value
        m = min(n_cand, len(ids_i))
        for pdf in it:
            if not len(pdf):
                continue
            Q = _project(np.stack(pdf["mu"].to_numpy()), proj_dim, seed)
            # Squared Euclidean via the expansion; argpartition for top-m.
            d2 = (Q**2).sum(axis=1)[:, None] - 2.0 * (Q @ P_i.T) + sq_i[None, :]
            top = np.argpartition(d2, m - 1, axis=1)[:, :m]
            probe_ids = pdf["id"].to_numpy()
            pid = np.repeat(probe_ids, m)
            nid = ids_i[top.ravel()]
            yield pd.DataFrame(
                {
                    "id_a": pid if probe_is_a else nid,
                    "id_b": nid if probe_is_a else pid,
                }
            )

    probe = reps.where(F.col("table") == probe_table).select("id", "mu")
    return probe.mapInPandas(part, schema="id_a long, id_b long")


def _w2_pairs(pairs_with_vecs: DataFrame) -> DataFrame:
    """Attach exact W2 to joined pairs, computed vectorised per partition."""

    def part(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            if not len(pdf):
                continue
            mu_a = np.stack(pdf["mu_a"].to_numpy())
            mu_b = np.stack(pdf["mu_b"].to_numpy())
            sg_a = np.stack(pdf["sigma_a"].to_numpy())
            sg_b = np.stack(pdf["sigma_b"].to_numpy())
            w2 = ((mu_a - mu_b) ** 2).sum(1) + ((sg_a - sg_b) ** 2).sum(1)
            yield pd.DataFrame(
                {"id_a": pdf["id_a"], "id_b": pdf["id_b"], "w2": w2}
            )

    return pairs_with_vecs.mapInPandas(
        part, schema="id_a long, id_b long, w2 double"
    )


def pair_w2(reps: DataFrame, pairs: DataFrame) -> DataFrame:
    """Join arbitrary (id_a, id_b) pairs to representations and compute W2.

    Extra columns of ``pairs`` (e.g. ``label``) are preserved.
    """
    a = reps.where(F.col("table") == "a").select(
        F.col("id").alias("id_a"),
        F.col("mu").alias("mu_a"),
        F.col("sigma").alias("sigma_a"),
    )
    b = reps.where(F.col("table") == "b").select(
        F.col("id").alias("id_b"),
        F.col("mu").alias("mu_b"),
        F.col("sigma").alias("sigma_b"),
    )
    joined = pairs.join(a, "id_a").join(b, "id_b")
    extra = [c for c in pairs.columns if c not in ("id_a", "id_b")]
    w2 = _w2_pairs(
        joined.select("id_a", "id_b", "mu_a", "mu_b", "sigma_a", "sigma_b")
    )
    if extra:
        w2 = w2.join(pairs, ["id_a", "id_b"])
    return w2


def topk_pairs(
    reps: DataFrame,
    *,
    k: int = 10,
    exact: bool = False,
    proj_dim: int = 64,
    oversample: int = 3,
    seed: int = 42,
) -> DataFrame:
    """Cross-table top-k neighbour pairs re-ranked by W2.

    Returns ``(id_a, id_b, w2)`` where the pair is in the W2 top-k of
    *either* side — the §VI-B evaluation protocol and the Algorithm 1
    candidate pool. ``reps`` must carry (id, table in {'a','b'}, mu, sigma).
    """
    b_pdf = reps.where(F.col("table") == "b").select("id", "mu").toPandas()
    a_pdf = reps.where(F.col("table") == "a").select("id", "mu").toPandas()
    if exact:
        n_cand = max(len(a_pdf), len(b_pdf))
        proj_dim = 1 << 30  # identity projection
    else:
        n_cand = k * oversample
    cand = _candidates_one_direction(
        reps, "a", b_pdf, n_cand=n_cand, proj_dim=proj_dim, seed=seed
    ).unionByName(
        _candidates_one_direction(
            reps, "b", a_pdf, n_cand=n_cand, proj_dim=proj_dim, seed=seed
        )
    ).dropDuplicates(["id_a", "id_b"])

    scored = pair_w2(reps, cand)
    wa = Window.partitionBy("id_a").orderBy(F.col("w2").asc(), F.col("id_b").asc())
    wb = Window.partitionBy("id_b").orderBy(F.col("w2").asc(), F.col("id_a").asc())
    ranked = scored.withColumn("ra", F.row_number().over(wa)).withColumn(
        "rb", F.row_number().over(wb)
    )
    return ranked.where((F.col("ra") <= k) | (F.col("rb") <= k)).select(
        "id_a", "id_b", "w2"
    )
