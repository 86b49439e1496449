"""LSA IRs: distributed TF-IDF + truncated SVD topic projection (§III-B).

Pipeline (all Spark DataFrames until the tiny gram matrix):
  tokens -> HashingTF -> IDF -> X (n_values x vocab_dim, sparse)
  gram = X^T X   accumulated per-partition via mapInPandas (vocab_dim is
                 small, so each partition contributes one dense block)
  V    = top ``dim`` eigenvectors of gram on the driver (numpy eigh)
  IR   = row-wise projection X @ V, applied distributedly, L2-normalised.

This is classic LSI with the document-topic matrix realised lazily; only
the vocab_dim^2 gram ever leaves the cluster.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.ml.feature import IDF, HashingTF
from pyspark.ml.functions import vector_to_array
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _tfidf(melted: DataFrame, vocab_dim: int) -> DataFrame:
    tf = HashingTF(
        inputCol="tokens", outputCol="tf", numFeatures=vocab_dim
    ).transform(melted)
    idf_model = IDF(inputCol="tf", outputCol="tfidf").fit(tf)
    return idf_model.transform(tf).withColumn(
        "x", vector_to_array("tfidf")
    )


def _gram(df_x: DataFrame, vocab_dim: int) -> np.ndarray:
    """X^T X via per-partition partial sums; driver only sums small blocks."""

    def part(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        g = np.zeros((vocab_dim, vocab_dim))
        seen = False
        for pdf in it:
            if len(pdf):
                X = np.stack(pdf["x"].to_numpy())
                g += X.T @ X
                seen = True
        if seen:
            yield pd.DataFrame({"g": [g.ravel()]})

    gram = np.zeros((vocab_dim, vocab_dim))
    parts = df_x.select("x").coalesce(8).mapInPandas(
        part, schema="g array<double>"
    )
    for row in parts.collect():
        gram += np.asarray(row["g"]).reshape(vocab_dim, vocab_dim)
    return gram


def lsa_attr_irs(
    melted: DataFrame, *, dim: int, vocab_dim: int = 1024
) -> DataFrame:
    """(id, table, attr_idx, tokens) -> (id, table, attr_idx, ir).

    ``dim`` topics; empty values yield all-zero IRs (no token mass).
    """
    assert dim <= vocab_dim, "topic count cannot exceed hashed vocab size"
    df_x = _tfidf(melted, vocab_dim)
    gram = _gram(df_x, vocab_dim)
    # eigh returns ascending eigenvalues; take the top-``dim`` eigenvectors.
    _, vecs = np.linalg.eigh(gram)
    V = vecs[:, ::-1][:, :dim].copy()

    spark = melted.sparkSession
    bV = spark.sparkContext.broadcast(V)

    def project(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        Vm = bV.value
        for pdf in it:
            if not len(pdf):
                continue
            X = np.stack(pdf["x"].to_numpy())
            P = X @ Vm
            norms = np.linalg.norm(P, axis=1, keepdims=True)
            P = np.where(norms > 0, P / np.maximum(norms, 1e-12), P)
            yield pd.DataFrame(
                {
                    "id": pdf["id"],
                    "table": pdf["table"],
                    "attr_idx": pdf["attr_idx"],
                    "ir": list(P),
                }
            )

    return df_x.select("id", "table", "attr_idx", "x").mapInPandas(
        project,
        schema="id long, table string, attr_idx int, ir array<double>",
    )
