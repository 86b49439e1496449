"""EmbDI-lite IRs: relational embeddings for data integration (§III-B).

Cappuzzo et al. embed a heterogeneous graph (tokens <-> rows <-> columns)
by running random walks and training word2vec on them. This lite version
keeps the skeleton at tractable cost:

  - *row sentences*: all tokens of a tuple, with a per-attribute marker
    token injected before each attribute's tokens (row + column
    co-occurrence in one pass — one walk per row);
  - *column sentences*: tokens of one attribute across a hashed bucket
    of rows (column-wise co-occurrence — one walk per column bucket);
  - Spark ML Word2Vec over the union of sentences;
  - value IR = average of its token vectors (same pooling as W2V IRs).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.ir.w2v import w2v_attr_irs
from pyspark.ml.feature import Word2Vec


def _sentences(melted: DataFrame, n_buckets: int) -> DataFrame:
    marked = melted.withColumn(
        "marked",
        F.concat(
            F.array(F.concat(F.lit("__col"), F.col("attr_idx").cast("string"), F.lit("__"))),
            F.col("tokens"),
        ),
    )
    rows = (
        marked.groupBy("id", "table")
        .agg(F.array_sort(F.collect_list(F.struct("attr_idx", "marked"))).alias("p"))
        .select(F.flatten(F.transform("p", lambda s: s["marked"])).alias("tokens"))
    )
    cols = (
        melted.withColumn("bucket", F.pmod(F.hash("id", "table"), F.lit(n_buckets)))
        .groupBy("attr_idx", "bucket")
        .agg(F.flatten(F.collect_list("tokens")).alias("tokens"))
        .select("tokens")
    )
    return rows.unionByName(cols).where(F.size("tokens") > 0)


def embdi_attr_irs(
    melted: DataFrame, *, dim: int, seed: int = 11, n_buckets: int = 64,
    max_sentences: int = 40_000,
) -> DataFrame:
    """(id, table, attr_idx, tokens) -> (id, table, attr_idx, ir)."""
    sents = _sentences(melted, n_buckets)
    n = sents.count()
    if n > max_sentences:
        sents = sents.sample(fraction=max_sentences / n, seed=seed)
    model = Word2Vec(
        vectorSize=dim,
        minCount=1,
        seed=seed,
        inputCol="tokens",
        outputCol="vec",
        numPartitions=4,
    ).fit(sents)
    # Pool the relational token vectors per attribute value, exactly as W2V.
    return w2v_attr_irs(melted, dim=dim, seed=seed, model=model)
