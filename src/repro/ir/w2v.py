"""W2V IRs: Spark ML Word2Vec sentence embeddings (§III-B).

The paper averages *pre-trained* word embeddings per attribute value.
No pre-trained vectors ship offline, so the model is trained on the
union corpus of both tables (DESIGN.md §2); `Word2VecModel.transform`
then performs exactly the paper's sentence-level averaging.
"""
from __future__ import annotations

from pyspark.ml.feature import Word2Vec
from pyspark.ml.functions import vector_to_array
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

# Attribute values with no tokens (missing data) still need a vector;
# a dedicated placeholder token keeps transform() well-defined.
NULL_TOKEN = "__null__"


def _with_null_token(melted: DataFrame) -> DataFrame:
    return melted.withColumn(
        "tokens",
        F.when(F.size("tokens") == 0, F.array(F.lit(NULL_TOKEN))).otherwise(
            F.col("tokens")
        ),
    )


def fit_word2vec(melted: DataFrame, *, dim: int, seed: int = 7, max_sentences: int = 40_000):
    """Train Word2Vec over attribute-value sentences (sampled above a cap:
    the paper's pre-trained model is fixed-cost, so is ours)."""
    sents = _with_null_token(melted).select("tokens")
    n = sents.count()
    if n > max_sentences:
        sents = sents.sample(fraction=max_sentences / n, seed=seed)
    w2v = Word2Vec(
        vectorSize=dim,
        minCount=1,
        seed=seed,
        inputCol="tokens",
        outputCol="vec",
        numPartitions=4,
    )
    return w2v.fit(sents)


def w2v_attr_irs(melted: DataFrame, *, dim: int, seed: int = 7, model=None) -> DataFrame:
    """(id, table, attr_idx, tokens) -> (id, table, attr_idx, ir)."""
    df = _with_null_token(melted)
    model = model or fit_word2vec(melted, dim=dim, seed=seed)
    out = model.setInputCol("tokens").setOutputCol("vec").transform(df)
    return out.select(
        "id", "table", "attr_idx", vector_to_array("vec").alias("ir")
    )
