"""BERT-sim IRs: a deterministic, corpus-independent sentence encoder.

Stands in for the paper's pre-trained BERT (DESIGN.md §2). Properties we
must preserve for VAER:

  1. *fixed* — the same value maps to the same vector in every domain
     (this is what makes the representation model transferable);
  2. *morphology-aware* — near-identical strings embed nearby (BERT's
     WordPiece gives this; character n-grams give it more directly);
  3. *no training on the current corpus*.

Implementation: hash character 3-/4-grams and word unigrams into two
fixed Gaussian codebooks (seeded once, never trained), sum the code
vectors, L2-normalise. Executors regenerate the codebooks from the seed,
so nothing is shipped.
"""
from __future__ import annotations

import zlib
from functools import lru_cache
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

_SEED = 20210406  # fixed forever: the "pre-training"
_VOCAB = 8192


@lru_cache(maxsize=8)
def _codebooks(dim: int) -> tuple[np.ndarray, np.ndarray]:
    rng = np.random.default_rng(_SEED)
    char_cb = rng.normal(0, 1.0 / np.sqrt(dim), size=(_VOCAB, dim))
    word_cb = rng.normal(0, 1.0 / np.sqrt(dim), size=(_VOCAB, dim))
    return char_cb, word_cb


def _bucket(s: str) -> int:
    return zlib.crc32(s.encode("utf-8")) % _VOCAB


def encode_values(values: list[str | None], dim: int) -> np.ndarray:
    """Vectorise a batch of attribute values; rows are L2-normalised
    (zero rows for empty/missing values)."""
    char_cb, word_cb = _codebooks(dim)
    out = np.zeros((len(values), dim))
    for i, v in enumerate(values):
        if not v:
            continue
        text = " ".join(str(v).lower().split())
        padded = f" {text} "
        acc = np.zeros(dim)
        for n in (3, 4):
            for j in range(max(0, len(padded) - n + 1)):
                acc += char_cb[_bucket(padded[j : j + n])]
        for w in text.split():
            acc += 2.0 * word_cb[_bucket(w)]
        norm = np.linalg.norm(acc)
        if norm > 0:
            out[i] = acc / norm
    return out


def bert_attr_irs(melted: DataFrame, *, dim: int) -> DataFrame:
    """(id, table, attr_idx, value) -> (id, table, attr_idx, ir)."""

    def part(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            if not len(pdf):
                continue
            irs = encode_values(pdf["value"].tolist(), dim)
            yield pd.DataFrame(
                {
                    "id": pdf["id"],
                    "table": pdf["table"],
                    "attr_idx": pdf["attr_idx"],
                    "ir": list(irs),
                }
            )

    return melted.select("id", "table", "attr_idx", "value").mapInPandas(
        part, schema="id long, table string, attr_idx int, ir array<double>"
    )
