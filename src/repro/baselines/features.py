"""Feature extraction shared by the baseline lites.

All embeddings come from the same fixed codebooks as the BERT-sim IR
encoder (`repro.ir.bert_sim`), standing in for the pre-trained
GloVe/fastText/WordPiece vectors the real systems load.
"""
from __future__ import annotations

import numpy as np

from repro.ir.bert_sim import _bucket, _codebooks, encode_values

_TOKEN_CAP = 12  # tokens per attribute value considered by the aligner


def _tokens(v: str | None) -> list[str]:
    return [] if not v else str(v).lower().split()[:_TOKEN_CAP]


def token_matrix(v: str | None, dim: int) -> np.ndarray:
    """(n_tokens, dim) word-embedding rows for one attribute value."""
    _, word_cb = _codebooks(dim)
    toks = _tokens(v)
    if not toks:
        return np.zeros((0, dim))
    return word_cb[[_bucket(t) for t in toks]]


def avg_embed(values: list[list[str | None]], dim: int) -> np.ndarray:
    """(n_pairs, m, dim): mean word embedding per attribute value."""
    n, m = len(values), len(values[0])
    out = np.zeros((n, m, dim))
    for i, row in enumerate(values):
        for j, v in enumerate(row):
            tm = token_matrix(v, dim)
            if len(tm):
                out[i, j] = tm.mean(axis=0)
    return out


def deeper_features(
    vals_s: list[list[str | None]], vals_t: list[list[str | None]], dim: int
) -> np.ndarray:
    """DeepER's comparison vector: [|e_s - e_t|, e_s * e_t] per attribute."""
    es = avg_embed(vals_s, dim)
    et = avg_embed(vals_t, dim)
    n, m, d = es.shape
    feats = np.concatenate([np.abs(es - et), es * et], axis=2)
    return feats.reshape(n, m * 2 * d)


def _align(S: np.ndarray, T: np.ndarray) -> np.ndarray:
    """Soft-align T onto S (scaled dot-product attention); returns the
    mean absolute difference between S rows and their aligned T rows."""
    d = S.shape[1]
    logits = (S @ T.T) / np.sqrt(d)
    logits -= logits.max(axis=1, keepdims=True)
    w = np.exp(logits)
    w /= w.sum(axis=1, keepdims=True)
    aligned = w @ T
    return np.abs(S - aligned).mean(axis=0)


def attention_features(
    vals_s: list[list[str | None]], vals_t: list[list[str | None]], dim: int
) -> np.ndarray:
    """DeepMatcher hybrid summariser: per attribute, attend each side's
    tokens over the other side's and compare; concat both directions."""
    n, m = len(vals_s), len(vals_s[0])
    out = np.zeros((n, m, 2 * dim))
    for i in range(n):
        for j in range(m):
            S = token_matrix(vals_s[i][j], dim)
            T = token_matrix(vals_t[i][j], dim)
            if len(S) and len(T):
                out[i, j, :dim] = _align(S, T)
                out[i, j, dim:] = _align(T, S)
    return out.reshape(n, m * 2 * dim)


def ditto_features(
    vals_s: list[list[str | None]],
    vals_t: list[list[str | None]],
    attrs: list[str],
    dim: int,
) -> np.ndarray:
    """DITTO serialisation features: char-n-gram vectors of the two
    serialised entities plus their absolute difference."""

    def serialise(row: list[str | None]) -> str:
        return " ".join(
            f"[COL] {a} [VAL] {v or ''}" for a, v in zip(attrs, row)
        )

    vs = encode_values([serialise(r) for r in vals_s], dim)
    vt = encode_values([serialise(r) for r in vals_t], dim)
    return np.concatenate([vs, vt, np.abs(vs - vt)], axis=1)
