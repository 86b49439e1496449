"""Synthetic ER domain generator (paper Table II substitute).

For each domain this produces:
  - tables ``a`` and ``b`` with aligned attributes (Table II cardinalities
    scaled by ``sf``), where a controlled subset of ``b`` rows are
    corrupted duplicates of ``a`` rows;
  - a ``truth`` DataFrame of all true (id_a, id_b) matches — the oracle
    the simulated active-learning labeler consults;
  - labeled ``train`` / ``test`` pair sets (Table II sizes scaled by
    ``sf``) mixing positives, *hard* negatives (same latent cluster:
    same artist/brand/venue family but a different entity) and random
    negatives, mirroring the blocked candidate sets of the DeepMatcher
    benchmark suite.

Entities are built from deterministic pseudo-word vocabularies grouped
into latent clusters, so non-duplicate entities can still share brands,
authors or venues — that overlap is what makes matching non-trivial.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.datasets.corrupt import corrupt_value
from repro.datasets.spec import DESCRIPTION_THEMES, DOMAINS, DomainSpec

_CONS = "bcdfgklmnprstvz"
_VOW = "aeiou"


def _word(rng: np.random.Generator, min_syl: int = 2, max_syl: int = 3) -> str:
    """A pronounceable pseudo-word, e.g. 'taremo' — deterministic in rng."""
    n = int(rng.integers(min_syl, max_syl + 1))
    parts = []
    for _ in range(n):
        parts.append(_CONS[rng.integers(0, len(_CONS))])
        parts.append(_VOW[rng.integers(0, len(_VOW))])
        if rng.random() < 0.25:
            parts.append(_CONS[rng.integers(0, len(_CONS))])
    return "".join(parts)


def _pool(rng: np.random.Generator, n: int, **kw) -> list[str]:
    return [_word(rng, **kw) for _ in range(n)]


@dataclass
class ERDomainData:
    """All frames for one domain. ``a``/``b`` carry ``id`` + attr columns;
    pair frames carry ``id_a``, ``id_b`` (+ ``label`` for train/test)."""

    name: str
    spec: DomainSpec
    a: DataFrame
    b: DataFrame
    train: DataFrame
    test: DataFrame
    truth: DataFrame

    @property
    def attrs(self) -> list[str]:
        return [s.name for s in self.spec.schema]


def _scale(n: int, sf: float, lo: int) -> int:
    return max(lo, int(round(n * sf)))


class _EntityFactory:
    """Generates cluster-structured entities for one domain."""

    def __init__(self, spec: DomainSpec, rng: np.random.Generator, n_clusters: int):
        self.spec = spec
        self.rng = rng
        self.n_clusters = n_clusters
        theme = DESCRIPTION_THEMES.get(spec.name, ())
        self.desc_vocab = list(theme) + _pool(rng, 120)
        self.variant_words = _pool(rng, 250)
        self.first_names = [w.capitalize() for w in _pool(rng, 120, min_syl=2, max_syl=2)]
        self.last_names = [w.capitalize() for w in _pool(rng, 120)]
        # Per-cluster bases, one entry per attribute that is cluster-anchored.
        self.cluster_base: list[dict[str, object]] = []
        for _ in range(n_clusters):
            base: dict[str, object] = {}
            for attr in spec.schema:
                if attr.kind == "name":
                    base[attr.name] = " ".join(
                        w.capitalize() for w in _pool(rng, int(rng.integers(1, 3)))
                    )
                elif attr.kind == "person":
                    base[attr.name] = (
                        f"{self.first_names[rng.integers(0, len(self.first_names))]} "
                        f"{self.last_names[rng.integers(0, len(self.last_names))]}"
                    )
                elif attr.kind == "category":
                    base[attr.name] = attr.vocab[int(rng.integers(0, len(attr.vocab)))]
                elif attr.kind == "year":
                    base[attr.name] = int(rng.integers(1985, 2021))
                elif attr.kind == "description":
                    k = int(rng.integers(3, 6))
                    idx = rng.integers(0, len(self.desc_vocab), k)
                    base[attr.name] = [self.desc_vocab[i] for i in idx]
            self.cluster_base.append(base)

    def _pick(self, pool: list[str], k: int) -> list[str]:
        return [pool[int(i)] for i in self.rng.integers(0, len(pool), k)]

    def make(self, cluster: int) -> dict[str, str | None]:
        """One entity whose cluster-anchored attributes come from ``cluster``."""
        rng, base = self.rng, self.cluster_base[cluster]
        row: dict[str, str | None] = {}
        for attr in self.spec.schema:
            kind = attr.kind
            if kind == "name":
                variants = " ".join(w.capitalize() for w in self._pick(self.variant_words, int(rng.integers(1, 3))))
                row[attr.name] = f"{base[attr.name]} {variants}"
            elif kind == "person":
                val = str(base[attr.name])
                if rng.random() < 0.4:  # co-author / double-barrelled variety
                    val += (
                        f" and {self.first_names[rng.integers(0, len(self.first_names))]} "
                        f"{self.last_names[rng.integers(0, len(self.last_names))]}"
                    )
                row[attr.name] = val
            elif kind == "category":
                row[attr.name] = str(base[attr.name])
            elif kind == "year":
                row[attr.name] = str(int(base[attr.name]) + int(rng.integers(-2, 3)))
            elif kind == "description":
                k = int(rng.integers(4, 14))
                toks = list(base[attr.name]) + self._pick(self.desc_vocab, k)
                row[attr.name] = " ".join(toks)
            elif kind == "numeric":
                row[attr.name] = f"{rng.random() * 990 + 10:.2f}"
            elif kind == "phone":
                row[attr.name] = (
                    f"({rng.integers(200, 999)}) {rng.integers(200, 999)}-"
                    f"{rng.integers(1000, 9999)}"
                )
            elif kind == "email":
                w = _word(rng)
                row[attr.name] = f"{w}@{_word(rng, 2, 2)}.com"
            elif kind == "code":
                chars = "abcdefghijklmnopqrstuvwxyz0123456789"
                n = int(rng.integers(3, 7))
                row[attr.name] = "".join(chars[int(i)] for i in rng.integers(0, len(chars), n))
            else:  # pragma: no cover - spec kinds are closed
                raise ValueError(f"unknown attr kind {kind!r}")
        return row


def er_domain_pandas(
    name: str, *, sf: float = 1.0, seed: int = 0
) -> dict[str, pd.DataFrame]:
    """Generate one domain as pandas frames (pure, Spark-free, testable).

    Returns keys ``a``, ``b``, ``train``, ``test``, ``truth``. All attr
    values are nullable strings; ids are int64, unique within a table.
    """
    spec = DOMAINS[name]
    rng = np.random.default_rng(abs(hash((name, seed))) % (2**32))
    card_a = _scale(spec.card_a, sf, 40)
    card_b = _scale(spec.card_b, sf, 40)
    n_train = _scale(spec.n_train, sf, 40)
    n_test = _scale(spec.n_test, sf, 16)

    n_match = min(
        int(round(spec.pos_frac * (n_train + n_test))),
        int(0.9 * min(card_a, card_b)),
    )
    n_match = max(n_match, 8)

    n_clusters = max(4, card_a // 4)
    fac = _EntityFactory(spec, rng, n_clusters)
    attrs = [s.name for s in spec.schema]
    noise_vocab = DESCRIPTION_THEMES.get(name, ())

    # --- table A ------------------------------------------------------------
    a_clusters = rng.integers(0, n_clusters, card_a)
    a_rows = [fac.make(int(c)) for c in a_clusters]

    # --- table B: duplicates of a sample of A, then sibling/fresh entities ---
    dup_a_idx = rng.choice(card_a, size=n_match, replace=False)
    b_rows: list[dict[str, str | None]] = []
    b_clusters: list[int] = []
    for ai in dup_a_idx:
        src = a_rows[int(ai)]
        dup = {
            k: corrupt_value(v, rng, clean=spec.clean, noise_vocab=noise_vocab)
            for k, v in src.items()
        }
        b_rows.append(dup)
        b_clusters.append(int(a_clusters[int(ai)]))
    for i in range(card_b - n_match):
        # Half the distractors share a cluster with A (hard negatives).
        c = int(a_clusters[int(rng.integers(0, card_a))]) if i % 2 == 0 else int(
            rng.integers(0, n_clusters)
        )
        b_rows.append(fac.make(c))
        b_clusters.append(c)

    # Shuffle B so duplicates are not all at the front.
    perm = rng.permutation(card_b)
    b_rows = [b_rows[int(i)] for i in perm]
    b_clusters = [b_clusters[int(i)] for i in perm]
    b_pos_of = {int(old): new for new, old in enumerate(perm)}  # old idx -> new id

    truth_pairs = [(int(ai), b_pos_of[j]) for j, ai in enumerate(dup_a_idx)]
    truth_set = set(truth_pairs)

    # --- labeled pairs --------------------------------------------------------
    n_pairs = n_train + n_test
    n_pos = min(n_match, int(round(spec.pos_frac * n_pairs)))
    pos_order = rng.permutation(len(truth_pairs))[:n_pos]
    positives = [truth_pairs[int(i)] for i in pos_order]

    by_cluster_b: dict[int, list[int]] = {}
    for bid, c in enumerate(b_clusters):
        by_cluster_b.setdefault(c, []).append(bid)

    negatives: list[tuple[int, int]] = []
    seen = set(truth_set)
    guard = 0
    while len(negatives) < n_pairs - n_pos and guard < 50 * n_pairs:
        guard += 1
        ai = int(rng.integers(0, card_a))
        if rng.random() < 0.6:  # hard negative from the same cluster
            cands = by_cluster_b.get(int(a_clusters[ai]), [])
            if not cands:
                continue
            bi = cands[int(rng.integers(0, len(cands)))]
        else:
            bi = int(rng.integers(0, card_b))
        if (ai, bi) in seen:
            continue
        seen.add((ai, bi))
        negatives.append((ai, bi))

    pairs = [(ai, bi, 1) for ai, bi in positives] + [
        (ai, bi, 0) for ai, bi in negatives
    ]
    pairs_arr = [pairs[int(i)] for i in rng.permutation(len(pairs))]
    train_pairs = pairs_arr[:n_train]
    test_pairs = pairs_arr[n_train : n_train + n_test]

    def _table(rows: list[dict[str, str | None]]) -> pd.DataFrame:
        df = pd.DataFrame({"id": np.arange(len(rows), dtype=np.int64)})
        for col in attrs:
            df[col] = pd.array([r[col] for r in rows], dtype="string")
        return df

    def _pairs(ps: list[tuple[int, int, int]]) -> pd.DataFrame:
        return pd.DataFrame(
            {
                "id_a": np.array([p[0] for p in ps], dtype=np.int64),
                "id_b": np.array([p[1] for p in ps], dtype=np.int64),
                "label": np.array([p[2] for p in ps], dtype=np.int64),
            }
        )

    return {
        "a": _table(a_rows),
        "b": _table(b_rows),
        "train": _pairs(train_pairs),
        "test": _pairs(test_pairs),
        "truth": pd.DataFrame(
            {
                "id_a": np.array([p[0] for p in truth_pairs], dtype=np.int64),
                "id_b": np.array([p[1] for p in truth_pairs], dtype=np.int64),
            }
        ),
    }


def er_domain(
    spark: SparkSession, name: str, *, sf: float = 1.0, seed: int = 0
) -> ERDomainData:
    """Spark-facing generator: pandas frames lifted to DataFrames."""
    frames = er_domain_pandas(name, sf=sf, seed=seed)
    spec = DOMAINS[name]
    return ERDomainData(
        name=name,
        spec=spec,
        a=spark.createDataFrame(frames["a"]),
        b=spark.createDataFrame(frames["b"]),
        train=spark.createDataFrame(frames["train"]),
        test=spark.createDataFrame(frames["test"]),
        truth=spark.createDataFrame(frames["truth"]),
    )
