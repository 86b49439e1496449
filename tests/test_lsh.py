"""Tests for top-k neighbour search / blocking (`repro.core.lsh`)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.lsh import pair_w2, topk_pairs
from repro.core.wasserstein import w2_squared
from repro.oracle import assert_equivalent


def _reps_df(spark, n_a=12, n_b=15, dim=6, seed=0):
    rng = np.random.default_rng(seed)
    rows = []
    for t, n in (("a", n_a), ("b", n_b)):
        mu = rng.normal(size=(n, dim))
        sg = np.abs(rng.normal(size=(n, dim))) * 0.1
        for i in range(n):
            rows.append({"id": i, "table": t, "mu": mu[i].tolist(), "sigma": sg[i].tolist()})
    return spark.createDataFrame(pd.DataFrame(rows)), rows


def _brute_topk(rows, k):
    a = [r for r in rows if r["table"] == "a"]
    b = [r for r in rows if r["table"] == "b"]
    d = np.zeros((len(a), len(b)))
    for i, ra in enumerate(a):
        for j, rb in enumerate(b):
            d[i, j] = w2_squared(
                np.array(ra["mu"]), np.array(ra["sigma"]),
                np.array(rb["mu"]), np.array(rb["sigma"]),
            )
    keep = set()
    for i in range(len(a)):
        for j in np.argsort(d[i], kind="stable")[:k]:
            keep.add((a[i]["id"], b[j]["id"]))
    for j in range(len(b)):
        for i in np.argsort(d[:, j], kind="stable")[:k]:
            keep.add((a[i]["id"], b[j]["id"]))
    return keep, d


class TestExactTopK:
    def test_matches_brute_force(self, spark):
        df, rows = _reps_df(spark)
        got = {
            (r["id_a"], r["id_b"])
            for r in topk_pairs(df, k=3, exact=True).collect()
        }
        want, _ = _brute_topk(rows, 3)
        assert got == want

    def test_w2_values_correct(self, spark):
        df, rows = _reps_df(spark, seed=1)
        _, d = _brute_topk(rows, 3)
        for r in topk_pairs(df, k=3, exact=True).collect():
            assert r["w2"] == pytest.approx(d[r["id_a"], r["id_b"]], rel=1e-9)

    def test_k_bounds_per_side_membership(self, spark):
        """Every returned pair must be within the exact W2 top-k of at
        least one of its sides."""
        df, rows = _reps_df(spark, seed=2)
        want, _ = _brute_topk(rows, 2)
        got = {
            (r["id_a"], r["id_b"])
            for r in topk_pairs(df, k=2, exact=True).collect()
        }
        assert got <= want and got

    def test_all_tuples_covered(self, spark):
        df, _ = _reps_df(spark, seed=3)
        pdf = topk_pairs(df, k=1, exact=True).toPandas()
        assert set(pdf["id_a"]) == set(range(12))
        assert set(pdf["id_b"]) == set(range(15))


class TestApproxTopK:
    def test_high_recall_vs_exact(self, spark):
        df, rows = _reps_df(spark, n_a=40, n_b=60, dim=16, seed=4)
        want, _ = _brute_topk(rows, 5)
        got = {
            (r["id_a"], r["id_b"])
            for r in topk_pairs(df, k=5, proj_dim=8, oversample=4, seed=4).collect()
        }
        assert len(got & want) / len(want) > 0.8

    def test_projection_identity_when_wide(self, spark):
        """proj_dim >= dim means no sketch loss: result equals exact."""
        df, rows = _reps_df(spark, seed=5)
        want, _ = _brute_topk(rows, 3)
        got = {
            (r["id_a"], r["id_b"])
            for r in topk_pairs(
                df, k=3, proj_dim=1024, oversample=100, seed=5
            ).collect()
        }
        assert got == want


class TestPairW2:
    def test_matches_numpy(self, spark):
        df, rows = _reps_df(spark, seed=6)
        pairs = spark.createDataFrame(
            pd.DataFrame({"id_a": [0, 3, 5], "id_b": [1, 2, 0]})
        )
        got = {(r["id_a"], r["id_b"]): r["w2"] for r in pair_w2(df, pairs).collect()}
        by = {(r["table"], r["id"]): r for r in rows}
        for (ia, ib), w2 in got.items():
            ra, rb = by[("a", ia)], by[("b", ib)]
            expect = w2_squared(
                np.array(ra["mu"]), np.array(ra["sigma"]),
                np.array(rb["mu"]), np.array(rb["sigma"]),
            )
            assert w2 == pytest.approx(expect, rel=1e-9)

    def test_preserves_extra_columns(self, spark):
        df, _ = _reps_df(spark, seed=7)
        pairs = spark.createDataFrame(
            pd.DataFrame({"id_a": [0, 1], "id_b": [0, 1], "label": [1, 0]})
        )
        out = pair_w2(df, pairs).toPandas()
        assert set(out.columns) == {"id_a", "id_b", "w2", "label"}
        assert len(out) == 2

    def test_join_oracle(self, spark):
        """The pair-to-representation join is relational — check the
        cardinality/keys against DuckDB."""
        df, _ = _reps_df(spark, seed=8)
        pairs = spark.createDataFrame(
            pd.DataFrame({"id_a": [0, 1, 2], "id_b": [3, 4, 5]})
        )
        got = pair_w2(df, pairs).select("id_a", "id_b")
        sql = """
            SELECT p.id_a AS id_a, p.id_b AS id_b
            FROM pairs p
            JOIN (SELECT id FROM reps WHERE "table" = 'a') a ON p.id_a = a.id
            JOIN (SELECT id FROM reps WHERE "table" = 'b') b ON p.id_b = b.id
        """
        assert_equivalent(got, sql, pairs=pairs, reps=df.select("id", "table"))
