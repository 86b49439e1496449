"""Tests for the IR substrate (`repro.ir`, §III-B) — Spark-facing."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.ir import IR_KINDS, build_irs
from repro.ir.bert_sim import encode_values
from repro.ir.tokenize import assemble, melt, melt_both
from repro.oracle import assert_equivalent

ATTRS = ["name", "city"]


@pytest.fixture(scope="module")
def toy_tables(spark):
    a = spark.createDataFrame(
        pd.DataFrame(
            {
                "id": [0, 1, 2],
                "name": ["Charlie Brown", "Mylo Xyloto", None],
                "city": ["new york", "london", "paris"],
            }
        )
    )
    b = spark.createDataFrame(
        pd.DataFrame(
            {
                "id": [0, 1],
                "name": ["charlie brown!", "Parachutes"],
                "city": ["new york", "leeds"],
            }
        )
    )
    return a, b


class TestMelt:
    def test_row_count_is_n_times_arity(self, spark, toy_tables):
        a, b = toy_tables
        assert melt(a, ATTRS, "a").count() == 3 * 2
        assert melt_both(a, b, ATTRS).count() == 5 * 2

    def test_null_becomes_empty_string(self, toy_tables):
        a, _ = toy_tables
        rows = melt(a, ATTRS, "a").where("id = 2 AND attr_idx = 0").collect()
        assert rows[0]["value"] == ""
        assert rows[0]["tokens"] == []

    def test_tokens_lowercased_and_clean(self, toy_tables):
        _, b = toy_tables
        rows = melt(b, ATTRS, "b").where("id = 0 AND attr_idx = 0").collect()
        assert rows[0]["tokens"] == ["charlie", "brown"]

    def test_melt_oracle_unpivot(self, spark, toy_tables):
        """The melt is a relational unpivot — check it against DuckDB."""
        a, _ = toy_tables
        got = melt(a, ATTRS, "a").select("id", "attr_idx", "value")
        sql = """
            SELECT id, 0 AS attr_idx, coalesce(name, '') AS value FROM t
            UNION ALL
            SELECT id, 1 AS attr_idx, coalesce(city, '') AS value FROM t
        """
        assert_equivalent(got, sql, t=a)

    def test_assemble_orders_by_attr_idx(self, spark):
        attr_ir = spark.createDataFrame(
            pd.DataFrame(
                {
                    "id": [0, 0, 1, 1],
                    "table": ["a"] * 4,
                    "attr_idx": [1, 0, 0, 1],
                    "ir": [[1.0], [0.0], [10.0], [11.0]],
                }
            )
        )
        out = {r["id"]: r["irs"] for r in assemble(attr_ir, 2).collect()}
        assert out[0] == [[0.0], [1.0]]
        assert out[1] == [[10.0], [11.0]]


class TestBertSim:
    def test_deterministic(self):
        v1 = encode_values(["Charlie Brown"], 16)
        v2 = encode_values(["Charlie Brown"], 16)
        assert np.allclose(v1, v2)

    def test_unit_norm_nonempty(self):
        v = encode_values(["some value", None, ""], 16)
        assert np.linalg.norm(v[0]) == pytest.approx(1.0)
        assert not v[1].any() and not v[2].any()

    def test_morphological_similarity(self):
        """Char n-grams: a typo'd string stays closer than a different one."""
        v = encode_values(["restaurant", "restaurnat", "petroleum"], 32)
        d_typo = np.linalg.norm(v[0] - v[1])
        d_diff = np.linalg.norm(v[0] - v[2])
        assert d_typo < d_diff

    def test_case_insensitive(self):
        v = encode_values(["New York", "new york"], 16)
        assert np.allclose(v[0], v[1])


@pytest.mark.parametrize("kind", IR_KINDS)
class TestBuildIrs:
    def test_shape_and_coverage(self, spark, toy_tables, kind):
        a, b = toy_tables
        out = build_irs(a, b, ATTRS, kind=kind, dim=8, vocab_dim=64).toPandas()
        assert len(out) == 5
        assert set(out["table"]) == {"a", "b"}
        irs = np.stack([np.stack(r) for r in out["irs"]])
        assert irs.shape == (5, 2, 8)
        assert np.isfinite(irs).all()

    def test_duplicate_values_embed_identically(self, spark, kind):
        """Same attribute value -> same IR (all four kinds are functions
        of the value given a fixed corpus)."""
        a = spark.createDataFrame(
            pd.DataFrame({"id": [0, 1], "name": ["alpha beta", "alpha beta"],
                          "city": ["x", "y"]})
        )
        b = spark.createDataFrame(
            pd.DataFrame({"id": [0], "name": ["gamma"], "city": ["z"]})
        )
        out = build_irs(a, b, ATTRS, kind=kind, dim=8, vocab_dim=64).toPandas()
        rows = out[out["table"] == "a"].sort_values("id")
        ir0 = np.stack(rows.iloc[0]["irs"])
        ir1 = np.stack(rows.iloc[1]["irs"])
        assert np.allclose(ir0[0], ir1[0], atol=1e-9)


class TestLsaProperties:
    def test_similar_values_closer(self, spark):
        names = [
            "italian pasta kitchen", "italian pasta house",
            "quantum physics lab", "quantum physics dept",
        ]
        a = spark.createDataFrame(
            pd.DataFrame({"id": range(4), "name": names, "city": ["x"] * 4})
        )
        b = spark.createDataFrame(
            pd.DataFrame({"id": [0], "name": ["other"], "city": ["y"]})
        )
        out = build_irs(a, b, ATTRS, kind="lsa", dim=4, vocab_dim=64).toPandas()
        rows = out[out["table"] == "a"].sort_values("id")
        irs = np.stack([np.stack(r)[0] for r in rows["irs"]])
        assert np.linalg.norm(irs[0] - irs[1]) < np.linalg.norm(irs[0] - irs[2])

    def test_dim_exceeding_vocab_rejected(self, spark, toy_tables):
        a, b = toy_tables
        with pytest.raises(AssertionError):
            build_irs(a, b, ATTRS, kind="lsa", dim=128, vocab_dim=64).collect()


def test_unknown_kind_rejected(spark, toy_tables):
    a, b = toy_tables
    with pytest.raises(ValueError, match="unknown IR kind"):
        build_irs(a, b, ATTRS, kind="elmo", dim=8)
