"""Tests for the synthetic ER domain generators (Table II substitutes)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.datasets.generate import er_domain, er_domain_pandas
from repro.datasets.spec import DOMAINS

ALL = sorted(DOMAINS)


@pytest.fixture(scope="module")
def frames():
    """One small instance per domain, shared across this module."""
    return {name: er_domain_pandas(name, sf=0.05, seed=0) for name in ALL}


class TestSpecs:
    @pytest.mark.parametrize("name", ALL)
    def test_schema_matches_arity(self, name):
        spec = DOMAINS[name]
        assert len(spec.schema) == spec.arity

    def test_table2_sizes_recorded(self):
        """Spot-check the registry against paper Table II."""
        assert (DOMAINS["restaurants"].card_a, DOMAINS["restaurants"].card_b) == (533, 331)
        assert DOMAINS["citations2"].card_b == 64263
        assert DOMAINS["crm"].arity == 12
        assert DOMAINS["music"].n_train == 321
        assert DOMAINS["stocks"].n_test == 1117

    def test_clean_noisy_split_matches_paper(self):
        clean = {n for n in ALL if DOMAINS[n].clean}
        assert clean == {"restaurants", "citations1", "citations2", "crm"}


class TestGeneratedFrames:
    @pytest.mark.parametrize("name", ALL)
    def test_tables_have_id_plus_schema_columns(self, frames, name):
        f = frames[name]
        attrs = [s.name for s in DOMAINS[name].schema]
        assert list(f["a"].columns) == ["id", *attrs]
        assert list(f["b"].columns) == ["id", *attrs]

    @pytest.mark.parametrize("name", ALL)
    def test_ids_unique(self, frames, name):
        f = frames[name]
        assert f["a"]["id"].is_unique and f["b"]["id"].is_unique

    @pytest.mark.parametrize("name", ALL)
    def test_pair_ids_exist_in_tables(self, frames, name):
        f = frames[name]
        ids_a = set(f["a"]["id"])
        ids_b = set(f["b"]["id"])
        for key in ("train", "test", "truth"):
            assert set(f[key]["id_a"]).issubset(ids_a)
            assert set(f[key]["id_b"]).issubset(ids_b)

    @pytest.mark.parametrize("name", ALL)
    def test_labels_consistent_with_truth(self, frames, name):
        f = frames[name]
        truth = set(zip(f["truth"]["id_a"], f["truth"]["id_b"]))
        for key in ("train", "test"):
            for a, b, lbl in f[key].itertuples(index=False, name=None):
                assert ((a, b) in truth) == bool(lbl)

    @pytest.mark.parametrize("name", ALL)
    def test_train_test_pairs_disjoint(self, frames, name):
        f = frames[name]
        tr = set(zip(f["train"]["id_a"], f["train"]["id_b"]))
        te = set(zip(f["test"]["id_a"], f["test"]["id_b"]))
        assert not tr & te

    @pytest.mark.parametrize("name", ALL)
    def test_both_classes_present(self, frames, name):
        f = frames[name]
        assert set(f["train"]["label"]) == {0, 1}

    @pytest.mark.parametrize("name", ALL)
    def test_deterministic_in_seed(self, name):
        f1 = er_domain_pandas(name, sf=0.03, seed=5)
        f2 = er_domain_pandas(name, sf=0.03, seed=5)
        for key in ("a", "b", "train", "test", "truth"):
            pd.testing.assert_frame_equal(f1[key], f2[key])

    @pytest.mark.parametrize("name", ["restaurants", "beer"])
    def test_different_seeds_differ(self, name):
        f1 = er_domain_pandas(name, sf=0.05, seed=1)
        f2 = er_domain_pandas(name, sf=0.05, seed=2)
        assert not f1["a"].equals(f2["a"])

    def test_scale_factor_scales_sizes(self):
        small = er_domain_pandas("citations1", sf=0.05, seed=0)
        large = er_domain_pandas("citations1", sf=0.2, seed=0)
        assert len(large["a"]) > len(small["a"])
        assert len(large["train"]) > len(small["train"])

    def test_sf1_matches_table2_cardinalities(self):
        f = er_domain_pandas("restaurants", sf=1.0, seed=0)
        assert len(f["a"]) == 533 and len(f["b"]) == 331
        assert len(f["train"]) == 567 and len(f["test"]) == 189

    @pytest.mark.parametrize(
        "name", [n for n in ALL if not DOMAINS[n].clean]
    )
    def test_noisy_domains_have_missing_values(self, name):
        f = er_domain_pandas(name, sf=0.2, seed=0)
        dup_rows = f["b"].set_index("id").loc[f["truth"]["id_b"]]
        assert dup_rows.isna().any().any()

    @pytest.mark.parametrize("name", ALL)
    def test_duplicates_share_surface_text(self, frames, name):
        """A duplicate should still share tokens with its source — the
        corruption must not destroy all similarity signal."""
        f = frames[name]
        attrs = [s.name for s in DOMAINS[name].schema]
        a_idx = f["a"].set_index("id")
        b_idx = f["b"].set_index("id")
        overlaps = []
        for ia, ib in zip(f["truth"]["id_a"], f["truth"]["id_b"]):
            ta = " ".join(str(v).lower() for v in a_idx.loc[ia, attrs] if pd.notna(v))
            tb = " ".join(str(v).lower() for v in b_idx.loc[ib, attrs] if pd.notna(v))
            sa, sb = set(ta.split()), set(tb.split())
            overlaps.append(len(sa & sb) / max(1, len(sa | sb)))
        # Noisy (‡) domains corrupt harder, so their floor is lower.
        floor = 0.3 if DOMAINS[name].clean else 0.12
        assert np.mean(overlaps) > floor

    def test_pos_fraction_reasonable(self, frames):
        for name in ALL:
            frac = frames[name]["train"]["label"].mean()
            assert 0.03 < frac < 0.6, name


class TestSparkLift:
    def test_er_domain_creates_dataframes(self, spark):
        d = er_domain(spark, "restaurants", sf=0.05, seed=0)
        assert d.a.count() == len(er_domain_pandas("restaurants", sf=0.05, seed=0)["a"])
        assert d.attrs == [s.name for s in DOMAINS["restaurants"].schema]
        assert {"id_a", "id_b", "label"} <= set(d.train.columns)

    def test_er_domain_nullable_strings(self, spark):
        d = er_domain(spark, "beer", sf=0.1, seed=0)
        types = dict(d.b.dtypes)
        assert types["beer_name"] == "string"
