"""Tests for the baseline lites (`repro.baselines`)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.baselines import BASELINES, DeepERLite, DeepMatcherLite, DittoLite
from repro.baselines.features import (
    attention_features,
    avg_embed,
    deeper_features,
    ditto_features,
    token_matrix,
)
from repro.baselines.matchers import gather_pair_values

ATTRS = ["name", "city"]


def _toy_pairs(n=120, seed=0):
    """Positives share the name; negatives are unrelated strings."""
    rng = np.random.default_rng(seed)
    words = [f"tok{i}" for i in range(40)]
    vals_s, vals_t, y = [], [], []
    for i in range(n):
        name = " ".join(rng.choice(words, 3))
        city = str(rng.choice(["leeds", "york", "derby"]))
        if i % 2 == 0:
            vals_s.append([name, city])
            vals_t.append([name + " ltd", city])
            y.append(1)
        else:
            other = " ".join(rng.choice(words, 3))
            vals_s.append([name, city])
            vals_t.append([other, str(rng.choice(["paris", "rome"]))])
            y.append(0)
    return vals_s, vals_t, np.array(y, dtype=float)


class TestFeatures:
    def test_token_matrix_shapes(self):
        assert token_matrix("a b c", 8).shape == (3, 8)
        assert token_matrix(None, 8).shape == (0, 8)
        assert token_matrix("", 8).shape == (0, 8)

    def test_token_cap(self):
        long = " ".join(f"w{i}" for i in range(50))
        assert token_matrix(long, 8).shape[0] == 12

    def test_avg_embed_shape_and_missing(self):
        out = avg_embed([["a b", None], ["c", "d e f"]], 8)
        assert out.shape == (2, 2, 8)
        assert not out[0, 1].any()

    def test_deeper_features_shape(self):
        vs, vt, _ = _toy_pairs(10)
        assert deeper_features(vs, vt, 8).shape == (10, 2 * 2 * 8)

    def test_attention_features_shape(self):
        vs, vt, _ = _toy_pairs(10)
        assert attention_features(vs, vt, 8).shape == (10, 2 * 2 * 8)

    def test_attention_identical_pair_smaller_than_different(self):
        same = attention_features([["same words", "x"]], [["same words", "x"]], 8)
        diff = attention_features([["same words", "x"]], [["other tokens", "y"]], 8)
        assert np.abs(same).sum() < np.abs(diff).sum()

    def test_ditto_features_shape(self):
        vs, vt, _ = _toy_pairs(10)
        assert ditto_features(vs, vt, ATTRS, 64).shape == (10, 3 * 64)

    def test_ditto_identical_pair_zero_diff_block(self):
        out = ditto_features([["a", "b"]], [["a", "b"]], ATTRS, 64)
        assert not out[0, 128:].any()


@pytest.mark.parametrize("name", sorted(BASELINES))
class TestMatchers:
    def test_learns_toy_task(self, name):
        vs, vt, y = _toy_pairs()
        cls = BASELINES[name]
        model = cls(ATTRS, seed=0)
        model.epochs = min(model.epochs, 60)  # keep tests fast
        model.fit(vs, vt, y)
        acc = ((model.predict_proba(vs, vt) > 0.5) == y).mean()
        assert acc > 0.9

    def test_predict_before_fit_raises(self, name):
        model = BASELINES[name](ATTRS, seed=0)
        with pytest.raises(AssertionError):
            model.predict_proba(*_toy_pairs(4)[:2])


class TestRegistry:
    def test_names(self):
        assert set(BASELINES) == {"deeper", "deepmatcher", "ditto"}
        assert BASELINES["deeper"] is DeepERLite
        assert BASELINES["deepmatcher"] is DeepMatcherLite
        assert BASELINES["ditto"] is DittoLite

    def test_cost_ordering_knobs(self):
        """DeepMatcher must be configured as the heaviest system."""
        assert DeepMatcherLite.epochs > DeepERLite.epochs
        assert sum(DeepMatcherLite.hidden) > sum(DeepERLite.hidden)


class TestGatherPairValues:
    def test_lookup_with_missing(self):
        a = pd.DataFrame({"id": [0, 1], "name": ["x", None], "city": ["c1", "c2"]})
        b = pd.DataFrame({"id": [5], "name": ["y"], "city": [None]})
        pairs = pd.DataFrame({"id_a": [1, 0], "id_b": [5, 5]})
        vs, vt = gather_pair_values(a, b, pairs, ATTRS)
        assert vs == [[None, "c2"], ["x", "c1"]]
        assert vt == [["y", None], ["y", None]]
