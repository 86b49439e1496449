"""Tests for the duplicate-corruption operators (`repro.datasets.corrupt`)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.datasets.corrupt import (
    abbreviate,
    add_noise_token,
    casefold_noise,
    corrupt_value,
    drop_token,
    swap_tokens,
    typo,
)


def _rng(seed=0):
    return np.random.default_rng(seed)


class TestOperators:
    def test_typo_changes_or_preserves_length_by_one(self):
        s = "restaurant"
        for seed in range(20):
            out = typo(s, _rng(seed))
            assert abs(len(out) - len(s)) <= 1

    def test_typo_empty_string_noop(self):
        assert typo("", _rng(0)) == ""

    def test_drop_token_removes_exactly_one(self):
        s = "alpha beta gamma"
        out = drop_token(s, _rng(1))
        assert len(out.split()) == 2

    def test_drop_token_single_token_noop(self):
        assert drop_token("alpha", _rng(0)) == "alpha"

    def test_swap_tokens_preserves_multiset(self):
        s = "a b c d"
        out = swap_tokens(s, _rng(2))
        assert sorted(out.split()) == sorted(s.split())

    def test_swap_tokens_single_noop(self):
        assert swap_tokens("solo", _rng(0)) == "solo"

    def test_abbreviate_creates_initial(self):
        outs = {abbreviate("John Smith", _rng(s)) for s in range(10)}
        assert any("J." in o or "S." in o for o in outs)

    def test_casefold_noise_changes_case_only(self):
        out = casefold_noise("MiXeD Case", _rng(3))
        assert out.lower() == "mixed case"

    def test_add_noise_token_increases_token_count(self):
        out = add_noise_token("a b", _rng(4), ("noise",))
        assert len(out.split()) == 3 and "noise" in out


class TestCorruptValue:
    def test_none_passthrough(self):
        assert corrupt_value(None, _rng(0), clean=True) is None

    def test_empty_passthrough(self):
        assert corrupt_value("", _rng(0), clean=False) == ""

    def test_clean_profile_often_verbatim(self):
        s = "Charlie Brown"
        outs = [corrupt_value(s, _rng(seed), clean=True) for seed in range(50)]
        assert any(o == s for o in outs)
        assert all(o is not None for o in outs)

    def test_noisy_profile_sometimes_missing(self):
        s = "Mylo Xyloto deluxe edition"
        outs = [corrupt_value(s, _rng(seed), clean=False) for seed in range(60)]
        assert any(o is None for o in outs)
        assert any(o is not None and o != s for o in outs)

    @pytest.mark.parametrize("clean", [True, False])
    def test_deterministic_given_rng_seed(self, clean):
        s = "some product description with tokens"
        a = corrupt_value(s, _rng(7), clean=clean, noise_vocab=("x",))
        b = corrupt_value(s, _rng(7), clean=clean, noise_vocab=("x",))
        assert a == b

    def test_clean_corruption_is_light(self):
        """Clean-profile edits keep most characters (one light op max)."""
        s = "abcdefghij klmnop"
        for seed in range(30):
            out = corrupt_value(s, _rng(seed), clean=True)
            assert out is not None
            assert abs(len(out) - len(s)) <= 8
