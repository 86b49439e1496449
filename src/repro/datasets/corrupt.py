"""String corruption operators for duplicate synthesis.

Duplicates in the B table are corrupted copies of A entities. Clean (†)
domains get light, local edits (a typo, an abbreviation); noisy (‡)
domains additionally drop values, shuffle tokens and inject noise —
mirroring the paper's description of the two dataset families.
"""
from __future__ import annotations

import numpy as np

_ALPHABET = "abcdefghijklmnopqrstuvwxyz"


def typo(s: str, rng: np.random.Generator) -> str:
    """One character-level edit: insert, delete, substitute, or transpose."""
    if not s:
        return s
    op = rng.integers(0, 4)
    i = int(rng.integers(0, len(s)))
    ch = _ALPHABET[rng.integers(0, 26)]
    if op == 0:
        return s[:i] + ch + s[i:]
    if op == 1 and len(s) > 1:
        return s[:i] + s[i + 1 :]
    if op == 2:
        return s[:i] + ch + s[i + 1 :]
    if len(s) > i + 1:
        return s[:i] + s[i + 1] + s[i] + s[i + 2 :]
    return s


def drop_token(s: str, rng: np.random.Generator) -> str:
    toks = s.split()
    if len(toks) <= 1:
        return s
    i = int(rng.integers(0, len(toks)))
    return " ".join(toks[:i] + toks[i + 1 :])


def swap_tokens(s: str, rng: np.random.Generator) -> str:
    toks = s.split()
    if len(toks) <= 1:
        return s
    i = int(rng.integers(0, len(toks) - 1))
    toks[i], toks[i + 1] = toks[i + 1], toks[i]
    return " ".join(toks)


def abbreviate(s: str, rng: np.random.Generator) -> str:
    """Abbreviate one token to its first letter + '.' (e.g. 'John' -> 'J.')."""
    toks = s.split()
    if not toks:
        return s
    i = int(rng.integers(0, len(toks)))
    if len(toks[i]) > 2:
        toks[i] = toks[i][0] + "."
    return " ".join(toks)


def casefold_noise(s: str, rng: np.random.Generator) -> str:
    return s.upper() if rng.random() < 0.5 else s.lower()


def add_noise_token(s: str, rng: np.random.Generator, vocab: tuple[str, ...]) -> str:
    extra = vocab[int(rng.integers(0, len(vocab)))]
    toks = s.split()
    i = int(rng.integers(0, len(toks) + 1))
    return " ".join(toks[:i] + [extra] + toks[i:])


_LIGHT_OPS = (typo, abbreviate, swap_tokens, casefold_noise)
_HEAVY_OPS = (typo, typo, drop_token, swap_tokens, abbreviate, casefold_noise)


def corrupt_value(
    s: str | None,
    rng: np.random.Generator,
    *,
    clean: bool,
    noise_vocab: tuple[str, ...] = (),
) -> str | None:
    """Corrupt one attribute value of a duplicate record.

    Clean profile: with p=.5 keep verbatim, else one light edit.
    Noisy profile: p=.15 value goes missing entirely; otherwise 1-3 heavy
    edits plus occasional injected noise token.
    """
    if s is None or s == "":
        return s
    if clean:
        if rng.random() < 0.5:
            return s
        op = _LIGHT_OPS[int(rng.integers(0, len(_LIGHT_OPS)))]
        return op(s, rng)
    if rng.random() < 0.15:
        return None
    out = s
    for _ in range(int(rng.integers(1, 4))):
        op = _HEAVY_OPS[int(rng.integers(0, len(_HEAVY_OPS)))]
        out = op(out, rng)
    if noise_vocab and rng.random() < 0.3:
        out = add_noise_token(out, rng, noise_vocab)
    return out
