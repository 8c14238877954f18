"""Error injection for synthetic dirty datasets (GeCo/TDGen-style substrate).

The paper's benchmarks are dirty datasets with known duplicate relationships
(§3.1.2). The community builds such data with generators like GeCo [11] and
TDGen [2]: take a clean record, emit corrupted copies. This module supplies
the corruption primitives; :mod:`repro.matchgen.generator` composes them.

All functions are deterministic in the supplied ``numpy`` Generator.
"""
from __future__ import annotations

import numpy as np

_KEYBOARD_NEIGHBORS = {
    "a": "qs", "b": "vn", "c": "xv", "d": "sf", "e": "wr", "f": "dg",
    "g": "fh", "h": "gj", "i": "uo", "j": "hk", "k": "jl", "l": "k",
    "m": "n", "n": "bm", "o": "ip", "p": "o", "q": "wa", "r": "et",
    "s": "ad", "t": "ry", "u": "yi", "v": "cb", "w": "qe", "x": "zc",
    "y": "tu", "z": "x", "0": "19", "1": "02", "2": "13", "3": "24",
    "4": "35", "5": "46", "6": "57", "7": "68", "8": "79", "9": "80",
}


def typo(value: str, rng: np.random.Generator) -> str:
    """One keyboard-realistic character error: replace, delete, swap, or double."""
    if not value:
        return value
    i = int(rng.integers(0, len(value)))
    op = rng.choice(["replace", "delete", "swap", "double"])
    chars = list(value)
    if op == "replace":
        c = chars[i].lower()
        if c in _KEYBOARD_NEIGHBORS:
            chars[i] = str(rng.choice(list(_KEYBOARD_NEIGHBORS[c])))
    elif op == "delete" and len(chars) > 1:
        del chars[i]
    elif op == "swap" and i + 1 < len(chars):
        chars[i], chars[i + 1] = chars[i + 1], chars[i]
    elif op == "double":
        chars.insert(i, chars[i])
    return "".join(chars)


def drop_token(value: str, rng: np.random.Generator) -> str:
    """Remove one whitespace token (missing word, e.g. a dropped middle term)."""
    toks = value.split()
    if len(toks) <= 1:
        return value
    del toks[int(rng.integers(0, len(toks)))]
    return " ".join(toks)


def swap_tokens(value: str, rng: np.random.Generator) -> str:
    """Swap two adjacent tokens (word-order variation between sources)."""
    toks = value.split()
    if len(toks) <= 1:
        return value
    i = int(rng.integers(0, len(toks) - 1))
    toks[i], toks[i + 1] = toks[i + 1], toks[i]
    return " ".join(toks)


def case_noise(value: str, rng: np.random.Generator) -> str:
    """Change the capitalisation style of the value."""
    style = rng.choice(["upper", "lower", "title"])
    return getattr(value, str(style))()


def abbreviate(value: str, rng: np.random.Generator) -> str:
    """Truncate one token to a prefix (e.g. 'professional' -> 'pro')."""
    toks = value.split()
    i = int(rng.integers(0, len(toks)))
    if len(toks[i]) > 4:
        toks[i] = toks[i][: max(3, len(toks[i]) // 2)]
    return " ".join(toks)


CORRUPTORS = [typo, drop_token, swap_tokens, case_noise, abbreviate]


def corrupt_value(
    value: str | None,
    rng: np.random.Generator,
    n_errors: int = 1,
    null_prob: float = 0.0,
) -> str | None:
    """Apply ``n_errors`` random corruption ops; optionally null the value out.

    ``None`` stays ``None`` (cannot corrupt a missing value).
    """
    if value is None:
        return None
    if null_prob and rng.random() < null_prob:
        return None
    out = value
    for _ in range(n_errors):
        op = CORRUPTORS[int(rng.integers(0, len(CORRUPTORS)))]
        out = op(out, rng)
    return out
