"""String corruption operators.

These model the cross-source variation the paper's datasets contain
(different titles/descriptions for the same real-world entity): character
typos, token drops/swaps, abbreviations, case changes, and missing values.
Each operator is a pure function of ``(rng, value)`` so corruption is fully
deterministic given the per-entity seeded generator.
"""
import numpy as np

_ALPHABET = "abcdefghijklmnopqrstuvwxyz"


def typo_swap(g: np.random.Generator, s: str) -> str:
    """Transpose two adjacent characters."""
    if len(s) < 2:
        return s
    i = int(g.integers(0, len(s) - 1))
    return s[:i] + s[i + 1] + s[i] + s[i + 2:]


def typo_delete(g: np.random.Generator, s: str) -> str:
    """Delete one character."""
    if len(s) < 2:
        return s
    i = int(g.integers(0, len(s)))
    return s[:i] + s[i + 1:]


def typo_insert(g: np.random.Generator, s: str) -> str:
    """Insert one random lowercase character."""
    i = int(g.integers(0, len(s) + 1))
    c = _ALPHABET[g.integers(0, len(_ALPHABET))]
    return s[:i] + c + s[i:]


def typo_replace(g: np.random.Generator, s: str) -> str:
    """Replace one character with a random lowercase character."""
    if not s:
        return s
    i = int(g.integers(0, len(s)))
    c = _ALPHABET[g.integers(0, len(_ALPHABET))]
    return s[:i] + c + s[i + 1:]


def drop_token(g: np.random.Generator, s: str) -> str:
    """Drop one whitespace-separated token (never the last one standing)."""
    toks = s.split()
    if len(toks) < 2:
        return s
    i = int(g.integers(0, len(toks)))
    return " ".join(toks[:i] + toks[i + 1:])


def swap_tokens(g: np.random.Generator, s: str) -> str:
    """Swap two adjacent tokens."""
    toks = s.split()
    if len(toks) < 2:
        return s
    i = int(g.integers(0, len(toks) - 1))
    toks[i], toks[i + 1] = toks[i + 1], toks[i]
    return " ".join(toks)


def abbreviate_token(g: np.random.Generator, s: str) -> str:
    """Truncate one token to a 3-5 char prefix (abbreviation-style variation)."""
    toks = s.split()
    if not toks:
        return s
    i = int(g.integers(0, len(toks)))
    keep = int(g.integers(3, 6))
    if len(toks[i]) > keep:
        toks[i] = toks[i][:keep]
    return " ".join(toks)


def change_case(g: np.random.Generator, s: str) -> str:
    """Title-case or upper-case the value (formatting variation)."""
    return s.title() if g.random() < 0.5 else s.upper()


_CHAR_OPS = [typo_swap, typo_delete, typo_insert, typo_replace]
_TOKEN_OPS = [drop_token, swap_tokens, abbreviate_token, change_case]


def corrupt_text(g: np.random.Generator, s: str, level: float) -> str:
    """Apply ``Poisson(level)`` random corruption operators to ``s``.

    ``level`` is the expected number of edits; 0 returns the value unchanged.
    Character-level and token-level ops are mixed 50/50 and chained, so a
    high ``level`` (e.g. the Shopee config) produces heavily divergent
    variants of the same entity.
    """
    if level <= 0 or not s:
        return s
    n_ops = int(g.poisson(level))
    for _ in range(n_ops):
        ops = _CHAR_OPS if g.random() < 0.5 else _TOKEN_OPS
        s = ops[g.integers(0, len(ops))](g, s)
    return s


def jitter_number(g: np.random.Generator, s: str, scale: float, decimals: int) -> str:
    """Perturb a numeric string by ~N(0, scale) and reformat.

    Models per-source measurement noise for coordinates (Geo dataset).
    Non-numeric input is returned unchanged.
    """
    try:
        v = float(s)
    except ValueError:
        return s
    v = v + float(g.normal(0.0, scale))
    return f"{v:.{decimals}f}"
