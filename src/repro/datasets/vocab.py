"""Deterministic synthetic vocabularies.

All word lists are derived from seeded syllable composition so the repo
carries no large literal word lists, yet every run (and every Spark task)
sees the identical vocabulary.  ``Vocab`` instances are cheap to construct
and are rebuilt inside executor tasks from ``(seed,)`` alone.
"""
from functools import lru_cache

import numpy as np

_ONSETS = [
    "b", "br", "c", "ch", "d", "dr", "f", "fl", "g", "gr", "h", "j", "k",
    "kr", "l", "m", "n", "p", "pl", "pr", "r", "s", "sh", "sl", "st", "t",
    "tr", "v", "w", "z",
]
_NUCLEI = ["a", "e", "i", "o", "u", "ai", "ea", "ee", "io", "ou"]
_CODAS = ["", "b", "d", "g", "k", "l", "m", "n", "nd", "ng", "r", "rk", "s", "st", "t"]

_PLACE_SUFFIX = ["ville", "ton", "field", "burg", "ford", "port", "dale", "wood"]
_GEO_PREFIX = ["north", "south", "east", "west", "upper", "lower", "new", "old"]
_GEO_FEATURE = ["ridge", "creek", "hill", "lake", "valley", "point", "grove", "bay"]

# A compact product-word pool for the Shopee-style hard dataset: many distinct
# products share tokens from this pool, which is what makes it confusable.
_PRODUCT_WORDS = [
    "senter", "mini", "led", "usb", "zoom", "charger", "cas", "police",
    "paket", "original", "super", "pro", "max", "plus", "light", "lamp",
    "torch", "battery", "rechargeable", "waterproof", "portable", "power",
    "bank", "cable", "micro", "type", "fast", "charging", "holder", "stand",
    "case", "cover", "screen", "protector", "glass", "tempered", "clear",
    "slim", "premium", "quality", "import", "murah", "terlaris", "new",
    "edition", "set", "bundle", "promo", "sale", "xpe", "cob", "q5", "u3",
    "t6", "l2", "18650", "aaa", "3w", "5w", "10w", "outdoor", "camping",
    "bike", "head", "hand", "pocket", "keychain", "multifunction", "tool",
]


def _syllable(g: np.random.Generator) -> str:
    return (
        _ONSETS[g.integers(len(_ONSETS))]
        + _NUCLEI[g.integers(len(_NUCLEI))]
        + _CODAS[g.integers(len(_CODAS))]
    )


def _make_words(g: np.random.Generator, n: int, min_syl: int, max_syl: int) -> list[str]:
    out: set[str] = set()
    while len(out) < n:
        k = int(g.integers(min_syl, max_syl + 1))
        out.add("".join(_syllable(g) for _ in range(k)))
    return sorted(out)


class Vocab:
    """Seeded bundle of word lists used by the dataset generators."""

    def __init__(self, seed: int = 1234):
        g = np.random.default_rng(seed)
        self.words = _make_words(g, 2500, 1, 3)
        self.first_names = [w.capitalize() for w in _make_words(g, 600, 2, 3)]
        self.surnames = [w.capitalize() for w in _make_words(g, 900, 2, 3)]
        self.place_stems = _make_words(g, 500, 1, 2)
        self.languages = ["english", "german", "french", "spanish",
                          "italian", "dutch", "swedish", "polish"]
        self.product_words = list(_PRODUCT_WORDS)

    def place(self, g: np.random.Generator) -> str:
        stem = self.place_stems[g.integers(len(self.place_stems))]
        return stem + _PLACE_SUFFIX[g.integers(len(_PLACE_SUFFIX))]

    def geo_name(self, g: np.random.Generator) -> str:
        parts = []
        if g.random() < 0.5:
            parts.append(_GEO_PREFIX[g.integers(len(_GEO_PREFIX))])
        parts.append(self.place_stems[g.integers(len(self.place_stems))])
        parts.append(_GEO_FEATURE[g.integers(len(_GEO_FEATURE))])
        return " ".join(parts)


@lru_cache(maxsize=4)
def get_vocab(seed: int = 1234) -> Vocab:
    """Process-level cache: executors rebuild the identical vocab once."""
    return Vocab(seed)
