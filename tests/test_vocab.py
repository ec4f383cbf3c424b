"""Tests for the seeded vocabulary builder."""
import numpy as np
import pytest

from repro.datasets.vocab import Vocab, get_vocab


def test_vocab_deterministic():
    assert Vocab(1234).words == Vocab(1234).words
    assert Vocab(1234).surnames == Vocab(1234).surnames


def test_vocab_seed_changes_content():
    assert Vocab(1).words != Vocab(2).words


@pytest.mark.parametrize(
    "attr,size",
    [("words", 2500), ("first_names", 600), ("surnames", 900), ("place_stems", 500)],
)
def test_vocab_sizes(attr, size):
    assert len(getattr(Vocab(1234), attr)) == size


def test_vocab_words_unique_and_sorted():
    v = Vocab(1234)
    assert len(set(v.words)) == len(v.words)
    assert v.words == sorted(v.words)


def test_names_capitalized():
    v = Vocab(1234)
    assert all(n[0].isupper() for n in v.first_names)
    assert all(n[0].isupper() for n in v.surnames)


def test_get_vocab_cached():
    assert get_vocab(1234) is get_vocab(1234)


def test_place_and_geo_name_deterministic_under_rng():
    v = Vocab(1234)
    g1, g2 = np.random.default_rng(5), np.random.default_rng(5)
    assert v.place(g1) == v.place(g2)
    assert v.geo_name(g1) == v.geo_name(g2)


def test_geo_name_has_feature_suffix():
    v = Vocab(1234)
    g = np.random.default_rng(0)
    for _ in range(50):
        name = v.geo_name(g)
        assert name.split()[-1] in {
            "ridge", "creek", "hill", "lake", "valley", "point", "grove", "bay"
        }


def test_product_words_nonempty_lowercase():
    v = Vocab(1234)
    assert len(v.product_words) > 50
    assert all(w == w.lower() for w in v.product_words)


def test_languages_fixed():
    assert len(Vocab(1234).languages) == 8
