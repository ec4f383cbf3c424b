"""Tests for the hashed n-gram encoder (Sentence-BERT stand-in)."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings, strategies as st

from repro.embedding import EMB_DIM, encode_texts, token_weight, with_embeddings
from repro.embedding.encoder import _tokenize


def sim(a, b):
    return float(np.dot(a, b))


def test_output_shape_and_dtype():
    e = encode_texts(["hello world", "foo"])
    assert e.shape == (2, EMB_DIM)
    assert e.dtype == np.float32


def test_unit_norm():
    e = encode_texts(["hello world", "a b c d"])
    assert np.allclose(np.linalg.norm(e, axis=1), 1.0, atol=1e-5)


def test_empty_text_zero_vector():
    e = encode_texts(["", "   ", None])
    assert np.allclose(e, 0.0)


def test_deterministic():
    assert np.allclose(encode_texts(["some text"]), encode_texts(["some text"]))


def test_seed_changes_embedding():
    a = encode_texts(["some text"], seed=7)
    b = encode_texts(["some text"], seed=8)
    assert not np.allclose(a, b)


def test_identical_texts_identical_embeddings():
    e = encode_texts(["apple iphone 8", "apple iphone 8"])
    assert np.allclose(e[0], e[1])


def test_typo_close_unrelated_far():
    e = encode_texts(
        ["apple iphone 8 plus silver", "aple iphone 8 plus silvr",
         "blue suede running shoes"]
    )
    assert sim(e[0], e[1]) > 0.75
    assert sim(e[0], e[2]) < 0.35
    assert sim(e[0], e[1]) > sim(e[0], e[2]) + 0.3


def test_token_order_mostly_irrelevant():
    e = encode_texts(["alpha beta gamma", "gamma alpha beta"])
    assert sim(e[0], e[1]) > 0.99


def test_example1_behaviour_id_vs_informative():
    """Paper Example 1: replacing an id changes the embedding far less
    than replacing an informative attribute."""
    base = "WoM14513028 megna's tim o'brien chameleon"
    id_changed = "WoM94369364 megna's tim o'brien chameleon"
    album_changed = "WoM14513028 megna's tim o'brien the hitmen"
    e = encode_texts([base, id_changed, album_changed])
    assert sim(e[0], e[1]) > 0.95  # id barely matters
    assert sim(e[0], e[2]) < sim(e[0], e[1]) - 0.1


@pytest.mark.parametrize(
    "tok,w",
    [
        ("hello", 1.0),
        ("wom14513028", 0.05),  # mixed alphanumeric -> gibberish
        ("abcdefghijklmn", 0.05),  # very long
        ("1999", 0.7),  # bare number
        ("a", 1.0),
    ],
)
def test_token_weight_rules(tok, w):
    assert token_weight(tok) == w


def test_tokenize_splits_non_alnum():
    assert _tokenize("Tim O'Brien - Chameleon!") == ["tim", "o", "brien", "chameleon"]


def test_tokenize_empty():
    assert _tokenize("") == []
    assert _tokenize("  --  ") == []


def test_longer_attrs_dominate_shorter():
    """Mean-pool-like dilution: changing a long attribute moves the
    embedding more than changing a short one."""
    base = "some very long product title here 3:45 1999"
    long_changed = "completely different words entirely now 3:45 1999"
    short_changed = "some very long product title here 9:59 2003"
    e = encode_texts([base, long_changed, short_changed])
    assert sim(e[0], e[2]) > sim(e[0], e[1]) + 0.2


def test_with_embeddings_matches_driver_encode(spark):
    pdf = pd.DataFrame({"uid": ["a", "b"], "text": ["hello there", "other words"]})
    df = with_embeddings(spark.createDataFrame(pdf))
    got = {r["uid"]: np.array(r["emb"]) for r in df.collect()}
    want = encode_texts(pdf["text"])
    assert np.allclose(got["a"], want[0], atol=1e-6)
    assert np.allclose(got["b"], want[1], atol=1e-6)


def test_with_embeddings_null_text(spark):
    pdf = pd.DataFrame({"uid": ["a"], "text": [None]})
    row = with_embeddings(spark.createDataFrame(pdf)).first()
    assert np.allclose(np.array(row["emb"]), 0.0)


@given(st.lists(st.text(alphabet="abcxyz 0123", max_size=30), min_size=1, max_size=8))
@settings(max_examples=40, deadline=None)
def test_encode_total_function(texts):
    e = encode_texts(texts)
    assert e.shape == (len(texts), EMB_DIM)
    assert np.isfinite(e).all()
    norms = np.linalg.norm(e, axis=1)
    assert ((np.abs(norms - 1.0) < 1e-4) | (norms == 0.0)).all()
