"""Deterministic text encoder (Sentence-BERT stand-in).

Pipeline per text: lowercase tokenization -> per-token *linguistic weight*
(non-linguistic tokens like mixed-alphanumeric platform IDs are down-weighted,
emulating how a pretrained LM dilutes meaningless subword soup under mean
pooling — this is what makes the paper's EER shuffle-test drop ``id``-style
attributes) -> signed hashing of character 3-grams (+ the whole token) into
``N_BUCKETS`` buckets -> L2 normalize -> seeded Gaussian random projection to
``EMB_DIM`` dims -> L2 normalize.

Properties relied on by MultiEM and validated in tests:
  * near-duplicate strings (typos, token drops) have high cosine similarity;
  * unrelated strings have low similarity;
  * replacing an uninformative attribute value moves the embedding far less
    than replacing an informative one (Example 1 / Table VII behaviour).

Everything is a pure function of ``(text, seed)`` — no fitted state — so the
encoder is identical on the driver and in every Spark task.
"""
import zlib
from functools import lru_cache

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame
from pyspark.sql.types import ArrayType, FloatType

EMB_DIM = 64
N_BUCKETS = 2048
ENCODER_SEED = 7

# Extra emphasis on exact whole-token matches vs. fuzzy n-gram overlap.
_TOKEN_FEATURE_WEIGHT = 1.5


def token_weight(tok: str) -> float:
    """Linguistic weight of one token (the pretrained-LM simulation).

    Mixed alphanumeric or very long tokens (platform IDs, hashes) -> 0.05;
    bare numbers (years, postcodes, track numbers) -> 0.7; words -> 1.0.

    Numbers keep substantial weight on purpose: a pretrained LM *does* embed
    digit strings, so numeric attributes that vary across sources inject
    real noise into the full-serialization embedding — exactly the effect
    the paper's EER module exists to remove (Table IV "w/o EER" gap).
    """
    has_digit = any(c.isdigit() for c in tok)
    has_alpha = any(c.isalpha() for c in tok)
    if (has_digit and has_alpha) or len(tok) > 12:
        return 0.05
    if has_digit and not has_alpha:
        return 0.7
    return 1.0


def _hash_feature(feat: str) -> tuple[int, float]:
    """Stable (bucket, sign) for a feature string via crc32 (hash() is salted)."""
    h = zlib.crc32(feat.encode("utf-8"))
    return h % N_BUCKETS, 1.0 if (h >> 16) & 1 else -1.0


@lru_cache(maxsize=200_000)
def _token_features(tok: str) -> tuple[np.ndarray, np.ndarray]:
    """(bucket indices, signed weights) for one token, cached process-wide."""
    w = token_weight(tok)
    padded = f"#{tok}#"
    feats = [padded[i : i + 3] for i in range(len(padded) - 2)]
    idx, val = [], []
    for f_ in feats:
        b, s = _hash_feature(f_)
        idx.append(b)
        val.append(s * w)
    b, s = _hash_feature("T:" + tok)
    idx.append(b)
    val.append(s * w * _TOKEN_FEATURE_WEIGHT)
    return np.asarray(idx, dtype=np.int64), np.asarray(val, dtype=np.float32)


@lru_cache(maxsize=4)
def _projection(seed: int) -> np.ndarray:
    """Seeded Gaussian projection matrix (N_BUCKETS x EMB_DIM), float32."""
    g = np.random.default_rng(seed)
    return (g.standard_normal((N_BUCKETS, EMB_DIM)) / np.sqrt(EMB_DIM)).astype(
        np.float32
    )


def _tokenize(text: str) -> list[str]:
    out, cur = [], []
    for ch in text.lower():
        if ch.isalnum():
            cur.append(ch)
        elif cur:
            out.append("".join(cur))
            cur = []
    if cur:
        out.append("".join(cur))
    return out


def encode_texts(texts, seed: int = ENCODER_SEED) -> np.ndarray:
    """Encode an iterable of strings to unit-norm (n, EMB_DIM) float32 rows.

    Empty/whitespace-only texts encode to the zero vector (norm guard), so
    they never spuriously match anything under cosine distance.
    """
    texts = list(texts)
    n = len(texts)
    bag = np.zeros((n, N_BUCKETS), dtype=np.float32)
    for i, t in enumerate(texts):
        for tok in _tokenize(t if isinstance(t, str) else ""):
            idx, val = _token_features(tok)
            np.add.at(bag[i], idx, val)
    norms = np.linalg.norm(bag, axis=1, keepdims=True)
    np.divide(bag, norms, out=bag, where=norms > 0)
    emb = bag @ _projection(seed)
    norms = np.linalg.norm(emb, axis=1, keepdims=True)
    np.divide(emb, norms, out=emb, where=norms > 0)
    return emb


def with_embeddings(
    df: DataFrame,
    text_col: str = "text",
    out_col: str = "emb",
    seed: int = ENCODER_SEED,
) -> DataFrame:
    """Append ``out_col`` (array<float>) embedding of ``text_col``."""

    @F.pandas_udf(ArrayType(FloatType()))
    def _encode(s: pd.Series) -> pd.Series:
        emb = encode_texts(s.fillna(""), seed=seed)
        return pd.Series(list(emb))

    return df.withColumn(out_col, _encode(F.col(text_col)))
