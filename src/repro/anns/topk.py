"""Top-k and mutual top-k joins (paper Eq. 1) over LSH candidates.

``mutual_topk_join`` realises
``P_m = {(e, e') | e ∈ topK(e') ∧ e' ∈ topK(e) ∧ dist(e, e') <= m}``
with one symmetric candidate set and two window ranks — because the LSH
candidate set is symmetric, ranking the same set per-left and per-right is
equivalent to intersecting two directed ANNS queries (Algorithm 3 lines 3-5).
"""
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, Window

from repro.anns.dist import add_cosine_dist
from repro.anns.lsh import (
    DEFAULT_BANDS,
    DEFAULT_BITS,
    attach_embeddings,
    lsh_candidates,
)


def _scored_candidates(left, right, *, id_col, emb_col, key_cols,
                       bands, bits, seed, max_dist):
    """Skinny LSH candidates → re-attached embeddings → distance filter."""
    cands = lsh_candidates(
        left, right, id_col=id_col, emb_col=emb_col,
        key_cols=key_cols, bands=bands, bits=bits, seed=seed,
    )
    cands = attach_embeddings(cands, left, right, id_col=id_col, emb_col=emb_col)
    return (
        add_cosine_dist(cands)
        .where(F.col("dist") <= max_dist)
        .drop("emb_l", "emb_r")
    )


def _ranked(cands: DataFrame, key_cols: list[str], k: int) -> DataFrame:
    # Deterministic tie-break: distance, then partner id.
    wl = Window.partitionBy(*key_cols, "id_l").orderBy("dist", "id_r")
    wr = Window.partitionBy(*key_cols, "id_r").orderBy("dist", "id_l")
    return (
        cands.withColumn("rank_l", F.row_number().over(wl))
        .withColumn("rank_r", F.row_number().over(wr))
        .where((F.col("rank_l") <= k) & (F.col("rank_r") <= k))
        .drop("rank_l", "rank_r")
    )


def topk_join(
    left: DataFrame,
    right: DataFrame,
    *,
    k: int = 1,
    max_dist: float = 1.0,
    id_col: str = "id",
    emb_col: str = "emb",
    key_cols: list[str] | None = None,
    bands: int = DEFAULT_BANDS,
    bits: int = DEFAULT_BITS,
    seed: int = 0,
) -> DataFrame:
    """Directed approximate top-k join: for each left row its k nearest
    right rows (among LSH candidates) with distance <= max_dist.

    Returns ``(*key_cols, id_l, id_r, dist)``.
    """
    key_cols = key_cols or []
    cands = _scored_candidates(
        left, right, id_col=id_col, emb_col=emb_col, key_cols=key_cols,
        bands=bands, bits=bits, seed=seed, max_dist=max_dist,
    )
    w = Window.partitionBy(*key_cols, "id_l").orderBy("dist", "id_r")
    return (
        cands.withColumn("rank", F.row_number().over(w))
        .where(F.col("rank") <= k)
        .select(*key_cols, "id_l", "id_r", "dist")
    )


def mutual_topk_join(
    left: DataFrame,
    right: DataFrame,
    *,
    k: int = 1,
    max_dist: float = 1.0,
    id_col: str = "id",
    emb_col: str = "emb",
    key_cols: list[str] | None = None,
    bands: int = DEFAULT_BANDS,
    bits: int = DEFAULT_BITS,
    seed: int = 0,
) -> DataFrame:
    """Mutual top-k pairs with distance cap (Eq. 1).

    Returns ``(*key_cols, id_l, id_r, dist)`` where each side ranks the
    other within its top-k candidates and ``dist <= max_dist``.
    """
    key_cols = key_cols or []
    cands = _scored_candidates(
        left, right, id_col=id_col, emb_col=emb_col, key_cols=key_cols,
        bands=bands, bits=bits, seed=seed, max_dist=max_dist,
    )
    return _ranked(cands, key_cols, k).select(*key_cols, "id_l", "id_r", "dist")
