"""Algorithm 4 — Density-based Pruning (DP) as grouped-map dataflow.

Every candidate tuple from the merging phase is classified independently:
members are core entities (>= MinPts neighbors within strict euclidean ε,
self included — Eq. 11/12), reachable entities (non-core with a core within
<= ε — Eq. 13/14), or outlier entities (Definition 5).  Outliers are removed;
cores+reachables stay one tuple (no sub-splitting — the paper removes
outliers only).

Tuples are independent, so the classification runs as
``groupBy(item).applyInPandas`` over the exploded members joined back to the
*original entity embeddings* (pruning sees entities, not centroids).
``parallel=False`` forces a single partition — the serial-pruning rows of
Table V.
"""
import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame


def classify_members(emb: np.ndarray, eps: float, min_pts: int) -> list[str]:
    """Algorithm 4 on one tuple's member embeddings. Returns per-member kind.

    Distances come from the gram matrix (||a-b||² = ||a||²+||b||²-2a·b) so a
    u-member tuple costs O(u²) memory, not O(u²·d) — merged tuples can reach
    thousands of members on the hard datasets.
    """
    emb = emb.astype(np.float64, copy=False)
    sq = (emb * emb).sum(axis=1)
    d2 = sq[:, None] + sq[None, :] - 2.0 * (emb @ emb.T)
    dist = np.sqrt(np.maximum(d2, 0.0))
    core = (dist < eps).sum(axis=1) >= min_pts  # strict <, self counts (Eq. 12)
    reach_ok = (dist <= eps) & core[None, :]  # <= for reachability (Eq. 14)
    reachable = ~core & reach_ok.any(axis=1)
    return [
        "core" if c else ("reachable" if r else "outlier")
        for c, r in zip(core, reachable)
    ]


def prune_tuples(
    items: DataFrame,
    entity_emb: DataFrame,
    *,
    eps: float = 1.0,
    min_pts: int = 2,
    parallel: bool = True,
) -> DataFrame:
    """Prune merged items and return final prediction tuples (``members``).

    ``items`` is the merged table (needs ``item_id``, ``members``);
    ``entity_emb`` maps every entity ``uid`` to its embedding.  Only items
    with >= 2 members are candidate tuples; after outlier removal, tuples
    that fall below 2 members are dropped (size-l >= 2 per Definition 2).
    """
    cand = items.where(F.size("members") >= 2).select("item_id", "members")
    exploded = (
        cand.select("item_id", F.explode("members").alias("uid"))
        .join(entity_emb.select("uid", "emb"), "uid")
        .select("item_id", "uid", "emb")
    )
    exploded = exploded.repartition(1 if not parallel else 64, "item_id")

    def _classify(pdf: pd.DataFrame) -> pd.DataFrame:
        emb = np.stack(pdf["emb"].to_numpy()).astype(np.float64)
        kinds = classify_members(emb, eps, min_pts)
        return pd.DataFrame(
            {"item_id": pdf["item_id"], "uid": pdf["uid"], "kind": kinds}
        )

    kinds = exploded.groupBy("item_id").applyInPandas(
        _classify, schema="item_id string, uid string, kind string"
    )
    return (
        kinds.where(F.col("kind") != "outlier")
        .groupBy("item_id")
        .agg(F.sort_array(F.collect_list("uid")).alias("members"))
        .where(F.size("members") >= 2)
        .select("members")
    )
