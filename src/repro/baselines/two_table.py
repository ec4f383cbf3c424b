"""Two-table matching applied to *every* table pair (Figure 2(a) substrate).

``all_pairs_mutual_topk`` runs the mutual top-k matcher between all
S·(S-1)/2 table pairs in one dataflow: a single LSH self-join filtered to
``src_l < src_r``, then mutual ranking *per table pair* — each pair is an
independent two-table EM run, exactly how the paper extends two-table
methods, but expressed as one Catalyst plan.
"""
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, Window

from repro.anns.dist import add_cosine_dist
from repro.anns.lsh import DEFAULT_BANDS, DEFAULT_BITS, with_signatures


def all_pairs_mutual_topk(
    entity_emb: DataFrame,
    *,
    k: int = 1,
    max_dist: float = 0.35,
    bands: int = DEFAULT_BANDS,
    bits: int = DEFAULT_BITS,
    seed: int = 0,
) -> DataFrame:
    """Mutual top-k matched pairs for every table pair.

    ``entity_emb``: (uid, src, emb).  Returns (src_l, src_r, id_l, id_r,
    dist) with src_l < src_r, where each side is within the other's top-k
    for that specific table pair and dist <= max_dist.
    """
    sigs = with_signatures(
        entity_emb, "emb", "sigs", bands=bands, bits=bits, seed=seed
    ).select("uid", "src", F.posexplode("sigs").alias("band", "sig"))
    lf = sigs.select(
        F.col("uid").alias("id_l"), F.col("src").alias("src_l"), "band", "sig"
    )
    rf = sigs.select(
        F.col("uid").alias("id_r"), F.col("src").alias("src_r"), "band", "sig"
    )
    # Skinny id-only candidate shuffle; embeddings re-attached via broadcast
    # (see repro.anns.lsh.attach_embeddings for why).
    cands = (
        lf.join(rf, ["band", "sig"])
        .where(F.col("src_l") < F.col("src_r"))
        .drop("band", "sig")
        .dropDuplicates(["id_l", "id_r"])
    )
    emb_l = F.broadcast(
        entity_emb.select(F.col("uid").alias("id_l"), F.col("emb").alias("emb_l"))
    )
    emb_r = F.broadcast(
        entity_emb.select(F.col("uid").alias("id_r"), F.col("emb").alias("emb_r"))
    )
    cands = cands.join(emb_l, "id_l").join(emb_r, "id_r")
    cands = (
        add_cosine_dist(cands)
        .where(F.col("dist") <= max_dist)
        .drop("emb_l", "emb_r")
    )
    wl = Window.partitionBy("src_l", "src_r", "id_l").orderBy("dist", "id_r")
    wr = Window.partitionBy("src_l", "src_r", "id_r").orderBy("dist", "id_l")
    return (
        cands.withColumn("rank_l", F.row_number().over(wl))
        .withColumn("rank_r", F.row_number().over(wr))
        .where((F.col("rank_l") <= k) & (F.col("rank_r") <= k))
        .select("src_l", "src_r", "id_l", "id_r", "dist")
    )
