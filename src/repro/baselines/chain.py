"""Figure 2(c) — chain matching extension of two-table EM.

Table 0 is the base; tables 1..S-1 are matched against it one by one.
Matched entities merge into the base item (growing its member set and
centroid); unmatched entities are appended, so the base table grows — the
sequential, non-parallelizable inefficiency the paper's Lemma 2 formalizes.
Reuses the same item representation and component-merge helper as the
hierarchical merger, so the only difference *is* the schedule.
"""
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession

from repro.anns.lsh import DEFAULT_BANDS, DEFAULT_BITS
from repro.anns.topk import mutual_topk_join
from repro.core.merging import merge_matched_items
from repro.graph.components import connected_components


def chain_matching(
    spark: SparkSession,
    entity_emb: DataFrame,
    *,
    threshold: float = 0.15,
    k: int = 1,
    bands: int = DEFAULT_BANDS,
    bits: int = DEFAULT_BITS,
    seed: int = 0,
) -> DataFrame:
    """Chain-matching baseline.  Returns prediction tuples (members)."""
    srcs = sorted(r["src"] for r in entity_emb.select("src").distinct().collect())

    def items_of(src: int, tid: int) -> DataFrame:
        return entity_emb.where(F.col("src") == src).select(
            F.lit(tid).alias("tid"),
            F.col("uid").alias("item_id"),
            F.array("uid").alias("members"),
            "emb",
            F.lit(1).alias("n"),
        )

    base = items_of(srcs[0], 0).localCheckpoint(eager=True)
    for src in srcs[1:]:
        right = items_of(src, 1)
        matches = mutual_topk_join(
            base, right, k=k, max_dist=threshold, id_col="item_id",
            emb_col="emb", bands=bands, bits=bits, seed=seed,
        )
        edges = matches.select(F.col("id_l").alias("src"), F.col("id_r").alias("dst"))
        comp = connected_components(edges)
        both = base.unionByName(right)
        merged, unmatched = merge_matched_items(both, comp)
        base = (
            merged.unionByName(
                unmatched.select("tid", "item_id", "members", "emb", "n")
            )
            .withColumn("tid", F.lit(0))
            # The chain is inherently sequential: force each step.
            .localCheckpoint(eager=True)
        )
    return base.where(F.size("members") >= 2).select("members")
