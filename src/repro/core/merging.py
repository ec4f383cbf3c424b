"""Algorithms 2–3 — Table-wise Hierarchical Merging as DataFrame dataflow.

The whole merge state is one DataFrame of *items*:

    (tid int, item_id string, members array<string>, emb array<float>, n int)

A "table" is a value of ``tid`` (initially the source index, optionally
permuted — the paper's merging-order sensitivity study); an item is either a
single entity or an already-merged candidate tuple whose embedding is the
renormalized size-weighted centroid of its members.

One hierarchy level (Algorithm 2 line 4) is one dataflow over **all** table
pairs: ``pair_id = tid div 2`` partitions the items, the mutual top-k LSH
join (Algorithm 3 lines 3–5, Eq. 1) is keyed by ``pair_id``, matched pairs
are closed transitively with connected components (line 8), and unmatched
items pass through (lines 9–10).  ``parallel=False`` runs the identical
per-pair computation in a sequential Python loop — the MultiEM vs
MultiEM(parallel) contrast of Tables V/VI.
"""
from dataclasses import dataclass

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.types import ArrayType, FloatType

from repro.anns.lsh import DEFAULT_BANDS, DEFAULT_BITS
from repro.anns.topk import mutual_topk_join
from repro.graph.components import connected_components


@dataclass(frozen=True)
class MergeParams:
    """Hyperparameters of the merging phase (paper §III-C / §IV-A)."""

    k: int = 1
    m: float = 0.35  # cosine-distance cap, grid {0.05, 0.2, 0.35, 0.5}
    bands: int = DEFAULT_BANDS
    bits: int = DEFAULT_BITS
    seed: int = 0
    parallel: bool = True
    order_seed: int | None = None  # permute table order (Fig. 6(b) study)


@F.pandas_udf(ArrayType(FloatType()))
def _normalize(v: pd.Series) -> pd.Series:
    arr = np.stack(v.to_numpy()).astype(np.float32)
    norms = np.linalg.norm(arr, axis=1, keepdims=True)
    np.divide(arr, norms, out=arr, where=norms > 0)
    return pd.Series(list(arr))


def initial_items(
    records_emb: DataFrame, *, order_seed: int | None = None
) -> DataFrame:
    """Lift ``(uid, src, emb)`` records into the item representation.

    ``order_seed`` permutes the src → tid assignment to exercise the
    paper's merging-order sensitivity; None keeps source order.
    """
    spark = records_emb.sparkSession
    srcs = sorted(r["src"] for r in records_emb.select("src").distinct().collect())
    order = list(range(len(srcs)))
    if order_seed is not None:
        order = list(np.random.default_rng(order_seed).permutation(len(srcs)))
    mapping = spark.createDataFrame(
        [(int(s), int(t)) for s, t in zip(srcs, order)], "src int, tid int"
    )
    return records_emb.join(mapping, "src").select(
        "tid",
        F.col("uid").alias("item_id"),
        F.array("uid").alias("members"),
        "emb",
        F.lit(1).alias("n"),
    )


def merge_matched_items(items: DataFrame, comp: DataFrame) -> tuple[DataFrame, DataFrame]:
    """Split items into (aggregated matched items, pass-through items).

    ``comp`` maps item_id -> component.  Matched components aggregate to a
    new item: union of members (sorted), size-weighted renormalized centroid
    embedding, summed n; tid of the new item is the min member tid (all
    members share a pair, so min works for both the all-pairs and the
    single-pair call sites).
    """
    joined = items.join(
        comp.withColumnRenamed("node", "item_id"), "item_id", "left"
    )
    matched = joined.where(F.col("component").isNotNull())
    unmatched = joined.where(F.col("component").isNull()).drop("component")

    dims = (
        matched.select(
            "component", "n", F.posexplode("emb").alias("pos", "v")
        )
        .groupBy("component", "pos")
        .agg(F.sum(F.col("v") * F.col("n")).alias("s"))
    )
    vecs = dims.groupBy("component").agg(
        F.transform(
            F.array_sort(F.collect_list(F.struct("pos", "s"))), lambda x: x["s"]
        ).alias("raw_emb")
    )
    meta = matched.groupBy("component").agg(
        F.min("tid").alias("tid"),
        F.sort_array(F.flatten(F.collect_list("members"))).alias("members"),
        F.sum("n").cast("int").alias("n"),
    )
    merged = (
        meta.join(vecs, "component")
        .withColumn("emb", _normalize(F.col("raw_emb")))
        .select(
            "tid",
            F.col("component").alias("item_id"),
            "members",
            "emb",
            "n",
        )
    )
    return merged, unmatched


def _match_level(left: DataFrame, right: DataFrame, p: MergeParams,
                 key_cols: list[str]) -> DataFrame:
    """Mutual top-k edges between the two parities (Algorithm 3 lines 3–5)."""
    return mutual_topk_join(
        left,
        right,
        k=p.k,
        max_dist=p.m,
        id_col="item_id",
        emb_col="emb",
        key_cols=key_cols,
        bands=p.bands,
        bits=p.bits,
        seed=p.seed,
    )


def merge_level(items: DataFrame, p: MergeParams) -> DataFrame:
    """One hierarchy level over all table pairs in a single dataflow."""
    paired = items.withColumn("pair_id", (F.col("tid") / 2).cast("int"))
    left = paired.where(F.col("tid") % 2 == 0)
    right = paired.where(F.col("tid") % 2 == 1)
    matches = _match_level(left, right, p, key_cols=["pair_id"])
    edges = matches.select(F.col("id_l").alias("src"), F.col("id_r").alias("dst"))
    comp = connected_components(edges)
    merged, unmatched = merge_matched_items(items, comp)
    out = merged.unionByName(unmatched.select("tid", "item_id", "members", "emb", "n"))
    return out.withColumn("tid", (F.col("tid") / 2).cast("int"))


def merge_level_serial(items: DataFrame, p: MergeParams, n_tables: int) -> DataFrame:
    """Same level, but each table pair merged one after another.

    This is the non-parallel MultiEM of Tables V/VI: identical results,
    sequential per-pair Spark jobs.
    """
    outputs = []
    for pair in range((n_tables + 1) // 2):
        lo, hi = 2 * pair, 2 * pair + 1
        left = items.where(F.col("tid") == lo)
        right = items.where(F.col("tid") == hi)
        if hi >= n_tables:
            outputs.append(left.withColumn("tid", F.lit(pair)))
            continue
        matches = _match_level(left, right, p, key_cols=[])
        edges = matches.select(F.col("id_l").alias("src"), F.col("id_r").alias("dst"))
        comp = connected_components(edges)
        pair_items = items.where(F.col("tid").isin(lo, hi))
        merged, unmatched = merge_matched_items(pair_items, comp)
        both = merged.unionByName(
            unmatched.select("tid", "item_id", "members", "emb", "n")
        )
        # Force this pair's merge now — sequential execution is the point.
        both = both.withColumn("tid", F.lit(pair)).localCheckpoint(eager=True)
        outputs.append(both)
    out = outputs[0]
    for o in outputs[1:]:
        out = out.unionByName(o)
    return out


def hierarchical_merge(
    spark: SparkSession, items: DataFrame, p: MergeParams
) -> tuple[DataFrame, int]:
    """Algorithm 2: merge tables level by level until one table remains.

    Returns ``(final items, number of levels run)``.  Each level is
    localCheckpointed to cut lineage (iterative dataflow).
    """
    items = items.localCheckpoint(eager=True)
    n_tables = items.agg(F.max("tid")).first()[0] + 1
    levels = 0
    while n_tables > 1:
        items = (
            merge_level(items, p)
            if p.parallel
            else merge_level_serial(items, p, n_tables)
        )
        items = items.localCheckpoint(eager=True)
        n_tables = (n_tables + 1) // 2
        levels += 1
    return items, levels
