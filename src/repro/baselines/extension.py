"""Algorithm 5 — Extension for Pairs to Tuples.

The paper converts two-table EM pair predictions to multi-table tuples by
building, for every entity, the tuple ``e ∪ {matched partners of e}`` —
a *star* expansion, NOT a transitive closure.  Conflicting predictions
therefore yield several overlapping (deduplicated) tuples, which is exactly
the transitive-conflict weakness Table IV exposes for pw/c baselines.

``pairs_to_tuples_cc`` is the transitive-closure variant used by the
graph-based baseline (connected components over the pair graph).
"""
import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from repro.graph.components import connected_components


def pairs_to_tuples(pairs: DataFrame) -> DataFrame:
    """Algorithm 5 literally: one star tuple per matched entity, deduped.

    ``pairs``: (id_l, id_r).  Entities with no matches yield size-1 tuples,
    which are dropped (Definition 2 requires l >= 2).
    Returns (members array<string>).
    """
    e = pairs.select(F.col("id_l").alias("a"), F.col("id_r").alias("b"))
    sym = e.union(e.select("b", "a"))
    return (
        sym.groupBy("a")
        .agg(F.collect_set("b").alias("partners"))
        .select(
            F.sort_array(
                F.array_union(F.array(F.col("a")), F.col("partners"))
            ).alias("members")
        )
        .where(F.size("members") >= 2)
        .distinct()
    )


def pairs_to_tuples_cc(pairs: DataFrame) -> DataFrame:
    """Transitive closure: connected components of the pair graph → tuples."""
    edges = pairs.select(F.col("id_l").alias("src"), F.col("id_r").alias("dst"))
    comp = connected_components(edges)
    return (
        comp.groupBy("component")
        .agg(F.sort_array(F.collect_list("node")).alias("members"))
        .where(F.size("members") >= 2)
        .select("members")
    )
