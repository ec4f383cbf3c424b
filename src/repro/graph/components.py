"""Connected components via iterative min-label propagation.

Used for: transitive merging of matched pairs inside a hierarchy level
(Algorithm 3 line 8), pairs→tuples conversion in baselines, and the
multi-source graph baseline.  Labels are the lexicographic-min node id of
the component — deterministic and stable across partitionings.

Each round joins current labels onto the symmetrized edge list, takes the
min incoming label per node, and localCheckpoints to cut lineage.  Rounds
are bounded by the component diameter; convergence is detected by counting
label changes, and exceeding ``max_iter`` raises (our graphs have tiny
diameters — mutual-top-k matchings — so hitting the bound means a bug).
"""
import pyspark.sql.functions as F
from pyspark.sql import DataFrame


def connected_components(
    edges: DataFrame,
    *,
    src: str = "src",
    dst: str = "dst",
    max_iter: int = 30,
) -> DataFrame:
    """Label each node of the undirected graph ``edges`` with its component.

    Returns ``(node, component)`` for every node that appears in an edge;
    isolated nodes are the caller's concern (they are their own component).
    """
    e = edges.select(F.col(src).alias("a"), F.col(dst).alias("b"))
    sym = e.union(e.select(F.col("b").alias("a"), F.col("a").alias("b"))).distinct()
    sym = sym.localCheckpoint(eager=True)
    labels = (
        sym.select(F.col("a").alias("node"))
        .distinct()
        .withColumn("component", F.col("node"))
        .localCheckpoint(eager=True)
    )
    for _ in range(max_iter):
        incoming = (
            sym.join(labels, sym["a"] == labels["node"])
            .groupBy(F.col("b").alias("node"))
            .agg(F.min("component").alias("nbr_min"))
        )
        updated = (
            labels.join(incoming, "node", "left")
            .withColumn(
                "new_component", F.least(F.col("component"), F.col("nbr_min"))
            )
            .select("node", "component", "new_component")
        )
        updated = updated.localCheckpoint(eager=True)
        changed = updated.where(F.col("new_component") != F.col("component")).count()
        labels = updated.select(
            "node", F.col("new_component").alias("component")
        ).localCheckpoint(eager=True)
        if changed == 0:
            return labels
    raise RuntimeError(f"connected_components did not converge in {max_iter} rounds")
