"""Agglomerative clustering baseline (MSCD-HAC stand-in).

Average-linkage hierarchical agglomerative clustering over the same entity
embeddings, cut at a cosine-distance threshold.  Runs on the driver over a
full O(n²) distance matrix with cached per-cluster nearest neighbors —
exactly the scalability profile the paper reports for MSCD-HAC: accurate on
the smallest dataset, **infeasible beyond it** (``InfeasibleError`` maps to
the "\\" entries of Tables IV/V/VI).

Average linkage is reducible, so greedy closest-pair merging with a stop at
``cut`` produces the exact flat clustering of the dendrogram cut.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

MAX_DRIVER_ENTITIES = 6000


class InfeasibleError(RuntimeError):
    """The method cannot run at this input size (paper's "\\" entries)."""


def hac_cluster_labels(emb: np.ndarray, cut: float) -> np.ndarray:
    """Average-linkage HAC labels for unit-norm rows, cut at cosine distance.

    Lance-Williams update for average linkage on a dense distance matrix;
    greedy global-min merging with per-row nearest-neighbor caching.
    """
    n = len(emb)
    d = 1.0 - emb @ emb.T
    np.fill_diagonal(d, np.inf)
    size = np.ones(n)
    active = np.ones(n, dtype=bool)
    parent = np.arange(n)

    nn = d.argmin(axis=1)
    nn_dist = d[np.arange(n), nn]

    def refresh(i: int) -> None:
        row = np.where(active, d[i], np.inf)
        row[i] = np.inf
        nn[i] = row.argmin()
        nn_dist[i] = row[nn[i]]

    for _ in range(n - 1):
        cand = np.where(active, nn_dist, np.inf)
        a = int(cand.argmin())
        if cand[a] > cut or not np.isfinite(cand[a]):
            break
        b = int(nn[a])
        if not active[b] or d[a, b] != nn_dist[a]:
            refresh(a)  # stale cache entry — recompute and retry
            continue
        # Lance-Williams average linkage: d(ab, x) = (na*d(a,x)+nb*d(b,x))/(na+nb)
        na, nb = size[a], size[b]
        new_row = (na * d[a] + nb * d[b]) / (na + nb)
        d[a] = new_row
        d[:, a] = new_row
        d[a, a] = np.inf
        active[b] = False
        d[b] = np.inf
        d[:, b] = np.inf
        size[a] = na + nb
        parent[parent == b] = a
        refresh(a)
        stale = active & ((nn == b) | (nn == a))
        for i in np.flatnonzero(stale):
            refresh(i)
    return parent


def hac_matching(
    spark: SparkSession,
    entity_emb: DataFrame,
    *,
    cut: float = 0.35,
    max_n: int = MAX_DRIVER_ENTITIES,
) -> DataFrame:
    """HAC baseline.  Returns prediction tuples (members array<string>).

    Raises :class:`InfeasibleError` when the input exceeds ``max_n``
    entities (O(n²) memory / O(n²)+ time on the driver).
    """
    n = entity_emb.count()
    if n > max_n:
        raise InfeasibleError(
            f"HAC needs an O(n^2) driver matrix; n={n} exceeds cap {max_n}"
        )
    pdf = entity_emb.select("uid", "emb").toPandas()
    emb = np.stack(pdf["emb"].to_numpy()).astype(np.float64)
    labels = hac_cluster_labels(emb, cut)
    pdf["label"] = labels
    groups = (
        pdf.groupby("label")["uid"]
        .apply(lambda s: sorted(s))
        .reset_index(drop=True)
    )
    tuples = [(list(m),) for m in groups if len(m) >= 2]
    if not tuples:
        return spark.createDataFrame(
            pd.DataFrame({"members": pd.Series([], dtype=object)}),
            "members array<string>",
        )
    return spark.createDataFrame(tuples, "members array<string>")
