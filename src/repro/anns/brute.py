"""Exact brute-force kNN join — the oracle the LSH path is validated against.

Cross-join + distance + window rank.  O(n·m) rows: only for tests and tiny
inputs (the module refuses obviously-explosive sizes to protect CI).
"""
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, Window

from repro.anns.dist import add_cosine_dist

_MAX_CROSS_ROWS = 30_000_000


def brute_knn_join(
    left: DataFrame,
    right: DataFrame,
    *,
    k: int = 1,
    max_dist: float = 1.0,
    id_col: str = "id",
    emb_col: str = "emb",
    mutual: bool = False,
) -> DataFrame:
    """Exact (mutual) top-k join. Returns ``(id_l, id_r, dist)``."""
    nl, nr = left.count(), right.count()
    if nl * nr > _MAX_CROSS_ROWS:
        raise ValueError(
            f"brute_knn_join would materialize {nl * nr} pairs; use the LSH join"
        )
    lf = left.select(F.col(id_col).alias("id_l"), F.col(emb_col).alias("emb_l"))
    rf = right.select(F.col(id_col).alias("id_r"), F.col(emb_col).alias("emb_r"))
    cands = add_cosine_dist(lf.crossJoin(rf)).where(F.col("dist") <= max_dist)
    wl = Window.partitionBy("id_l").orderBy("dist", "id_r")
    out = cands.withColumn("rank_l", F.row_number().over(wl))
    if mutual:
        wr = Window.partitionBy("id_r").orderBy("dist", "id_l")
        out = out.withColumn("rank_r", F.row_number().over(wr)).where(
            (F.col("rank_l") <= k) & (F.col("rank_r") <= k)
        )
    else:
        out = out.where(F.col("rank_l") <= k)
    return out.select("id_l", "id_r", "dist")
