"""Distributed approximate nearest-neighbor search (HNSW stand-in).

Random-hyperplane LSH banding expressed as DataFrame joins, plus the mutual
top-k join (paper Eq. 1) used by the merging phase, and an exact brute-force
kNN join used as the test oracle and for tiny inputs.
"""
from repro.anns.lsh import with_signatures, lsh_candidates
from repro.anns.topk import mutual_topk_join, topk_join
from repro.anns.brute import brute_knn_join
from repro.anns.dist import cosine_dist_udf, add_cosine_dist

__all__ = [
    "with_signatures",
    "lsh_candidates",
    "mutual_topk_join",
    "topk_join",
    "brute_knn_join",
    "cosine_dist_udf",
    "add_cosine_dist",
]
