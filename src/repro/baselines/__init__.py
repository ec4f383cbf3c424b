"""Baselines the paper compares MultiEM against (Table IV/V/VI rows).

Stand-in mapping (offline substitutions, DESIGN.md §2):

* ``unsupervised``  — AutoFuzzyJoin: unsupervised mutual-top-1 joiner with a
  conservative fixed threshold, pairwise (pw) and chain (c) extensions.
* ``supervised``    — Ditto / PromptEM: pairwise classifier whose decision
  threshold is fit on a 5% labeled sample, pw and c extensions.
* ``graph_sup``     — ALMSER-GB: multi-source similarity graph + learned
  threshold + connected components.
* ``hac``           — MSCD-HAC: average-linkage agglomerative clustering on
  the driver; raises ``InfeasibleError`` beyond its size cap (the paper's
  "\\" entries).
"""
from repro.baselines.two_table import all_pairs_mutual_topk
from repro.baselines.extension import pairs_to_tuples, pairs_to_tuples_cc
from repro.baselines.pairwise import pairwise_matching
from repro.baselines.chain import chain_matching
from repro.baselines.supervised import learn_threshold
from repro.baselines.graph_sup import graph_supervised_matching
from repro.baselines.hac import InfeasibleError, hac_matching

__all__ = [
    "all_pairs_mutual_topk",
    "pairs_to_tuples",
    "pairs_to_tuples_cc",
    "pairwise_matching",
    "chain_matching",
    "learn_threshold",
    "graph_supervised_matching",
    "hac_matching",
    "InfeasibleError",
]
