"""The paper's contribution: the MultiEM pipeline.

``attr_select``  — Algorithm 1, automated attribute selection (EER)
``merging``      — Algorithms 2–3, table-wise hierarchical merging
``pruning``      — Algorithm 4, density-based pruning
``pipeline``     — end-to-end MultiEM with ablation/parallel switches
"""
from repro.core.attr_select import AttrSelection, select_attributes
from repro.core.merging import MergeParams, initial_items, hierarchical_merge
from repro.core.pruning import prune_tuples
from repro.core.pipeline import MultiEMParams, MultiEMResult, run_multiem

__all__ = [
    "AttrSelection",
    "select_attributes",
    "MergeParams",
    "initial_items",
    "hierarchical_merge",
    "prune_tuples",
    "MultiEMParams",
    "MultiEMResult",
    "run_multiem",
]
