"""Synthetic multi-source entity-matching datasets with exact ground truth.

The paper evaluates on six public datasets (Geo, Music-20/200/2000, Person,
Shopee).  Those originals are not redistributable offline, so this package
generates seeded synthetic equivalents that match each dataset's schema,
number of sources, tuple-size distribution, and Table III entity/tuple/pair
ratios (see DESIGN.md §2 for the substitution rationale).
"""
from repro.datasets.generator import DatasetConfig, AttrSpec, MultiSourceData, generate
from repro.datasets.registry import DATASETS, get_config

__all__ = [
    "DatasetConfig",
    "AttrSpec",
    "MultiSourceData",
    "generate",
    "DATASETS",
    "get_config",
]
