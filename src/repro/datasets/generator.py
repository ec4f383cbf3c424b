"""Distributed multi-source entity generator with exact ground truth.

A dataset is generated from a :class:`DatasetConfig`: ``n_truth`` real-world
entities, each materialized in 1..S sources (tuple-size distribution from
``size_weights``), each source copy independently corrupted.  Generation runs
as ``mapInPandas`` over ``spark.range`` and every entity derives its own
``numpy`` generator from ``(dataset_seed, run_seed, entity_id)``, so the
output is deterministic and independent of partitioning.

The algorithms under test only ever see ``records`` (uid, src, attributes);
``truth`` (uid -> ent_id) is held separately for evaluation.
"""
from dataclasses import dataclass, field
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
import pyspark.sql.functions as F

from repro.datasets import corrupt
from repro.datasets.vocab import get_vocab


@dataclass(frozen=True)
class AttrSpec:
    """One attribute of a dataset schema.

    ``kind`` selects the canonical value generator; ``per_source`` means the
    value is regenerated independently for every source copy (e.g. the
    per-platform ``id`` columns of the Music datasets — the reason the paper's
    EER module must learn to drop them); ``corr_level`` is the expected number
    of corruption edits applied to each source copy; ``missing_p`` is the
    probability a source copy leaves the value empty.
    """

    name: str
    kind: str
    per_source: bool = False
    corr_level: float = 0.0
    missing_p: float = 0.0
    params: dict = field(default_factory=dict)


@dataclass(frozen=True)
class DatasetConfig:
    """Full recipe for one synthetic multi-source dataset."""

    name: str
    n_sources: int
    attrs: tuple
    n_truth: int
    size_weights: dict  # tuple size (1..S) -> probability
    seed: int = 17
    paper_stats: dict = field(default_factory=dict)  # Table III row, for EXPERIMENTS.md

    def attr_names(self) -> list[str]:
        return [a.name for a in self.attrs]


def _canonical(a: AttrSpec, g: np.random.Generator, vocab) -> str:
    """Generate the canonical (truth) value for one attribute."""
    k = a.kind
    p = a.params
    if k == "words":
        pool = vocab.product_words if p.get("pool") == "product" else vocab.words
        n = int(g.integers(p.get("n_min", 2), p.get("n_max", 5) + 1))
        return " ".join(pool[g.integers(len(pool))] for _ in range(n))
    if k == "geo_name":
        return vocab.geo_name(g)
    if k == "first_name":
        return vocab.first_names[g.integers(len(vocab.first_names))]
    if k == "surname":
        return vocab.surnames[g.integers(len(vocab.surnames))]
    if k == "person_name":
        return (vocab.first_names[g.integers(len(vocab.first_names))]
                + " " + vocab.surnames[g.integers(len(vocab.surnames))])
    if k == "place":
        return vocab.place(g)
    if k == "id":
        digits = p.get("digits", 8)
        lo, hi = 10 ** (digits - 1), 10**digits
        return p.get("prefix", "ID") + str(int(g.integers(lo, hi)))
    if k == "year":
        return str(int(g.integers(1950, 2024)))
    if k == "track_number":
        return str(int(g.integers(1, 21)))
    if k == "length":
        return f"{int(g.integers(1, 9))}:{int(g.integers(0, 60)):02d}"
    if k == "language":
        return vocab.languages[g.integers(len(vocab.languages))]
    if k == "postcode":
        return str(int(g.integers(1000, 10000)))
    if k == "latitude":
        return f"{g.uniform(-90, 90):.4f}"
    if k == "longitude":
        return f"{g.uniform(-180, 180):.4f}"
    raise ValueError(f"unknown attribute kind: {k}")


def _variant(a: AttrSpec, canon: str, g: np.random.Generator, vocab) -> str:
    """Derive one source's copy of an attribute from its canonical value."""
    if g.random() < a.missing_p:
        return ""
    if a.per_source:
        return _canonical(a, g, vocab)
    if a.kind in ("latitude", "longitude"):
        return corrupt.jitter_number(
            g, canon, scale=a.params.get("jitter", 0.001), decimals=4
        )
    return corrupt.corrupt_text(g, canon, a.corr_level)


def _gen_batches(
    cfg: DatasetConfig, run_seed: int, it: Iterator[pd.DataFrame]
) -> Iterator[pd.DataFrame]:
    vocab = get_vocab()
    sizes = np.array(sorted(cfg.size_weights))
    probs = np.array([cfg.size_weights[s] for s in sizes], dtype=float)
    probs = probs / probs.sum()
    cols = ["uid", "src", "ent_id"] + cfg.attr_names()
    for pdf in it:
        rows = []
        for ent_id in pdf["id"].to_numpy():
            g = np.random.default_rng([cfg.seed, run_seed, int(ent_id)])
            size = int(g.choice(sizes, p=probs))
            srcs = g.choice(cfg.n_sources, size=size, replace=False)
            canon = {a.name: _canonical(a, g, vocab) for a in cfg.attrs}
            for src in sorted(int(s) for s in srcs):
                row = [f"s{src}x{ent_id}", src, int(ent_id)]
                row += [_variant(a, canon[a.name], g, vocab) for a in cfg.attrs]
                rows.append(row)
        yield pd.DataFrame(rows, columns=cols)


@dataclass
class MultiSourceData:
    """Generated dataset: the algorithm-visible records plus the ground truth."""

    config: DatasetConfig
    records: DataFrame  # uid, src, <attrs...>
    truth: DataFrame  # uid, ent_id

    def truth_tuples(self) -> DataFrame:
        """Ground-truth matched tuples (sorted member arrays, size >= 2)."""
        return (
            self.truth.groupBy("ent_id")
            .agg(F.sort_array(F.collect_list("uid")).alias("members"))
            .where(F.size("members") >= 2)
            .select("members")
        )

    def stats(self) -> dict:
        """Table III statistics of this generated instance."""
        n_entities = self.records.count()
        per_tuple = (
            self.truth.groupBy("ent_id").count().where(F.col("count") >= 2)
        )
        agg = per_tuple.agg(
            F.count("*").alias("tuples"),
            F.coalesce(F.sum(F.expr("count * (count - 1) / 2")), F.lit(0)).alias("pairs"),
        ).first()
        return {
            "name": self.config.name,
            "srcs": self.config.n_sources,
            "attrs": len(self.config.attrs),
            "entities": n_entities,
            "tuples": int(agg["tuples"]),
            "pairs": int(agg["pairs"]),
        }


def generate(
    spark: SparkSession,
    cfg: DatasetConfig,
    *,
    scale: float = 1.0,
    seed: int = 0,
    partitions: int | None = None,
) -> MultiSourceData:
    """Generate ``cfg`` at ``scale`` (scales ``n_truth``) deterministically."""
    n_truth = max(4, int(cfg.n_truth * scale))
    parts = partitions or max(2, min(64, n_truth // 2000 + 1))
    schema = ", ".join(
        ["uid string", "src int", "ent_id long"]
        + [f"{a.name} string" for a in cfg.attrs]
    )
    full = (
        spark.range(n_truth)
        .repartition(parts)
        .mapInPandas(lambda it: _gen_batches(cfg, seed, it), schema=schema)
    )
    records = full.drop("ent_id")
    truth = full.select("uid", "ent_id")
    return MultiSourceData(config=cfg, records=records, truth=truth)
