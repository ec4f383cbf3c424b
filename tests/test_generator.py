"""Tests for the multi-source dataset generator (incl. DuckDB oracle checks)."""
import pytest
import pyspark.sql.functions as F

from repro.datasets import DATASETS, generate, get_config
from repro.datasets.registry import REPRO_SCALE
from repro.oracle import assert_equivalent


def test_registry_has_all_six_paper_datasets():
    assert set(DATASETS) == {
        "geo", "music20", "music200", "music2000", "person", "shopee"
    }


def test_get_config_unknown_raises():
    with pytest.raises(KeyError):
        get_config("nope")


@pytest.mark.parametrize("name", sorted(DATASETS))
def test_config_matches_paper_schema(name):
    cfg = get_config(name)
    ps = cfg.paper_stats
    assert cfg.n_sources == ps["srcs"]
    assert len(cfg.attrs) == ps["attrs"]
    assert name in REPRO_SCALE


@pytest.mark.parametrize("name", sorted(DATASETS))
def test_size_weights_are_distribution(name):
    cfg = get_config(name)
    assert abs(sum(cfg.size_weights.values()) - 1.0) < 1e-3
    assert all(1 <= s <= cfg.n_sources for s in cfg.size_weights)


def test_generator_deterministic(spark):
    cfg = get_config("geo")
    a = generate(spark, cfg, scale=0.05, seed=3).records.orderBy("uid").collect()
    b = generate(spark, cfg, scale=0.05, seed=3).records.orderBy("uid").collect()
    assert a == b


def test_generator_seed_changes_data(spark):
    cfg = get_config("geo")
    a = generate(spark, cfg, scale=0.05, seed=3).records.orderBy("uid").collect()
    b = generate(spark, cfg, scale=0.05, seed=4).records.orderBy("uid").collect()
    assert a != b


def test_generator_partitioning_invariant(spark):
    cfg = get_config("geo")
    a = generate(spark, cfg, scale=0.05, seed=3, partitions=2)
    b = generate(spark, cfg, scale=0.05, seed=3, partitions=7)
    assert a.records.orderBy("uid").collect() == b.records.orderBy("uid").collect()


def test_uids_unique(geo_data):
    n = geo_data.records.count()
    assert geo_data.records.select("uid").distinct().count() == n


def test_schema_columns(geo_data):
    assert geo_data.records.columns == ["uid", "src"] + geo_data.config.attr_names()
    assert geo_data.truth.columns == ["uid", "ent_id"]


def test_each_entity_at_most_once_per_source(spark, geo_data):
    # uid embeds (src, ent_id) so truth join must be 1:1 per (src, ent)
    joined = geo_data.records.join(geo_data.truth, "uid")
    dup = joined.groupBy("src", "ent_id").count().where("count > 1").count()
    assert dup == 0


def test_truth_tuples_match_paper_size_range(geo_data):
    sizes = (
        geo_data.truth_tuples()
        .select(F.size("members").alias("s"))
        .agg(F.min("s"), F.max("s"))
        .first()
    )
    assert sizes[0] >= 2
    assert sizes[1] <= geo_data.config.n_sources


@pytest.mark.parametrize("name", ["geo", "music20", "shopee"])
def test_stats_ratios_near_paper(spark, name):
    """Entities/tuples/pairs ratios of the generated data track Table III."""
    cfg = get_config(name)
    data = generate(spark, cfg, scale=0.15, seed=0)
    data.records = data.records.cache()
    st = data.stats()
    ps = cfg.paper_stats
    ent_per_truth = st["entities"] / (cfg.n_truth * 0.15)
    paper_ent_per_truth = ps["entities"] / cfg.n_truth
    assert ent_per_truth == pytest.approx(paper_ent_per_truth, rel=0.15)
    # pairs per tuple is the key difficulty statistic
    assert st["pairs"] / max(st["tuples"], 1) == pytest.approx(
        ps["pairs"] / ps["tuples"], rel=0.25
    )
    data.records.unpersist()


def test_music_id_is_per_source(spark, music_data):
    """Platform ids differ across copies of the same entity (per_source)."""
    j = music_data.records.join(music_data.truth, "uid")
    n_multi = (
        j.groupBy("ent_id")
        .agg(
            F.count("*").alias("n"), F.countDistinct("id").alias("nid")
        )
        .where("n >= 2")
    )
    bad = n_multi.where("nid < n").count()
    # random 8-digit ids: collisions essentially impossible at this scale
    assert bad == 0


def test_music_missing_values_present(music_data):
    n_empty = music_data.records.where(F.col("language") == "").count()
    assert n_empty > 0


def test_stats_oracle_pairs_formula(spark, geo_data):
    """Oracle: tuple/pair counts equal DuckDB's aggregation over the truth."""
    counts = (
        geo_data.truth.groupBy("ent_id")
        .agg(F.count("*").alias("n"))
        .where("n >= 2")
        .agg(
            F.count("*").alias("tuples"),
            F.sum(F.expr("n * (n - 1) / 2")).cast("double").alias("pairs"),
        )
    )
    assert_equivalent(
        counts,
        """
        SELECT count(*) AS tuples,
               CAST(sum(n * (n - 1) / 2) AS double) AS pairs
        FROM (SELECT ent_id, count(*) AS n FROM truth GROUP BY ent_id)
        WHERE n >= 2
        """,
        truth=geo_data.truth,
    )
    st = geo_data.stats()
    row = counts.first()
    assert st["tuples"] == row["tuples"]
    assert st["pairs"] == int(row["pairs"])


def test_person_has_singleton_majority(spark):
    data = generate(spark, get_config("person"), scale=0.0003, seed=0)
    st = data.stats()
    # Table III: 5M entities but only 500k tuples — singles dominate.
    assert st["tuples"] * 3 < st["entities"]


def test_shopee_single_attribute(spark):
    cfg = get_config("shopee")
    assert cfg.attr_names() == ["title"]
    data = generate(spark, cfg, scale=0.02, seed=0)
    assert data.records.columns == ["uid", "src", "title"]


def test_scale_scales_entities(spark):
    cfg = get_config("geo")
    small = generate(spark, cfg, scale=0.05, seed=0).records.count()
    large = generate(spark, cfg, scale=0.15, seed=0).records.count()
    assert 2.0 < large / small < 4.5
