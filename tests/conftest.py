"""Shared test fixtures: tiny generated datasets and their embeddings.

Session-scoped so the ~6 Spark-expensive artifacts are built once; every
fixture is deterministic (fixed seeds), so assertions can be exact.
"""
import pytest
import pyspark.sql.functions as F

from repro.datasets import generate, get_config
from repro.embedding import with_embeddings, with_text
from repro.eval.metrics import expand_pairs


@pytest.fixture(scope="session")
def geo_data(spark):
    data = generate(spark, get_config("geo"), scale=0.2, seed=0)
    data.records = data.records.cache()
    data.truth = data.truth.cache()
    data.records.count()
    return data


@pytest.fixture(scope="session")
def geo_truth(geo_data):
    t = geo_data.truth_tuples().cache()
    t.count()
    return t


@pytest.fixture(scope="session")
def geo_emb(geo_data):
    cfg = geo_data.config
    emb = (
        with_embeddings(with_text(geo_data.records, cfg.attr_names()))
        .select("uid", "src", "emb")
        .cache()
    )
    emb.count()
    return emb


@pytest.fixture(scope="session")
def geo_truth_pairs(geo_truth):
    p = expand_pairs(geo_truth).cache()
    p.count()
    return p


@pytest.fixture(scope="session")
def music_data(spark):
    data = generate(spark, get_config("music20"), scale=0.06, seed=0)
    data.records = data.records.cache()
    data.truth = data.truth.cache()
    data.records.count()
    return data


@pytest.fixture(scope="session")
def music_truth(music_data):
    t = music_data.truth_tuples().cache()
    t.count()
    return t


def tuples_df(spark, sets):
    """Helper: build a (members array<string>) DataFrame from python sets."""
    rows = [(sorted(s),) for s in sets]
    return spark.createDataFrame(rows, "members array<string>")
