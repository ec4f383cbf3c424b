"""Benchmark behind Table V: running time — MultiEM vs MultiEM(parallel)
vs representative baselines, on the bench-scale datasets.
"""
import pytest

from repro.baselines import chain_matching, pairwise_matching
from repro.core import MultiEMParams, run_multiem
from repro.embedding import with_embeddings, with_text
from repro.tuned import TUNED


@pytest.fixture(scope="module")
def geo_bundle(spark):
    from repro.datasets import generate, get_config

    data = generate(spark, get_config("geo"), scale=1.0, seed=0)
    data.records = data.records.persist()
    data.records.count()
    emb = (
        with_embeddings(with_text(data.records, data.config.attr_names()))
        .select("uid", "src", "emb")
        .persist()
    )
    emb.count()
    return data, emb


def _params(name, **over):
    t = TUNED[name]
    return MultiEMParams(
        m=t["m"], gamma=t["gamma"], eps=t["eps"], r=0.2,
        bands=t["bands"], bits=t["bits"], **over,
    )


def test_bench_table5_multiem_parallel(benchmark, spark, geo_bundle):
    data, _ = geo_bundle
    benchmark.pedantic(
        lambda: run_multiem(
            spark, data.records, data.config.attr_names(), _params("geo")
        ).tuples.count(),
        rounds=1, iterations=1,
    )


def test_bench_table5_multiem_serial(benchmark, spark, geo_bundle):
    data, _ = geo_bundle
    benchmark.pedantic(
        lambda: run_multiem(
            spark, data.records, data.config.attr_names(),
            _params("geo", parallel=False),
        ).tuples.count(),
        rounds=1, iterations=1,
    )


def test_bench_table5_pairwise_baseline(benchmark, spark, geo_bundle):
    _, emb = geo_bundle
    t = TUNED["geo"]
    benchmark.pedantic(
        lambda: pairwise_matching(
            emb, threshold=0.15, bands=t["bands"], bits=t["bits"]
        ).count(),
        rounds=1, iterations=1,
    )


def test_bench_table5_chain_baseline(benchmark, spark, geo_bundle):
    _, emb = geo_bundle
    t = TUNED["geo"]
    benchmark.pedantic(
        lambda: chain_matching(
            spark, emb, threshold=0.15, bands=t["bands"], bits=t["bits"]
        ).count(),
        rounds=1, iterations=1,
    )
