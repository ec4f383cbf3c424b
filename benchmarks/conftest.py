"""Benchmark fixtures: datasets generated once per session at bench scale.

Benchmarks run the same code paths as jobs/ but at reduced scale so the
bench suite completes in minutes; the full-scale numbers live in
EXPERIMENTS.md (produced by jobs/).
"""
import pytest

from repro.datasets import generate, get_config

BENCH_SCALE = {"geo": 1.0, "music20": 0.3, "shopee": 0.3}


@pytest.fixture(scope="session", params=sorted(BENCH_SCALE))
def bench_dataset(request, spark):
    name = request.param
    data = generate(spark, get_config(name), scale=BENCH_SCALE[name], seed=0)
    data.records = data.records.persist()
    data.records.count()
    truth = data.truth_tuples().persist()
    truth.count()
    return name, data, truth
