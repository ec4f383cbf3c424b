"""Benchmark behind Table III: dataset generation + statistics."""
import pytest

from repro.datasets import generate, get_config


@pytest.mark.parametrize("name", ["geo", "music20", "shopee"])
def test_bench_table3_generate_stats(benchmark, spark, name):
    cfg = get_config(name)

    def run():
        data = generate(spark, cfg, scale=0.2, seed=0)
        data.records = data.records.persist()
        st = data.stats()
        data.records.unpersist()
        return st

    st = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update(
        {k: st[k] for k in ("entities", "tuples", "pairs")}
    )
    assert st["entities"] > 0
