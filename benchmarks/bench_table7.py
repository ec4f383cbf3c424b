"""Benchmark behind Table VII: automated attribute selection (Algorithm 1)."""
import pytest

from repro.core import select_attributes
from repro.datasets import generate, get_config
from repro.tuned import TUNED


@pytest.mark.parametrize("name", ["geo", "music20"])
def test_bench_table7_attr_selection(benchmark, spark, name):
    cfg = get_config(name)
    data = generate(spark, cfg, scale=0.3, seed=0)
    data.records = data.records.persist()
    data.records.count()
    t = TUNED[name]

    sel = benchmark.pedantic(
        lambda: select_attributes(
            spark, data.records, cfg.attr_names(), gamma=t["gamma"], r=0.5
        ),
        rounds=1, iterations=1,
    )
    benchmark.extra_info.update({"dataset": name, "selected": sel.selected})
    assert set(sel.selected) == set(cfg.paper_stats["selected_attrs"])
    data.records.unpersist()
