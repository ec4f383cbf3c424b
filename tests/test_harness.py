"""Tests for the timing/memory harness."""
import time

from repro.eval import Measurement, measure


def test_measure_times_and_memory(spark):
    m = measure(spark, lambda: time.sleep(0.05) or 42)
    assert m.result == 42
    assert m.seconds >= 0.05
    assert m.mem_mb > 0


def test_human_time_formats(spark):
    assert Measurement(None, 12.3, 0).human_time() == "12.3s"
    assert Measurement(None, 130.0, 0).human_time().endswith("m")
    assert Measurement(None, 7200.0, 0).human_time().endswith("h")
