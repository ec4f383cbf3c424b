"""Timing / memory measurement for the Table V/VI comparisons.

Local-mode Spark runs driver and executors in one JVM, so "memory usage" is
approximated as: peak driver-python RSS (ru_maxrss) observed so far plus the
JVM's used heap after the run.  Absolute values are not comparable to the
paper's testbed (see DESIGN.md §2) — the tables compare methods relative to
each other under the identical measurement.
"""
import resource
import time
from dataclasses import dataclass
from typing import Any, Callable

from pyspark.sql import SparkSession


def _python_rss_mb() -> float:
    """Current (not lifetime-peak) resident set of the driver python.

    ru_maxrss would be monotone across successive method runs in one
    process, making per-method comparisons meaningless; /proc VmRSS is the
    instantaneous figure.  Falls back to ru_maxrss off-Linux.
    """
    try:
        with open("/proc/self/status") as f:
            for line in f:
                if line.startswith("VmRSS:"):
                    return int(line.split()[1]) / 1024.0
    except OSError:
        pass
    return resource.getrusage(resource.RUSAGE_SELF).ru_maxrss / 1024.0


def _jvm_heap_mb(spark: SparkSession) -> float:
    rt = spark._jvm.java.lang.Runtime.getRuntime()
    return float(rt.totalMemory() - rt.freeMemory()) / (1024.0 * 1024.0)


@dataclass
class Measurement:
    """One measured method run."""

    result: Any
    seconds: float
    mem_mb: float

    def human_time(self) -> str:
        s = self.seconds
        if s < 60:
            return f"{s:.1f}s"
        if s < 3600:
            return f"{s / 60:.1f}m"
        return f"{s / 3600:.1f}h"


def measure(spark: SparkSession, fn: Callable[[], Any]) -> Measurement:
    """Run ``fn`` and record wall time and approximate memory footprint."""
    t0 = time.perf_counter()
    result = fn()
    seconds = time.perf_counter() - t0
    mem = _python_rss_mb() + _jvm_heap_mb(spark)
    return Measurement(result=result, seconds=seconds, mem_mb=mem)
