"""Evaluation: tuple/pair metrics (paper §IV-A) and the timing/memory harness."""
from repro.eval.metrics import tuple_metrics, pair_metrics, evaluate
from repro.eval.harness import measure, Measurement

__all__ = ["tuple_metrics", "pair_metrics", "evaluate", "measure", "Measurement"]
