"""Evaluator component (paper §4.3): metrics + accuracy-matrix harness."""
from repro.evaluator.evaluator import Evaluator
from repro.evaluator.metrics import (
    Accuracy,
    DecomposableMetric,
    HolisticMetric,
    RocAuc,
)

__all__ = [
    "Evaluator",
    "DecomposableMetric",
    "HolisticMetric",
    "Accuracy",
    "RocAuc",
]
