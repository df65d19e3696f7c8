"""Effectiveness measures of the paper (Sec. 5, "Evaluation Measures").

Precision  = |predicted 2-node partitions that are true matches| / |predicted|
Recall     = |true matches found| / |ground-truth matches|
F-Measure  = harmonic mean of the two.

Both a numpy fast path (used inside sweep tasks) and a DataFrame path
(used by the distributed transformation tests, cross-checked against
the DuckDB oracle) are provided.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame


@dataclass(frozen=True)
class PRF:
    """Precision / recall / F1 triple."""

    precision: float
    recall: float
    f1: float
    n_predicted: int
    n_true: int
    n_correct: int


def prf_from_sets(predicted: set[tuple[int, int]], truth: set[tuple[int, int]]) -> PRF:
    """Compute P/R/F1 from pair sets."""
    correct = len(predicted & truth)
    p = correct / len(predicted) if predicted else 0.0
    r = correct / len(truth) if truth else 0.0
    f1 = 2 * p * r / (p + r) if (p + r) > 0 else 0.0
    return PRF(p, r, f1, len(predicted), len(truth), correct)


def prf_from_arrays(pairs: np.ndarray, truth: set[tuple[int, int]]) -> PRF:
    """P/R/F1 for a matcher's (k, 2) output array."""
    predicted = {(int(a), int(b)) for a, b in pairs}
    return prf_from_sets(predicted, truth)


def prf_dataframe(predicted: DataFrame, truth: DataFrame) -> PRF:
    """Distributed P/R/F1: both inputs are DataFrames(v1, v2)."""
    n_pred = predicted.count()
    n_true = truth.count()
    n_correct = predicted.join(truth, on=["v1", "v2"]).count()
    p = n_correct / n_pred if n_pred else 0.0
    r = n_correct / n_true if n_true else 0.0
    f1 = 2 * p * r / (p + r) if (p + r) > 0 else 0.0
    return PRF(p, r, f1, n_pred, n_true, n_correct)
