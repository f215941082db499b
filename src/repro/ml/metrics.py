"""Evaluation metrics for the model-management experiments (Sec. 6).

* misclassification rate — fraction of wrongly classified items,
  reported as a percentage (as in Table 1 / Fig. 10 / Fig. 13);
* mean squared error — for the regression study (Sec. 6.3);
* expected shortfall (ES) — the robustness measure of Sec. 6.2
  [McNeil et al., ref. 27]: the z% ES is the average of the worst z%
  of per-batch values (downside risk; higher = less robust).
"""
from __future__ import annotations

import math
from typing import Sequence

import numpy as np


def misclassification_rate(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    """Percentage of incorrect classifications."""
    y_true = np.asarray(y_true)
    y_pred = np.asarray(y_pred)
    if y_true.shape != y_pred.shape:
        raise ValueError("shape mismatch")
    if len(y_true) == 0:
        raise ValueError("empty evaluation batch")
    return 100.0 * float(np.mean(y_true != y_pred))


def mean_squared_error(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    y_true = np.asarray(y_true, dtype=float)
    y_pred = np.asarray(y_pred, dtype=float)
    if y_true.shape != y_pred.shape:
        raise ValueError("shape mismatch")
    if len(y_true) == 0:
        raise ValueError("empty evaluation batch")
    return float(np.mean((y_true - y_pred) ** 2))


def expected_shortfall(values: Sequence[float], z: float) -> float:
    """Average of the worst (largest) ``z`` fraction of ``values``.

    ``z`` is a fraction in (0, 1]; e.g. ``z=0.1`` is the paper's
    "10% ES". The worst ``⌈z·len⌉`` values are averaged so the measure
    is defined even for short series (the paper uses 20% ES for the
    30-batch Naive Bayes run for exactly this reason).
    """
    if not (0.0 < z <= 1.0):
        raise ValueError(f"z must be in (0, 1], got {z}")
    vals = np.asarray(list(values), dtype=float)
    if len(vals) == 0:
        raise ValueError("expected_shortfall of empty sequence")
    k = max(1, math.ceil(z * len(vals)))
    worst = np.sort(vals)[-k:]
    return float(np.mean(worst))
