"""Prequential (predict-then-update) retraining harness (Sec. 6).

The paper's evaluation protocol: for each incoming batch, first predict
it with a model retrained on the *current* sample, record the metric,
then update the sample with the batch. Samplers store integer indices
into the pre-generated stream arrays, so any sampler from
``repro.core`` plugs in unchanged.
"""
from __future__ import annotations

import math
from typing import Callable, Sequence

import numpy as np

from repro.core import BRS, RTBS, TTBS, SlidingWindow


def make_scheme(name: str, *, lam: float, n: int, b: float, seed: int):
    """Instantiate a sampling scheme by its paper name."""
    if name == "rtbs":
        return RTBS(lam, n, seed=seed)
    if name == "sw":
        return SlidingWindow(n)
    if name == "unif":
        return BRS(n, seed=seed)
    if name == "ttbs":
        return TTBS(lam, n, b, seed=seed)
    raise ValueError(f"unknown scheme {name!r}")


def run_prequential(
    scheme,
    model_factory: Callable[[], object],
    X: np.ndarray,
    y: np.ndarray,
    bounds: Sequence[tuple[int, int]],
    eval_mask: Sequence[bool],
    metric_fn: Callable[[np.ndarray, np.ndarray], float],
    min_fit: int = 2,
) -> list[float]:
    """Stream the batches through ``scheme``; return one metric value per
    evaluated batch (NaN if the sample was too small to fit a model and
    no previous model exists — the paper's "keep the current model"
    policy keeps the last fitted model otherwise)."""
    model = None
    out: list[float] = []
    for (s, e), ev in zip(bounds, eval_mask):
        if ev:
            idx = np.fromiter(scheme.sample(), dtype=np.int64)
            if len(idx) >= min_fit:
                model = model_factory().fit(X[idx], y[idx])
            if model is not None and e > s:
                out.append(metric_fn(y[s:e], model.predict(X[s:e])))
            else:
                out.append(float("nan"))
        scheme.advance(range(s, e))
    return out


def build_stream(
    generator,
    pattern,
    *,
    warmup: int,
    n_batches: int,
    batch_size_fn: Callable[[int], int],
    warmup_size: int,
) -> tuple[np.ndarray, np.ndarray, list[tuple[int, int]], list[bool]]:
    """Materialize warm-up + evaluation batches into flat arrays.

    Warm-up batches are all "normal" mode (Sec. 6.2) and not evaluated;
    batch t (1-based) of the evaluation phase uses ``pattern.mode(t)``
    and ``batch_size_fn(t)`` items.
    """
    Xs, ys, bounds, eval_mask = [], [], [], []
    pos = 0
    for _ in range(warmup):
        Xb, yb = generator.batch("normal", warmup_size)
        Xs.append(Xb)
        ys.append(yb)
        bounds.append((pos, pos + len(yb)))
        eval_mask.append(False)
        pos += len(yb)
    for t in range(1, n_batches + 1):
        size = batch_size_fn(t)
        Xb, yb = generator.batch(pattern.mode(t), size)
        Xs.append(Xb)
        ys.append(yb)
        bounds.append((pos, pos + len(yb)))
        eval_mask.append(True)
        pos += len(yb)
    return np.vstack(Xs), np.concatenate(ys), bounds, eval_mask


def summarize(
    per_batch: Sequence[float], *, skip: int, es_z: float
) -> tuple[float, float]:
    """(accuracy, robustness) = (mean metric, z% expected shortfall) over
    the evaluated batches after index ``skip`` (the paper starts at
    t = 20 "since all three sampling schemes perform poorly during the
    first mode change")."""
    from repro.ml.metrics import expected_shortfall

    vals = [v for v in list(per_batch)[skip:] if not math.isnan(v)]
    if not vals:
        raise ValueError("no evaluated batches after skip")
    return float(np.mean(vals)), expected_shortfall(vals, es_z)
