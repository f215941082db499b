"""Sec. 6.3 — linear-regression model management.

Saturated case: n=1000 for all schemes, Periodic(10,10).
Unsaturated case: n=1600 — R-TBS stabilizes at b/(1−e^{-λ}) ≈ 1479 <
1600 while SW/Unif fill to 1600 — run on Periodic(10,10) and
Periodic(16,16). Metrics: MSE across evaluated batches and its 10% ES.
"""
from __future__ import annotations

import math
from typing import Sequence

import numpy as np

from repro.datagen.batches import constant
from repro.datagen.modes import Periodic
from repro.datagen.regression import RegressionStream
from repro.experiments.harness import (
    build_stream,
    make_scheme,
    run_prequential,
    summarize,
)
from repro.ml.linreg import LinearRegression
from repro.ml.metrics import mean_squared_error

SCHEMES = ("rtbs", "sw", "unif")
LABELS = {"rtbs": "R-TBS", "sw": "SW", "unif": "Unif"}


def run_regression(
    *,
    n: int,
    pattern=Periodic(10, 10),
    n_runs: int = 30,
    lam: float = 0.07,
    b: int = 100,
    warmup: int = 100,
    n_batches: int = 60,
    skip: int = 20,
    es_z: float = 0.10,
    seed: int = 0,
) -> dict[str, tuple[float, float]]:
    """Returns {scheme_label: (MSE, ES)} averaged over runs."""
    out: dict[str, tuple[float, float]] = {}
    for name in SCHEMES:
        mses, ess = [], []
        for run in range(n_runs):
            gen = RegressionStream(seed=[seed, run, n])
            X, y, bounds, eval_mask = build_stream(
                gen,
                pattern,
                warmup=warmup,
                n_batches=n_batches,
                batch_size_fn=constant(b),
                warmup_size=b,
            )
            scheme = make_scheme(name, lam=lam, n=n, b=b, seed=[seed, run, 29])
            per_batch = run_prequential(
                scheme,
                LinearRegression,
                X,
                y,
                bounds,
                eval_mask,
                mean_squared_error,
                min_fit=2,
            )
            m, e = summarize(per_batch, skip=skip, es_z=es_z)
            mses.append(m)
            ess.append(e)
        out[LABELS[name]] = (float(np.mean(mses)), float(np.mean(ess)))
    return out


def stable_rtbs_sample_size(*, lam: float = 0.07, b: int = 100) -> float:
    """The steady-state unsaturated R-TBS sample weight b/(1−e^{-λ}) —
    the paper reports 1479 for b=100, λ=0.07."""
    return b / (1.0 - math.exp(-lam))


def format_regression(results: dict[str, tuple[float, float]], title: str) -> str:
    lines = [title, f"{'scheme':<8}{'MSE':>10}{'10% ES':>10}"]
    for label in ("R-TBS", "SW", "Unif"):
        m, e = results[label]
        lines.append(f"{label:<8}{m:>10.2f}{e:>10.2f}")
    return "\n".join(lines)
