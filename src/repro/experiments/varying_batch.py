"""Sec. 6.2 "Varying batch size" — kNN under non-constant arrival rates.

Two regimes at λ=0.07, Periodic(10,10):
* batch sizes i.i.d. Uniform(0, 200);
* deterministic growth of 2% per batch after warm-up (φ=1.02).

The paper reports ratios relative to R-TBS: Miss% 1.16×/1.14× for SW
and 1.47×/1.40× for Unif; ES 1.82×/1.98× (SW) and 1.76×/1.78× (Unif).
"""
from __future__ import annotations

import numpy as np

from repro.datagen import batches
from repro.datagen.modes import Periodic
from repro.experiments.table1 import run_table1


def run_varying_batch(
    *,
    n_runs: int = 30,
    lam: float = 0.07,
    n: int = 1000,
    b: int = 100,
    n_batches: int = 60,
    seed: int = 0,
) -> dict[str, dict[str, tuple[float, float]]]:
    """Returns {"uniform"|"growing": {scheme: (Miss%, ES)}}."""
    out = {}
    for regime, fn_factory in (
        ("uniform", lambda run: batches.uniform(0, 200, seed=[seed, run, 3])),
        ("growing", lambda run: batches.multiplicative(b, 1.02, t0=1)),
    ):
        # run_table1 handles one batch_size_fn for all runs; for the
        # uniform regime each run needs its own RNG, so sweep runs here.
        per_scheme: dict[str, list[tuple[float, float]]] = {}
        for run in range(n_runs):
            res = run_table1(
                n_runs=1,
                lambdas=(lam,),
                patterns=(Periodic(10, 10),),
                n=n,
                b=b,
                n_batches=n_batches,
                seed=[seed, run, regime == "uniform"],
                batch_size_fn=fn_factory(run),
            )
            for (label, _pattern), val in res.items():
                per_scheme.setdefault(label, []).append(val)
        out[regime] = {
            label: (
                float(np.mean([v[0] for v in vals])),
                float(np.mean([v[1] for v in vals])),
            )
            for label, vals in per_scheme.items()
        }
    return out


def ratios_vs_rtbs(results: dict[str, tuple[float, float]]) -> dict[str, tuple[float, float]]:
    """(Miss ratio, ES ratio) of each scheme relative to R-TBS."""
    (rt_label,) = [k for k in results if k.startswith("R-TBS")]
    rm, re_ = results[rt_label]
    return {
        label: (m / rm, e / re_)
        for label, (m, e) in results.items()
        if label != rt_label
    }
