"""Benchmark E1 (paper Table 1): one full kNN retraining run.

Times a single-run pass of the Table 1 harness (warm-up + 60 batches of
predict-then-update with a 1000-item sample) — the unit of work whose
cost bounds how often a deployed model could be refreshed. The actual
accuracy table is produced by ``jobs/table1.py``.
"""
from repro.datagen.modes import Periodic
from repro.experiments.table1 import run_table1


def test_table1_single_run(benchmark):
    result = benchmark.pedantic(
        run_table1,
        kwargs=dict(
            n_runs=1, lambdas=(0.07,), patterns=(Periodic(10, 10),), seed=42
        ),
        rounds=3,
        iterations=1,
    )
    (miss, es) = result[("R-TBS λ=0.07", "P(10,10)")]
    assert 0 < miss < 60
    assert es >= miss
