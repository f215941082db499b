"""Benchmarks E3-E5: one full retraining run of each application
experiment (regression saturated/unsaturated, Naive Bayes). The
accuracy tables themselves come from jobs/; these benches track the
cost of regenerating each one."""
from repro.datagen.modes import Periodic
from repro.experiments.naive_bayes_exp import run_naive_bayes
from repro.experiments.regression_exp import run_regression


def test_regression_saturated_run(benchmark):
    res = benchmark.pedantic(
        run_regression,
        kwargs=dict(n=1000, pattern=Periodic(10, 10), n_runs=1, seed=42),
        rounds=3,
        iterations=1,
    )
    assert set(res) == {"R-TBS", "SW", "Unif"}


def test_regression_unsaturated_run(benchmark):
    res = benchmark.pedantic(
        run_regression,
        kwargs=dict(n=1600, pattern=Periodic(16, 16), n_runs=1, seed=42),
        rounds=3,
        iterations=1,
    )
    assert set(res) == {"R-TBS", "SW", "Unif"}


def test_naive_bayes_run(benchmark):
    res = benchmark.pedantic(
        run_naive_bayes, kwargs=dict(n_runs=1, seed=42), rounds=3, iterations=1
    )
    assert set(res) == {"R-TBS", "SW", "Unif"}
