"""Benchmark E6 (paper Figure 7): per-batch runtime of the five
distributed TBS implementations in the saturated steady state.

Each benchmark measures one ``advance()`` round of a pre-saturated
sampler on a fresh micro-batch — the same per-round cost the paper
plots. Scale defaults to batch=200k / reservoir=400k (the paper used
10M/20M on a 12-worker cluster); below ~100k rows per batch, per-job
scheduling noise on local[*] swamps the shuffle costs that separate the
implementations. Override with BENCH_BATCH / BENCH_N.
"""
import os

import pytest

from repro.experiments.runtime import IMPLS, make_int_batch

BATCH = int(os.environ.get("BENCH_BATCH", "200000"))
N = int(os.environ.get("BENCH_N", "400000"))
LAM = 0.07
ROUNDS = int(os.environ.get("BENCH_ROUNDS", "5"))


def _saturated_sampler(spark, impl):
    from repro.distributed import DTTBS

    P = spark.sparkContext.defaultParallelism
    if impl == "D-T-TBS":
        sampler = DTTBS(spark, LAM, N, BATCH, seed=0, target_partitions=P)
    else:
        sampler = IMPLS[impl](spark, LAM, N, 0, P)
    t = 0
    for _ in range(-(-N // BATCH) + 1):  # fill + one warm round
        sampler.advance(make_int_batch(spark, t, BATCH, P))
        t += 1
    return sampler, P, t


@pytest.mark.parametrize(
    "impl", ["Cent-KV-RJ", "Cent-KV-CJ", "Cent-CP", "Dist-CP", "D-T-TBS"]
)
def test_fig7_per_batch_runtime(benchmark, spark, impl):
    sampler, P, t0 = _saturated_sampler(spark, impl)
    state = {"t": t0}

    def setup():
        batch = make_int_batch(spark, state["t"], BATCH, P)
        state["t"] += 1
        return (batch,), {}

    benchmark.pedantic(sampler.advance, setup=setup, rounds=ROUNDS, iterations=1)
    benchmark.extra_info["batch_size"] = BATCH
    benchmark.extra_info["reservoir_n"] = N
