"""Benchmark E7 (paper Figure 9): D-R-TBS (Dist-CP) per-batch runtime as
the batch size scales; reservoir n = 2× batch, λ=0.07 as in the paper.

The paper's finding: runtime stays roughly flat while per-round
overheads dominate, then rises once the data volume does.
"""
import os

import pytest

from repro.distributed import DRTBS
from repro.experiments.runtime import make_int_batch

LAM = 0.07
SIZES = [10_000, 50_000, 200_000]
ROUNDS = int(os.environ.get("BENCH_ROUNDS", "3"))


@pytest.mark.parametrize("batch_size", SIZES)
def test_fig9_scaleup(benchmark, spark, batch_size):
    n = 2 * batch_size
    P = spark.sparkContext.defaultParallelism
    sampler = DRTBS(
        spark, LAM, n, storage="cp", strategy="dist", seed=0, target_partitions=P
    )
    t = 0
    for _ in range(3):  # saturate (2 batches) + warm round
        sampler.advance(make_int_batch(spark, t, batch_size, P))
        t += 1
    state = {"t": t}

    def setup():
        batch = make_int_batch(spark, state["t"], batch_size, P)
        state["t"] += 1
        return (batch,), {}

    benchmark.pedantic(sampler.advance, setup=setup, rounds=ROUNDS, iterations=1)
    benchmark.extra_info["batch_size"] = batch_size
