"""Sec. 6.1 — runtime comparison of distributed TBS implementations.

Reproduces Figure 7 (five implementations) and Figure 9 (scale-up with
batch size) as runtime tables on local Spark. The stream is a sequence
of integer-payload micro-batches derived from the TPC-H-lite generator
at the requested size; the reservoir is warmed into the saturated
regime first so every measured round exercises the paper's hot path
(delete/insert coordination), exactly as in the cluster experiments
(batch 10M, reservoir 20M, λ=0.07 there; scaled down here).

Implementation labels follow the paper:
  Cent-KV-RJ, Cent-KV-CJ, Cent-CP, Dist-CP, D-T-TBS.
"""
from __future__ import annotations

import time
from typing import Callable

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.distributed import DRTBS, DTTBS

IMPLS: dict[str, Callable[..., object]] = {
    "Cent-KV-RJ": lambda spark, lam, n, seed, P: DRTBS(
        spark, lam, n, storage="kv", retrieval="rj", seed=seed, target_partitions=P
    ),
    "Cent-KV-CJ": lambda spark, lam, n, seed, P: DRTBS(
        spark, lam, n, storage="kv", retrieval="cj", seed=seed, target_partitions=P
    ),
    "Cent-CP": lambda spark, lam, n, seed, P: DRTBS(
        spark, lam, n, storage="cp", strategy="cent", seed=seed, target_partitions=P
    ),
    "Dist-CP": lambda spark, lam, n, seed, P: DRTBS(
        spark, lam, n, storage="cp", strategy="dist", seed=seed, target_partitions=P
    ),
}


def make_int_batch(
    spark: SparkSession, t: int, size: int, n_parts: int, seed: int = 0
) -> DataFrame:
    """A checkpointed integer-payload micro-batch with ``n_parts``
    partitions (checkpointing freezes partition layout, as required by
    the positional decision strategies)."""
    rng = np.random.default_rng([seed, t])
    pdf = pd.DataFrame(
        {
            "t": np.full(size, t, dtype=np.int64),
            "key": rng.integers(0, 1 << 30, size=size),
        }
    )
    df = spark.createDataFrame(pdf)
    if df.rdd.getNumPartitions() != n_parts:
        df = df.repartition(n_parts)
    return df.localCheckpoint(eager=True)


def run_impl(
    spark: SparkSession,
    impl: str,
    *,
    batch_size: int,
    n: int,
    lam: float = 0.07,
    rounds: int = 5,
    warm_rounds: int = 2,
    n_parts: int | None = None,
    seed: int = 0,
) -> dict[str, float]:
    """Time ``rounds`` measured rounds of one implementation; returns
    mean/min per-round seconds. The reservoir is pre-saturated with
    ``ceil(n/batch_size)`` unmeasured batches plus ``warm_rounds``
    warm-up rounds (the paper discards the first round too)."""
    P = n_parts or spark.sparkContext.defaultParallelism
    if impl == "D-T-TBS":
        sampler = DTTBS(spark, lam, n, batch_size, seed=seed, target_partitions=P)
    else:
        sampler = IMPLS[impl](spark, lam, n, seed, P)
    t = 0
    fill = -(-n // batch_size)  # ceil: saturate the reservoir
    for _ in range(fill + warm_rounds):
        sampler.advance(make_int_batch(spark, t, batch_size, P, seed))
        t += 1
    times = []
    for _ in range(rounds):
        batch = make_int_batch(spark, t, batch_size, P, seed)  # not timed
        start = time.perf_counter()
        sampler.advance(batch)
        times.append(time.perf_counter() - start)
        t += 1
    return {
        "mean_s": float(np.mean(times)),
        "min_s": float(np.min(times)),
        "rounds": rounds,
    }


def run_figure7(
    spark: SparkSession,
    *,
    batch_size: int = 50_000,
    n: int = 100_000,
    lam: float = 0.07,
    rounds: int = 5,
    seed: int = 0,
) -> dict[str, dict[str, float]]:
    """Per-batch runtime of the five implementations (Fig. 7)."""
    out = {}
    for impl in ["Cent-KV-RJ", "Cent-KV-CJ", "Cent-CP", "Dist-CP", "D-T-TBS"]:
        out[impl] = run_impl(
            spark, impl, batch_size=batch_size, n=n, lam=lam, rounds=rounds, seed=seed
        )
    return out


def run_figure9(
    spark: SparkSession,
    *,
    batch_sizes=(10_000, 100_000, 500_000),
    lam: float = 0.07,
    rounds: int = 3,
    seed: int = 0,
) -> dict[int, dict[str, float]]:
    """Scale-up of the best D-R-TBS (Dist-CP) with batch size (Fig. 9);
    reservoir size = 2× batch size, as in the paper."""
    out = {}
    for bs in batch_sizes:
        out[bs] = run_impl(
            spark, "Dist-CP", batch_size=bs, n=2 * bs, lam=lam, rounds=rounds, seed=seed
        )
    return out


def format_runtime(results: dict[str, dict[str, float]]) -> str:
    base = results.get("Dist-CP", {}).get("mean_s")
    lines = [f"{'implementation':<12}{'mean s/batch':>14}{'vs Dist-CP':>12}"]
    for impl, r in results.items():
        rel = r["mean_s"] / base if base else float("nan")
        lines.append(f"{impl:<12}{r['mean_s']:>14.3f}{rel:>11.2f}x")
    return "\n".join(lines)
