"""Benchmark the serial samplers' per-batch cost (supporting data for
Sec. 6.1's observation that T-TBS is far cheaper than reservoir-based
schemes, and that R-TBS stays lightweight relative to B-Chao's
overweight-item bookkeeping)."""
import pytest

from repro.core import BRS, RTBS, TTBS, BChao

BATCH = 10_000
N = 20_000
LAM = 0.07


def _mk(name):
    if name == "rtbs":
        return RTBS(LAM, N, seed=0)
    if name == "ttbs":
        return TTBS(LAM, N, BATCH, seed=0)
    if name == "brs":
        return BRS(N, seed=0)
    if name == "chao":
        return BChao(LAM, N, seed=0)
    raise AssertionError(name)


@pytest.mark.parametrize("name", ["rtbs", "ttbs", "brs", "chao"])
def test_serial_sampler_per_batch(benchmark, name):
    sampler = _mk(name)
    state = {"t": 0}
    for _ in range(3):  # reach steady state
        sampler.advance([(state["t"], i) for i in range(BATCH)])
        state["t"] += 1

    def setup():
        state["t"] += 1
        return ([(state["t"], i) for i in range(BATCH)],), {}

    benchmark.pedantic(sampler.advance, setup=setup, rounds=5, iterations=1)
