"""Parametrized inclusion-law grid: property (1) checked across decay
rates and regimes for every time-biased sampler. Complements the
deep-dive tests with breadth (each cell uses fewer trials but the same
≥4σ tolerance discipline)."""
import math
from collections import Counter

import pytest

from repro.core.btbs import BTBS
from repro.core.rtbs import RTBS
from repro.core.ttbs import TTBS


def _empirical_probs(make_sampler, schedule, trials, seed0):
    cnt = Counter()
    for tr in range(trials):
        s = make_sampler(seed0 + tr)
        for t, b in enumerate(schedule, start=1):
            s.advance([(t, i) for i in range(b)])
        for (t, _i) in s.sample():
            cnt[t] += 1
    return {
        t: cnt[t] / (trials * b)
        for t, b in enumerate(schedule, start=1)
        if b > 0
    }


LAMS = [0.1, 0.3, 0.7, 1.2]


class TestRTBSGrid:
    @pytest.mark.parametrize("lam", LAMS)
    def test_saturated(self, lam):
        n, schedule, trials = 10, [6] * 5, 3000
        probs = _empirical_probs(
            lambda sd: RTBS(lam, n, seed=sd), schedule, trials, seed0=int(lam * 1e4)
        )
        T = len(schedule)
        W = sum(6 * math.exp(-lam * (T - j)) for j in range(1, T + 1))
        C = min(n, W)
        for t, emp in probs.items():
            theory = (C / W) * math.exp(-lam * (T - t))
            se = math.sqrt(max(theory * (1 - theory), 1e-4) / (trials * 6))
            assert abs(emp - theory) < 5 * se + 5e-3, (lam, t, theory, emp)

    @pytest.mark.parametrize("lam", LAMS)
    def test_unsaturated(self, lam):
        n, schedule, trials = 200, [6] * 5, 2000
        probs = _empirical_probs(
            lambda sd: RTBS(lam, n, seed=sd), schedule, trials, seed0=7 + int(lam * 1e4)
        )
        T = len(schedule)
        for t, emp in probs.items():
            theory = math.exp(-lam * (T - t))  # C == W when unsaturated
            se = math.sqrt(max(theory * (1 - theory), 1e-4) / (trials * 6))
            assert abs(emp - theory) < 5 * se + 5e-3, (lam, t, theory, emp)


class TestTTBSGrid:
    @pytest.mark.parametrize("lam", LAMS)
    def test_inclusion(self, lam):
        n, b, schedule, trials = 12, 20, [20] * 4, 2500
        q = n * (1 - math.exp(-lam)) / b
        probs = _empirical_probs(
            lambda sd: TTBS(lam, n, b, seed=sd), schedule, trials, seed0=int(lam * 1e5)
        )
        T = len(schedule)
        for t, emp in probs.items():
            theory = q * math.exp(-lam * (T - t))
            se = math.sqrt(max(theory * (1 - theory), 1e-4) / (trials * 20))
            assert abs(emp - theory) < 5 * se + 5e-3, (lam, t, theory, emp)


class TestBTBSGrid:
    @pytest.mark.parametrize("lam", LAMS)
    def test_inclusion(self, lam):
        schedule, trials = [15] * 4, 2500
        probs = _empirical_probs(
            lambda sd: BTBS(lam, seed=sd), schedule, trials, seed0=int(lam * 2e5)
        )
        T = len(schedule)
        for t, emp in probs.items():
            theory = math.exp(-lam * (T - t))
            se = math.sqrt(max(theory * (1 - theory), 1e-4) / (trials * 15))
            assert abs(emp - theory) < 5 * se + 5e-3, (lam, t, theory, emp)


class TestDtVariants:
    """Real-valued inter-batch gaps: decay must track e^{-λ·dt}."""

    @pytest.mark.parametrize("dt", [0.25, 0.5, 2.0, 3.7])
    def test_rtbs_weight_with_dt(self, dt):
        lam = 0.3
        r = RTBS(lam, 100, seed=0)
        r.advance([(0, i) for i in range(10)], dt=1.0)
        r.advance([], dt=dt)
        assert abs(r.total_weight - 10 * math.exp(-lam * dt)) < 1e-9

    @pytest.mark.parametrize("dt", [0.5, 2.0])
    def test_btbs_inclusion_with_dt(self, dt):
        lam, trials = 0.4, 4000
        keep = 0
        for tr in range(trials):
            s = BTBS(lam, seed=tr)
            s.advance([(0, 0)])
            s.advance([], dt=dt)
            keep += len(s.sample())
        theory = math.exp(-lam * dt)
        se = math.sqrt(theory * (1 - theory) / trials)
        assert abs(keep / trials - theory) < 5 * se + 1e-3
