"""Tests for T-TBS (Algorithm 1) — inclusion law and size behaviour."""
import math
from collections import Counter

import numpy as np
import pytest

from repro.core.ttbs import TTBS


def batch(t, size):
    return [(t, i) for i in range(size)]


class TestConstruction:
    def test_negative_lambda_raises(self):
        with pytest.raises(ValueError):
            TTBS(-0.1, 10, 5)

    def test_too_small_mean_batch_raises(self):
        # requires b >= n(1 - e^-λ)
        with pytest.raises(ValueError):
            TTBS(0.5, 100, 1)

    def test_q_formula(self):
        s = TTBS(0.1, 100, 50)
        assert abs(s.q - 100 * (1 - math.exp(-0.1)) / 50) < 1e-12

    def test_q_at_most_one(self):
        s = TTBS(0.1, 100, 100 * (1 - math.exp(-0.1)))
        assert s.q <= 1.0 + 1e-12


class TestInclusionLaw:
    def test_appearance_probability(self):
        """Pr[x∈S_{t'}] = q·e^{-λ(t'-t)} for x ∈ B_t  (Sec. 3)."""
        lam, n, b, T, trials = 0.2, 20, 30, 6, 6000
        s0 = TTBS(lam, n, b)
        q = s0.q
        cnt = Counter()
        for tr in range(trials):
            s = TTBS(lam, n, b, seed=tr)
            for t in range(1, T + 1):
                s.advance(batch(t, b))
            for (t, _) in s.sample():
                cnt[t] += 1
        for t in range(1, T + 1):
            theory = q * math.exp(-lam * (T - t))
            emp = cnt[t] / (trials * b)
            se = math.sqrt(theory * (1 - theory) / (trials * b))
            assert abs(emp - theory) < 5 * se + 2e-3, (t, theory, emp)

    def test_relative_property_eq1(self):
        lam, n, b, T, trials = 0.3, 15, 20, 5, 6000
        cnt = Counter()
        for tr in range(trials):
            s = TTBS(lam, n, b, seed=10_000 + tr)
            for t in range(1, T + 1):
                s.advance(batch(t, b))
            for (t, _) in s.sample():
                cnt[t] += 1
        p = [cnt[t] / (trials * b) for t in range(1, T + 1)]
        for a, c in zip(p, p[1:]):
            assert abs(a / c - math.exp(-lam)) < 0.08


class TestSizeBehaviour:
    def test_mean_size_converges_to_n(self):
        """Theorem 3.1(ii): E[C_t] = n + p^t (C_0 − n) → n."""
        lam, n, b = 0.1, 50, 30
        sizes = []
        for tr in range(400):
            s = TTBS(lam, n, b, seed=tr)
            for t in range(80):
                s.advance(batch(t, b))
            sizes.append(len(s.sample()))
        assert abs(np.mean(sizes) - n) < 1.5

    def test_size_fluctuates(self):
        # unlike R-TBS, sample size is NOT pinned (Fig. 1(b))
        s = TTBS(0.1, 100, 100, seed=5)
        sizes = set()
        for t in range(200):
            s.advance(batch(t, 100))
            sizes.add(len(s.sample()))
        assert len(sizes) > 5

    def test_growing_batches_overflow(self):
        """Fig. 1(a): batch growth (φ>1) blows up the T-TBS sample."""
        lam, n = 0.05, 1000
        s = TTBS(lam, n, 100, seed=6)
        bs = 100.0
        for t in range(300):
            if t >= 100:
                bs *= 1.02
            s.advance(batch(t, int(bs)))
        assert len(s.sample()) > 2 * n

    def test_dt_decay(self):
        s = TTBS(0.5, 10, 10, seed=7)
        s.advance(batch(0, 10))
        k0 = len(s.sample())
        s.advance([], dt=50.0)  # enormous gap: p^50 ~ 0
        assert len(s.sample()) == 0 or len(s.sample()) < k0 // 5
