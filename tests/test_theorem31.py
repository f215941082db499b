"""Statistical validation of Theorem 3.1 (T-TBS sample-size law) and the
Figure 1 sample-size dynamics contrasts between T-TBS and R-TBS."""
import math

import numpy as np
import pytest

from repro.core.rtbs import RTBS
from repro.core.ttbs import TTBS
from repro.rng import make_rng


def batch(t, size):
    return [(t, i) for i in range(size)]


class TestTheorem31:
    def test_expected_size_recursion_ii(self):
        """E[C_t] = n + p^t (C_0 − n) with C_0 = 0."""
        lam, n, b = 0.2, 40, 20
        p = math.exp(-lam)
        T = 12
        trials = 3000
        acc = np.zeros(T)
        for tr in range(trials):
            s = TTBS(lam, n, b, seed=tr)
            for t in range(T):
                s.advance(batch(t, b))
                acc[t] += len(s.items)
        means = acc / trials
        for t in range(T):
            expect = n + p ** (t + 1) * (0 - n)
            se = 6 / math.sqrt(trials)  # crude bound on sd/sqrt(trials)
            assert abs(means[t] - expect) < 6 * se + 0.8, (t, means[t], expect)

    def test_time_average_converges_iii(self):
        """(1/t)ΣC_i → n w.p. 1."""
        lam, n, b = 0.1, 50, 30
        s = TTBS(lam, n, b, seed=42)
        sizes = []
        for t in range(3000):
            s.advance(batch(t, b))
            sizes.append(len(s.items))
        assert abs(np.mean(sizes[500:]) - n) < 2.0

    def test_stationary_variance_eq10(self):
        """Var[C_t] → αn + σ_B²q²/(1−p²) with α=(1+p−q)/(1+p)."""
        lam, n, b = 0.1, 50, 30
        p = math.exp(-lam)
        q = n * (1 - p) / b
        sigma_B2 = 0.0  # deterministic batch size
        alpha = (1 + p - q) / (1 + p)
        expect_var = alpha * n + sigma_B2 * q * q / (1 - p * p)
        s = TTBS(lam, n, b, seed=7)
        sizes = []
        for t in range(6000):
            s.advance(batch(t, b))
            if t > 500:
                sizes.append(len(s.items))
        assert abs(np.var(sizes) - expect_var) < 0.25 * expect_var

    def test_deviation_probability_decays_iv(self):
        """Large positive deviations are rare: Pr[C_t ≥ 1.5n] tiny for
        moderately large n (bounded batch sizes)."""
        lam, n, b = 0.2, 100, 60
        exceed = 0
        trials = 300
        for tr in range(trials):
            s = TTBS(lam, n, b, seed=tr)
            for t in range(60):
                s.advance(batch(t, b))
            if len(s.items) >= 1.5 * n:
                exceed += 1
        assert exceed == 0


class TestFigure1Dynamics:
    """The four regimes of Figure 1, as sample-size assertions."""

    def test_a_growing_batches(self):
        """φ=1.002 growth: T-TBS overflows, R-TBS stays pinned at n."""
        lam, n = 0.05, 1000
        t_s = TTBS(lam, n, 100, seed=0)
        r_s = RTBS(lam, n, seed=0)
        bs = 100.0
        for t in range(500):
            if t >= 200:
                bs *= 1.002 ** 5  # accelerate the paper's drift for test speed
            B = batch(t, int(bs))
            t_s.advance(B)
            r_s.advance(B)
        assert len(t_s.items) > 1.3 * n          # T-TBS overflowed
        assert len(r_s.sample()) == n            # R-TBS pinned

    def test_b_constant_batches(self):
        """Constant B=100, λ=0.1: R-TBS size exactly n; T-TBS fluctuates."""
        lam, n = 0.1, 1000
        t_s = TTBS(lam, n, 100, seed=1)
        r_s = RTBS(lam, n, seed=1)
        t_sizes, r_sizes = set(), set()
        for t in range(300):
            B = batch(t, 100)
            t_s.advance(B)
            r_s.advance(B)
            if t > 50:
                t_sizes.add(len(t_s.items))
                r_sizes.add(len(r_s.sample()))
        assert r_sizes == {n}
        assert len(t_sizes) > 10

    def test_c_uniform_batches(self):
        """B ~ Uniform(0,200): R-TBS bounded by n, T-TBS swings widely."""
        lam, n = 0.1, 1000
        g = make_rng(2)
        t_s = TTBS(lam, n, 100, seed=2)
        r_s = RTBS(lam, n, seed=2)
        t_sizes, r_sizes = [], []
        for t in range(300):
            B = batch(t, int(g.integers(0, 201)))
            t_s.advance(B)
            r_s.advance(B)
            if t > 50:
                t_sizes.append(len(t_s.items))
                r_sizes.append(len(r_s.sample()))
        assert max(r_sizes) <= n
        assert np.std(t_sizes) > np.std(r_sizes)

    def test_d_shrinking_batches(self):
        """φ=0.8 decay: both samplers shrink (underflow is inherent)."""
        lam, n = 0.01, 1000
        t_s = TTBS(lam, n, 100, seed=3)
        r_s = RTBS(lam, n, seed=3)
        bs = 100.0
        # λ=0.01 ⇒ W halves every ~70 steps once batches dry up, so run
        # long enough past the φ=0.8 shrink point for both to underflow.
        for t in range(700):
            if t >= 200:
                bs *= 0.8
            B = batch(t, int(bs))
            t_s.advance(B)
            r_s.advance(B)
        assert len(t_s.items) < 500
        assert r_s.sample_weight < 500
