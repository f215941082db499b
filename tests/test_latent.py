"""Tests for the latent fractional sample (Sec. 4.1, eqs. (2)-(3))."""
import numpy as np
import pytest

from repro.core.latent import LatentSample, frac
from repro.rng import make_rng


@pytest.fixture
def rng():
    return make_rng(99)


class TestFrac:
    @pytest.mark.parametrize(
        "x,expected", [(3.6, 0.6), (0.0, 0.0), (5.0, 0.0), (0.25, 0.25)]
    )
    def test_values(self, x, expected):
        assert abs(frac(x) - expected) < 1e-12


class TestInvariants:
    def test_empty_ok(self):
        LatentSample().check_invariants()

    def test_integral_weight_ok(self):
        LatentSample(full=[1, 2, 3], weight=3.0).check_invariants()

    def test_fractional_weight_ok(self):
        LatentSample(full=[1, 2, 3], partial=4, weight=3.6).check_invariants()

    def test_missing_partial_raises(self):
        with pytest.raises(AssertionError):
            LatentSample(full=[1, 2, 3], weight=3.6).check_invariants()

    def test_spurious_partial_raises(self):
        with pytest.raises(AssertionError):
            LatentSample(full=[1, 2, 3], partial=9, weight=3.0).check_invariants()

    def test_wrong_full_count_raises(self):
        with pytest.raises(AssertionError):
            LatentSample(full=[1, 2], weight=3.0).check_invariants()

    def test_negative_weight_raises(self):
        with pytest.raises(AssertionError):
            LatentSample(weight=-0.5).check_invariants()

    def test_float_noise_tolerated(self):
        # 3.9999999998 should be treated as 4 full items
        LatentSample(full=[1, 2, 3, 4], weight=3.9999999998).check_invariants()


class TestFootprint:
    def test_no_partial(self):
        assert LatentSample(full=[1, 2], weight=2.0).footprint == 2

    def test_with_partial(self):
        L = LatentSample(full=[1, 2], partial=3, weight=2.5)
        assert L.footprint == 3

    def test_footprint_bound(self):
        # footprint <= floor(C) + 1 always (Sec. 4.1)
        L = LatentSample(full=[1, 2, 3], partial=4, weight=3.6)
        assert L.footprint <= int(L.weight) + 1


class TestRealize:
    def test_integral_weight_deterministic(self, rng):
        L = LatentSample(full=[1, 2, 3], weight=3.0)
        for _ in range(50):
            assert sorted(L.realize(rng)) == [1, 2, 3]

    def test_partial_inclusion_rate(self):
        # Pr[partial included] = frac(C) = 0.6 (eq. (2)); E[|S|] = C.
        L = LatentSample(full=[1, 2, 3], partial=9, weight=3.6)
        rng = make_rng(4)
        sizes = [len(L.realize(rng)) for _ in range(20000)]
        assert set(sizes) == {3, 4}
        assert abs(np.mean(sizes) - 3.6) < 0.02

    def test_full_items_always_included(self, rng):
        L = LatentSample(full=[1, 2], partial=3, weight=2.2)
        for _ in range(100):
            s = L.realize(rng)
            assert {1, 2} <= set(s)
            assert set(s) <= {1, 2, 3}


class TestSwapMove:
    def test_swap1_exchanges(self, rng):
        L = LatentSample(full=[1, 2, 3], partial=9, weight=3.5)
        L.swap1(rng)
        assert L.partial in {1, 2, 3}
        assert 9 in L.full
        assert len(L.full) == 3

    def test_swap1_without_partial(self, rng):
        L = LatentSample(full=[1, 2, 3], weight=3.0)
        L.swap1(rng)
        assert L.partial in {1, 2, 3}
        assert len(L.full) == 2

    def test_move1_ejects_partial(self, rng):
        L = LatentSample(full=[1, 2, 3], partial=9, weight=3.5)
        L.move1(rng)
        assert L.partial in {1, 2, 3}
        assert 9 not in L.full
        assert len(L.full) == 2

    def test_swap1_uniform_choice(self):
        rng = make_rng(11)
        counts = {1: 0, 2: 0, 3: 0}
        for _ in range(9000):
            L = LatentSample(full=[1, 2, 3], partial=9, weight=3.5)
            L.swap1(rng)
            counts[L.partial] += 1
        for c in counts.values():
            assert abs(c / 9000 - 1 / 3) < 0.02


class TestCopy:
    def test_copy_is_independent(self, rng):
        L = LatentSample(full=[1, 2, 3], partial=9, weight=3.5)
        M = L.copy()
        M.full.append(10)
        M.weight = 4.5
        assert L.full == [1, 2, 3] and L.weight == 3.5

    def test_items(self):
        L = LatentSample(full=[1, 2], partial=3, weight=2.5)
        assert sorted(L.items()) == [1, 2, 3]
        L2 = LatentSample(full=[1, 2], weight=2.0)
        assert sorted(L2.items()) == [1, 2]
