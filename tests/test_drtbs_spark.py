"""Tests for D-R-TBS on Spark — all storage/decision variants.

The driver-side weight dynamics (W, C, saturation branching) are shared
with the exhaustively-tested serial R-TBS, so these tests focus on:
(i) the distributed scalar state exactly tracking the serial trajectory
for the same batch-size sequence, (ii) structural invariants of the
distributed reservoir, and (iii) cross-variant agreement.
"""
import math

import pandas as pd
import pytest

from repro.core.rtbs import RTBS
from repro.distributed import DRTBS

SCHEMA = "t long, i long"


def make_batch(spark, t, size):
    return spark.createDataFrame(
        pd.DataFrame({"t": [t] * size, "i": list(range(size))}), schema=SCHEMA
    )


VARIANTS = [
    dict(storage="cp", strategy="dist"),
    dict(storage="cp", strategy="cent"),
    dict(storage="kv", retrieval="cj"),
    dict(storage="kv", retrieval="rj"),
]
IDS = ["cp-dist", "cp-cent", "kv-cj", "kv-rj"]


class TestScalarStateMatchesSerial:
    @pytest.mark.parametrize("kw", VARIANTS, ids=IDS)
    def test_weight_trajectory(self, spark, kw):
        """W_t and C_t depend only on (λ, n, batch sizes): the distributed
        version must track the serial one exactly."""
        lam, n = 0.4, 25
        sched = [40, 10, 0, 5, 0, 12, 30]
        d = DRTBS(spark, lam, n, seed=3, **kw)
        s = RTBS(lam, n, seed=99)
        for t, b in enumerate(sched):
            d.advance(make_batch(spark, t, b))
            s.advance([(t, i) for i in range(b)])
            assert abs(d.total_weight - s.total_weight) < 1e-7, (t, kw)
            assert abs(d.sample_weight - s.sample_weight) < 1e-7, (t, kw)

    def test_invalid_params(self, spark):
        with pytest.raises(ValueError):
            DRTBS(spark, -0.1, 10)
        with pytest.raises(ValueError):
            DRTBS(spark, 0.1, 0)
        with pytest.raises(ValueError):
            DRTBS(spark, 0.1, 10, storage="bogus")


class TestStructuralInvariants:
    @pytest.mark.parametrize("kw", VARIANTS, ids=IDS)
    def test_reservoir_count_is_floor_C(self, spark, kw):
        lam, n = 0.5, 20
        sched = [40, 0, 0, 5, 0, 12, 0, 0, 3]
        d = DRTBS(spark, lam, n, seed=1, **kw)
        for t, b in enumerate(sched):
            d.advance(make_batch(spark, t, b))
            assert d.reservoir.count == math.floor(d.sample_weight + 1e-9), (t, kw)
            # partial present iff C fractional
            frac = d.sample_weight - math.floor(d.sample_weight + 1e-9)
            assert (d.partial is not None) == (frac > 1e-9), (t, kw)

    @pytest.mark.parametrize("kw", VARIANTS, ids=IDS)
    def test_hard_cap_and_realized_size(self, spark, kw):
        lam, n = 0.3, 15
        d = DRTBS(spark, lam, n, seed=2, **kw)
        for t in range(6):
            d.advance(make_batch(spark, t, 20))
            out = d.sample_pandas()
            assert len(out) <= n
            C = d.sample_weight
            assert len(out) in {math.floor(C + 1e-9), math.ceil(C - 1e-9)}

    def test_reservoir_items_all_from_stream(self, spark):
        d = DRTBS(spark, 0.3, 12, seed=4, storage="cp", strategy="dist")
        seen = set()
        for t in range(5):
            d.advance(make_batch(spark, t, 10))
            seen |= {(t, i) for i in range(10)}
            got = {(r.t, r.i) for r in d.sample_pandas().itertuples()}
            assert got <= seen

    def test_no_duplicate_rows_in_reservoir(self, spark):
        d = DRTBS(spark, 0.2, 30, seed=5, storage="cp", strategy="dist")
        for t in range(6):
            d.advance(make_batch(spark, t, 25))
            pdf = d.reservoir.to_pandas()
            assert not pdf.duplicated().any()


class TestTimeBias:
    def test_recent_items_dominate(self, spark):
        """Aggregate age profile of one realized sample follows the decay
        ordering: counts per batch must (weakly) favour recent batches."""
        lam, n, b, T = 0.4, 60, 50, 8
        d = DRTBS(spark, lam, n, seed=6, storage="cp", strategy="dist")
        for t in range(1, T + 1):
            d.advance(make_batch(spark, t, b))
        pdf = d.sample_pandas()
        counts = pdf.groupby("t").size()
        # theory: E[count_t] = b·(C/W)·e^{-λ(T-t)}
        W = sum(b * math.exp(-lam * (T - j)) for j in range(1, T + 1))
        C = min(n, W)
        newest = counts.get(T, 0)
        oldest = counts.get(1, 0) + counts.get(2, 0)
        th_new = b * (C / W)
        assert newest > 0.5 * th_new
        # items from the two oldest batches should be rare
        th_old = b * (C / W) * (math.exp(-lam * (T - 1)) + math.exp(-lam * (T - 2)))
        assert oldest <= max(4 * th_old, 4)

    def test_starvation_shrinks_distributed_sample(self, spark):
        d = DRTBS(spark, 0.7, 10, seed=7, storage="cp", strategy="dist")
        d.advance(make_batch(spark, 0, 30))
        assert len(d.sample_pandas()) == 10
        for t in range(1, 8):
            d.advance(make_batch(spark, t, 0))
        assert d.sample_weight < 2.0
        assert len(d.sample_pandas()) <= 2


class TestCrossVariantAgreement:
    def test_all_variants_same_scalar_state(self, spark):
        lam, n = 0.35, 18
        sched = [25, 5, 0, 40, 0, 0, 9]
        states = []
        for kw in VARIANTS:
            d = DRTBS(spark, lam, n, seed=11, **kw)
            for t, b in enumerate(sched):
                d.advance(make_batch(spark, t, b))
            states.append((round(d.total_weight, 6), round(d.sample_weight, 6),
                           d.reservoir.count))
        assert len(set(states)) == 1, states
