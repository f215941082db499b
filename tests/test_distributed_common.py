"""Tests for the partition-level primitives (repro.distributed.common)."""
import numpy as np
import pandas as pd
import pytest

from repro.distributed.common import (
    central_positions,
    distributed_counts,
    partition_sizes,
    positions_to_pandas,
    select_by_positions,
    select_random_per_partition,
    slots_to_positions,
    tag_positions,
)
from repro.rng import make_rng


@pytest.fixture(scope="module")
def df40(spark):
    pdf = pd.DataFrame({"k": np.arange(40, dtype=np.int64), "v": np.arange(40) * 0.5})
    return spark.createDataFrame(pdf).localCheckpoint(eager=True)


class TestPartitionSizes:
    def test_matches_glom(self, spark, df40):
        sizes = partition_sizes(df40)
        glom = df40.rdd.glom().map(len).collect()
        assert sizes == glom
        assert sum(sizes) == 40

    def test_stable_across_calls(self, df40):
        assert partition_sizes(df40) == partition_sizes(df40)


class TestSlotsToPositions:
    def test_boundaries(self):
        sizes = [7, 8, 7, 8]
        pos = slots_to_positions([0, 6, 7, 14, 15, 29], sizes)
        assert list(pos[0]) == [0, 6]
        assert list(pos[1]) == [0, 7]
        assert list(pos[2]) == [0]
        assert list(pos[3]) == [7]

    def test_out_of_range_raises(self):
        with pytest.raises(IndexError):
            slots_to_positions([30], [7, 8, 7, 8])

    def test_all_slots_covered(self):
        sizes = [3, 0, 5, 2]
        pos = slots_to_positions(list(range(10)), sizes)
        assert sorted((p, o) for p, arr in pos.items() for o in arr) == [
            (0, 0), (0, 1), (0, 2),
            (2, 0), (2, 1), (2, 2), (2, 3), (2, 4),
            (3, 0), (3, 1),
        ]


class TestDecisionStrategies:
    def test_central_positions_valid(self):
        rng = make_rng(0)
        sizes = [7, 8, 7, 8]
        for _ in range(50):
            pos = central_positions(rng, sizes, 13)
            total = sum(len(v) for v in pos.values())
            assert total == 13
            for pid, offs in pos.items():
                assert len(set(offs.tolist())) == len(offs)  # distinct
                assert all(0 <= o < sizes[pid] for o in offs)

    def test_central_positions_k_too_big(self):
        with pytest.raises(ValueError):
            central_positions(make_rng(0), [2, 2], 5)

    def test_distributed_counts_valid(self):
        rng = make_rng(1)
        sizes = [7, 8, 7, 8]
        for _ in range(50):
            cnt = distributed_counts(rng, sizes, 13)
            assert sum(cnt.values()) == 13
            assert all(0 < c <= sizes[pid] for pid, c in cnt.items())

    def test_positions_to_pandas(self):
        pos = {0: np.array([1, 3]), 2: np.array([0])}
        q = positions_to_pandas(pos)
        assert sorted(zip(q["__pid"], q["__pos"])) == [(0, 1), (0, 3), (2, 0)]


class TestSelectByPositions:
    def test_keep_selects_exact_rows(self, spark, df40):
        sizes = partition_sizes(df40)
        rng = make_rng(3)
        pos = central_positions(rng, sizes, 10)
        kept = select_by_positions(df40, pos, keep=True).toPandas()
        assert len(kept) == 10
        assert set(kept["k"]) <= set(range(40))

    def test_keep_drop_partition_universe(self, spark, df40):
        sizes = partition_sizes(df40)
        pos = central_positions(make_rng(4), sizes, 15)
        kept = select_by_positions(df40, pos, keep=True).toPandas()
        dropped = select_by_positions(df40, pos, keep=False).toPandas()
        assert len(kept) == 15 and len(dropped) == 25
        assert sorted(kept["k"]) + sorted(dropped["k"]) != []
        assert sorted(list(kept["k"]) + list(dropped["k"])) == list(range(40))

    def test_empty_positions_drop_is_identity(self, df40):
        out = select_by_positions(df40, {}, keep=False).toPandas()
        assert sorted(out["k"]) == list(range(40))

    def test_empty_positions_keep_is_empty(self, df40):
        out = select_by_positions(df40, {}, keep=True).toPandas()
        assert len(out) == 0


class TestSelectRandomPerPartition:
    def test_counts_respected(self, spark, df40):
        sizes = partition_sizes(df40)
        cnt = distributed_counts(make_rng(5), sizes, 12)
        kept = select_random_per_partition(
            df40, cnt, keep=True, seed=0, round_no=1
        ).toPandas()
        assert len(kept) == 12

    def test_complementarity(self, spark, df40):
        sizes = partition_sizes(df40)
        cnt = distributed_counts(make_rng(6), sizes, 18)
        kept = select_random_per_partition(
            df40, cnt, keep=True, seed=0, round_no=2
        ).toPandas()
        dropped = select_random_per_partition(
            df40, cnt, keep=False, seed=0, round_no=2
        ).toPandas()
        # same (seed, round) -> complementary deterministic choice
        assert sorted(list(kept["k"]) + list(dropped["k"])) == list(range(40))

    def test_different_rounds_differ(self, spark, df40):
        sizes = partition_sizes(df40)
        cnt = {pid: min(2, s) for pid, s in enumerate(sizes) if s > 0}
        k1 = select_random_per_partition(
            df40, cnt, keep=True, seed=0, round_no=1
        ).toPandas()
        k2 = select_random_per_partition(
            df40, cnt, keep=True, seed=0, round_no=99
        ).toPandas()
        assert sorted(k1["k"]) != sorted(k2["k"])

    def test_uniform_marginals(self, spark, df40):
        """Every row should survive keep-k with equal frequency."""
        sizes = partition_sizes(df40)
        counts = np.zeros(40)
        reps = 60
        for r in range(reps):
            cnt = distributed_counts(make_rng(100 + r), sizes, 20)
            kept = select_random_per_partition(
                df40, cnt, keep=True, seed=7, round_no=r
            ).toPandas()
            counts[kept["k"].to_numpy()] += 1
        freq = counts / reps
        # each ~Binomial(60, .5): 5 sigma ≈ 0.32
        assert np.all(np.abs(freq - 0.5) < 0.33)


class TestTagPositions:
    def test_tags_match_glom(self, spark, df40):
        tagged = tag_positions(df40).toPandas()
        glom = df40.rdd.glom().collect()
        expect = {}
        for pid, rows in enumerate(glom):
            for pos, row in enumerate(rows):
                expect[(pid, pos)] = row["k"]
        got = {
            (int(p), int(o)): int(k)
            for p, o, k in tagged[["__pid", "__pos", "k"]].to_numpy()
        }
        assert got == expect
