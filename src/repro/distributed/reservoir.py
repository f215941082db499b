"""Distributed reservoir backends (Sec. 5.2).

Two implementations of the paper's reservoir data structure:

* ``CoPartitionedReservoir`` — the paper's recommended design: reservoir
  partitions coincide with incoming-batch partitions, inserts/deletes
  are applied locally by each worker (no shuffle). Supports both the
  *centralized* (driver-generated slot positions) and *distributed*
  (per-partition multivariate-hypergeometric counts) decision
  strategies of Sec. 5.3.

* ``KVReservoir`` — simulates an off-the-shelf distributed key-value
  store (Memcached/Redis in the paper): every item lives under a slot
  key, the store is hash-partitioned by slot, and inserts must be
  *shuffled* to their slot's partition (the simulated network I/O).
  Insert retrieval from the batch is either a repartition join ("RJ",
  shuffles the whole batch) or a co-located join ("CJ", broadcast
  position lists + local filter — Fig. 6(a)).

Both freeze lineage with eager ``localCheckpoint`` every round,
standing in for the paper's in-place RDD updates + checkpointing
(Appendix E).
"""
from __future__ import annotations

from typing import Any, Iterator, Mapping

import numpy as np
import pandas as pd
from pyspark import TaskContext
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.distributed.common import (
    central_positions,
    distributed_counts,
    partition_sizes,
    select_by_positions,
    select_mixed,
    select_random_per_partition,
    tag_positions,
)
from repro.rng import make_rng


def _decision_items(decision):
    """(pid, payload) pairs of a cent (offsets) or dist (count) decision."""
    _kind, payload = decision
    return payload.items()


class CoPartitionedReservoir:
    """Reservoir co-partitioned with incoming batches (Fig. 5(b)).

    Performance notes mirroring the paper's design rationale:

    * per-partition sizes are tracked *on the driver* and updated
      incrementally from the very decisions the driver hands out, so
      the steady-state hot path (``replace_random``) runs **two** Spark
      jobs per round (one per positional select) and **zero** shuffles;
    * the new reservoir is a lazy union of eagerly-checkpointed pieces;
      partitions are merged with a (shuffle-free) ``coalesce`` only when
      their number grows past ``4·P``, at which point sizes are
      recomputed lazily with one counting job.

    CRITICAL evaluation-order invariant: the positional selects read
    ``TaskContext.partitionId()`` inside ``mapInPandas``. If such a plan
    were evaluated underneath a union or coalesce, the task's partition
    id would be the *composed* plan's id, not the planned one, silently
    mis-aligning the broadcast position maps. Therefore every positional
    select is checkpointed eagerly and *standalone* the moment it is
    created, and ``coalesce`` is only applied on top of checkpointed
    scans (no UDF underneath).
    """

    def __init__(
        self,
        spark: SparkSession,
        *,
        strategy: str = "dist",
        seed: int = 0,
        target_partitions: int | None = None,
    ):
        if strategy not in ("cent", "dist"):
            raise ValueError(f"unknown decision strategy {strategy!r}")
        self.spark = spark
        self.strategy = strategy
        self.rng = make_rng(seed)
        self.seed = seed
        self.op = 0  # monotone op counter: seeds the per-partition RNGs
        self.df: DataFrame | None = None
        self.count = 0
        self._sizes: list[int] | None = []
        self.P = target_partitions or spark.sparkContext.defaultParallelism

    # -- bookkeeping ---------------------------------------------------
    @staticmethod
    def _ckpt(df: DataFrame) -> DataFrame:
        return df.localCheckpoint(eager=True)

    def sizes(self) -> list[int]:
        """Per-partition row counts of the current reservoir; served
        from the driver's incremental bookkeeping when available."""
        if self._sizes is None:
            self._sizes = partition_sizes(self.df) if self.df is not None else []
        return self._sizes

    def _set_df(self, df: DataFrame | None, sizes: list[int] | None) -> None:
        self.df = df
        self._sizes = sizes
        if (
            df is not None
            and sizes is not None
            and len(sizes) > 4 * self.P
        ):
            # merge partitions without a shuffle; sizes become unknown
            # (coalesce's grouping is an implementation detail).
            self.df = self._ckpt(df.coalesce(self.P))
            self._sizes = None

    def _choice(self, sizes: list[int], k: int):
        """Per-partition positions (cent) or counts (dist) for k picks."""
        if self.strategy == "cent":
            return ("pos", central_positions(self.rng, sizes, k))
        return ("cnt", distributed_counts(self.rng, sizes, k))

    @staticmethod
    def _picked_per_partition(decision, n_parts: int) -> list[int]:
        kind, payload = decision
        if kind == "pos":
            return [len(payload.get(pid, ())) for pid in range(n_parts)]
        return [payload.get(pid, 0) for pid in range(n_parts)]

    def _apply(self, df: DataFrame, decision, *, keep: bool) -> DataFrame:
        self.op += 1
        kind, payload = decision
        if kind == "pos":
            return select_by_positions(df, payload, keep=keep)
        return select_random_per_partition(
            df, payload, keep=keep, seed=self.seed, round_no=self.op
        )

    def _batch_sizes(
        self, batch_df: DataFrame, batch_sizes: list[int] | None
    ) -> list[int]:
        return batch_sizes if batch_sizes is not None else partition_sizes(batch_df)

    # -- reservoir operations -----------------------------------------
    def insert_all(
        self,
        batch_df: DataFrame,
        batch_count: int,
        batch_sizes: list[int] | None = None,
    ) -> None:
        """Append the whole batch; partitions concatenate (the automatic
        co-partitioning property of Sec. 5.2)."""
        bsz = self._batch_sizes(batch_df, batch_sizes)
        batch_df = self._ckpt(batch_df)
        if self.df is None:
            self._set_df(batch_df, bsz)
        else:
            self._set_df(self.df.unionByName(batch_df), self.sizes() + bsz)
        self.count += batch_count

    def keep_random(self, k: int) -> None:
        """Downsample the reservoir to ``k`` uniform survivors."""
        if k >= self.count:
            return
        sizes = self.sizes()
        decision = self._choice(sizes, k)
        kept = self._ckpt(self._apply(self.df, decision, keep=True))
        self._set_df(kept, self._picked_per_partition(decision, len(sizes)))
        self.count = k

    def extract_one(self) -> dict[str, Any] | None:
        """Remove and return one uniformly random item (for the latent
        sample's partial-item moves)."""
        if self.count == 0:
            return None
        sizes = self.sizes()
        pos = central_positions(self.rng, sizes, 1)
        row = select_by_positions(self.df, pos, keep=True).toPandas()
        self.op += 1
        rest = self._ckpt(select_by_positions(self.df, pos, keep=False))
        (pid,) = pos.keys()
        new_sizes = list(sizes)
        new_sizes[pid] -= 1
        self._set_df(rest, new_sizes)
        self.count -= 1
        return dict(row.iloc[0])

    def insert_rows(self, rows: list[dict[str, Any]]) -> None:
        if not rows:
            return
        if self.df is None:
            raise RuntimeError("insert_rows into an uninitialized reservoir")
        small = self._ckpt(
            self.spark.createDataFrame(pd.DataFrame(rows), schema=self.df.schema)
            .coalesce(1)  # single known partition: sizes stay exact
        )
        self._set_df(self.df.unionByName(small), self.sizes() + [len(rows)])
        self.count += len(rows)

    def replace_random(
        self,
        m: int,
        batch_df: DataFrame,
        batch_count: int,
        batch_sizes: list[int] | None = None,
    ) -> None:
        """Saturated-regime hot path: m random victims in the reservoir
        are replaced by m uniform items of the batch (Alg. 2 line 17).
        Two Spark jobs, no shuffle."""
        if m <= 0:
            return
        sizes = self.sizes()
        bsz = self._batch_sizes(batch_df, batch_sizes)
        res_decision = self._choice(sizes, m)
        ins_decision = self._choice(bsz, m)
        # Fused delete+insert: one positional pass over reservoir ∪ batch.
        # Batch partitions sit at ids offset by len(sizes) in the union —
        # deterministic, so the driver can address them directly.
        offset = len(sizes)
        spec: dict[int, tuple[str, object]] = {}
        for pid, payload in _decision_items(res_decision):
            spec[pid] = ("drop", payload)
        for pid in range(len(bsz)):
            found = dict(_decision_items(ins_decision)).get(pid)
            # batch partitions not picked from must contribute nothing
            spec[offset + pid] = ("keep", found if found is not None else 0)
        self.op += 1
        combined = self.df.unionByName(batch_df)
        new_df = self._ckpt(
            select_mixed(combined, spec, seed=self.seed, round_no=self.op)
        )
        removed = self._picked_per_partition(res_decision, len(sizes))
        new_sizes = [s - r for s, r in zip(sizes, removed)]
        new_sizes += self._picked_per_partition(ins_decision, len(bsz))
        self._set_df(new_df, new_sizes)

    def clear(self) -> None:
        self._set_df(None, [])
        self.count = 0

    def to_pandas(self) -> pd.DataFrame:
        if self.df is None:
            return pd.DataFrame()
        return self.df.toPandas()


class KVReservoir:
    """Simulated distributed key-value-store reservoir (Fig. 5(a)).

    Items are keyed by slot number; the driver tracks the live slot set
    (the paper's master generates and tracks slot numbers too). Inserts
    are repartitioned by slot hash — the simulated cross-network write —
    and deletes are slot-keyed anti-joins.
    """

    SLOT = "__slot"

    def __init__(
        self,
        spark: SparkSession,
        *,
        retrieval: str = "rj",
        seed: int = 0,
        target_partitions: int | None = None,
    ):
        if retrieval not in ("rj", "cj"):
            raise ValueError(f"unknown retrieval mode {retrieval!r}")
        self.spark = spark
        self.retrieval = retrieval
        self.rng = make_rng(seed)
        self.df: DataFrame | None = None
        self.live_slots = np.empty(0, dtype=np.int64)
        self.next_slot = 0
        self.P = target_partitions or spark.sparkContext.defaultParallelism

    @property
    def count(self) -> int:
        return len(self.live_slots)

    def _materialize(self, df: DataFrame) -> None:
        # same evaluation-order discipline as CoPartitionedReservoir:
        # checkpoint first, only then coalesce (over a plain scan).
        df = df.localCheckpoint(eager=True)
        if df.rdd.getNumPartitions() > 2 * self.P:
            df = df.coalesce(self.P).localCheckpoint(eager=True)
        self.df = df

    def _slot_df(self, slots: np.ndarray) -> DataFrame:
        return self.spark.createDataFrame(
            pd.DataFrame({self.SLOT: slots.astype(np.int64)})
        )

    # -- retrieval of batch items (Sec. 5.3 / Fig. 6) ------------------
    def _retrieve(
        self, batch_df: DataFrame, positions: Mapping[int, np.ndarray], slots: np.ndarray
    ) -> DataFrame:
        """Fetch the batch items at ``positions`` and key them by the
        destination ``slots`` (assigned position-order per partition)."""
        # assign destination slots deterministically: partitions in
        # ascending order, offsets ascending; slots consumed in order.
        slots = np.asarray(slots, dtype=np.int64)
        by_pid: dict[int, tuple[np.ndarray, np.ndarray]] = {}
        cursor = 0
        for pid in sorted(positions):
            offs = np.sort(np.asarray(positions[pid], dtype=np.int64))
            by_pid[pid] = (offs, slots[cursor : cursor + len(offs)])
            cursor += len(offs)

        if self.retrieval == "cj":
            # co-located join: broadcast the (pid → offsets, slots) map,
            # filter each batch partition locally (Fig. 6(a)).
            fields = ", ".join(
                f"{f.name} {f.dataType.simpleString()}" for f in batch_df.schema
            )
            slot_col = self.SLOT  # local binding: keep `self` (and its
            schema = f"{fields}, {slot_col} long"  # SparkSession) out of the closure

            def fn(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
                pid = TaskContext.get().partitionId()
                chunks = list(it)
                if not chunks:
                    return
                pdf = pd.concat(chunks, ignore_index=True)
                offs_slots = by_pid.get(pid)
                if offs_slots is None or len(offs_slots[0]) == 0:
                    return
                offs, sl = offs_slots
                out = pdf.iloc[offs].copy()
                out[slot_col] = sl
                yield out

            return batch_df.mapInPandas(fn, schema=schema)

        # repartition join: tag every batch row with (pid, pos), shuffle
        # join against the location set Q (both sides shuffled).
        tagged = tag_positions(batch_df)
        empty = np.empty(0, dtype=np.int64)
        q_pdf = pd.DataFrame(
            {
                "__pid": np.concatenate(
                    [np.full(len(offs), pid) for pid, (offs, _) in by_pid.items()]
                    or [empty]
                ),
                "__pos": np.concatenate(
                    [offs for offs, _ in by_pid.values()] or [empty]
                ),
                self.SLOT: np.concatenate(
                    [sl for _, sl in by_pid.values()] or [empty]
                ),
            }
        )
        q = self.spark.createDataFrame(q_pdf, schema=f"__pid long, __pos long, {self.SLOT} long")
        joined = tagged.join(q, on=["__pid", "__pos"], how="inner")
        return joined.drop("__pid", "__pos")

    # -- reservoir operations -----------------------------------------
    def insert_all(
        self,
        batch_df: DataFrame,
        batch_count: int,
        batch_sizes: list[int] | None = None,
    ) -> None:
        if batch_sizes is None:
            batch_sizes = partition_sizes(batch_df)
        positions = {
            pid: np.arange(sz) for pid, sz in enumerate(batch_sizes) if sz > 0
        }
        slots = np.arange(self.next_slot, self.next_slot + batch_count, dtype=np.int64)
        self.next_slot += batch_count
        inserts = self._retrieve(batch_df, positions, slots)
        inserts = inserts.repartition(self.P, self.SLOT)  # simulated KV write
        df = inserts if self.df is None else self.df.unionByName(inserts)
        self.live_slots = np.concatenate([self.live_slots, slots])
        self._materialize(df)

    def keep_random(self, k: int) -> None:
        if k >= self.count:
            return
        keep = self.rng.choice(self.live_slots, size=k, replace=False)
        kept_df = self.df.join(
            F.broadcast(self._slot_df(keep)), on=self.SLOT, how="inner"
        )
        self.live_slots = np.sort(keep)
        self._materialize(kept_df)

    def extract_one(self) -> dict[str, Any] | None:
        if self.count == 0:
            return None
        slot = int(self.rng.choice(self.live_slots))
        row = self.df.filter(F.col(self.SLOT) == slot).drop(self.SLOT).toPandas()
        self.live_slots = self.live_slots[self.live_slots != slot]
        self._materialize(self.df.filter(F.col(self.SLOT) != slot))
        return dict(row.iloc[0])

    def insert_rows(self, rows: list[dict[str, Any]]) -> None:
        if not rows:
            return
        slots = np.arange(self.next_slot, self.next_slot + len(rows), dtype=np.int64)
        self.next_slot += len(rows)
        pdf = pd.DataFrame(rows)
        pdf[self.SLOT] = slots
        small = self.spark.createDataFrame(pdf, schema=self.df.schema)
        self.live_slots = np.concatenate([self.live_slots, slots])
        self._materialize(self.df.unionByName(small.repartition(self.P, self.SLOT)))

    def replace_random(
        self,
        m: int,
        batch_df: DataFrame,
        batch_count: int,
        batch_sizes: list[int] | None = None,
    ) -> None:
        if m <= 0:
            return
        victims = self.rng.choice(self.live_slots, size=m, replace=False)
        if batch_sizes is None:
            batch_sizes = partition_sizes(batch_df)
        positions = central_positions(self.rng, batch_sizes, m)
        inserts = self._retrieve(batch_df, positions, victims.astype(np.int64))
        inserts = inserts.repartition(self.P, self.SLOT)  # simulated KV write
        survivors = self.df.join(
            F.broadcast(self._slot_df(victims)), on=self.SLOT, how="left_anti"
        )
        # victims' slots are reused by the inserts: live set unchanged.
        self._materialize(survivors.unionByName(inserts))

    def clear(self) -> None:
        if self.df is not None:
            self._materialize(self.df.limit(0))
        self.live_slots = np.empty(0, dtype=np.int64)

    def to_pandas(self) -> pd.DataFrame:
        if self.df is None:
            return pd.DataFrame()
        return self.df.drop(self.SLOT).toPandas()
