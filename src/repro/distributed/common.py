"""Partition-level primitives for the distributed samplers (Sec. 5.3).

All primitives operate on DataFrames whose partitioning has been frozen
by ``localCheckpoint`` (our stand-in for the paper's in-place-updated,
checkpointed RDDs), so per-partition row counts and row order are stable
between the planning pass (driver) and the execution pass (workers).

Two decision strategies from the paper:

* **Centralized** — the master samples *global slot numbers* and maps
  each to a ``(partition, offset)`` pair using cumulative partition
  sizes; workers just apply the broadcast position lists.
* **Distributed** — the master samples only a per-partition *count*
  vector from the multivariate hypergeometric law; each worker locally
  picks that many uniform rows with a deterministic per-(seed, round,
  partition) RNG (the paper cites jump-ahead PRNGs [20]; independent
  Philox streams keyed by (seed, round, pid) give the same guarantee).
"""
from __future__ import annotations

from typing import Iterator, Mapping, Sequence

import numpy as np
import pandas as pd
from pyspark import TaskContext
from pyspark.sql import DataFrame

from repro.rng import multivariate_hypergeometric_split


def partition_sizes(df: DataFrame) -> list[int]:
    """Row count of every partition, indexed by partition id."""

    def count_part(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        pid = TaskContext.get().partitionId()
        n = sum(len(pdf) for pdf in it)
        yield pd.DataFrame({"pid": [pid], "cnt": [n]})

    rows = (
        df.mapInPandas(count_part, schema="pid int, cnt long")
        .toPandas()
        .set_index("pid")["cnt"]
    )
    n_parts = df.rdd.getNumPartitions()
    return [int(rows.get(pid, 0)) for pid in range(n_parts)]


def slots_to_positions(
    slots: Sequence[int], sizes: Sequence[int]
) -> dict[int, np.ndarray]:
    """Map global slot numbers (0-based) to per-partition offset arrays.

    Slot ``s`` lives in the partition whose cumulative size range
    contains ``s`` — the slot→(partition, position) mapping of Sec. 5.2.
    """
    bounds = np.cumsum([0] + list(sizes))
    s = np.asarray(slots, dtype=np.int64)
    if len(s) == 0:
        return {}
    if s.min() < 0 or s.max() >= bounds[-1]:
        raise IndexError(f"slot out of range (total {bounds[-1]})")
    pids = np.searchsorted(bounds, s, side="right") - 1
    offs = s - bounds[pids]
    order = np.argsort(pids, kind="stable")
    pids_sorted, offs_sorted = pids[order], offs[order]
    uniq, starts = np.unique(pids_sorted, return_index=True)
    splits = np.split(offs_sorted, starts[1:])
    return {int(pid): np.sort(chunk) for pid, chunk in zip(uniq, splits)}


def central_positions(
    rng: np.random.Generator, sizes: Sequence[int], k: int
) -> dict[int, np.ndarray]:
    """Centralized decisions: master draws ``k`` distinct global slots."""
    total = int(sum(sizes))
    if k > total:
        raise ValueError(f"cannot choose {k} of {total} slots")
    slots = rng.choice(total, size=k, replace=False) if k else np.empty(0, int)
    return slots_to_positions([int(s) for s in slots], sizes)


def distributed_counts(
    rng: np.random.Generator, sizes: Sequence[int], k: int
) -> dict[int, int]:
    """Distributed decisions: master draws only per-partition counts."""
    counts = multivariate_hypergeometric_split(rng, sizes, k)
    return {pid: c for pid, c in enumerate(counts) if c > 0}


def _collect_partition(it: Iterator[pd.DataFrame]) -> pd.DataFrame | None:
    chunks = [pdf for pdf in it]
    if not chunks:
        return None
    return pd.concat(chunks, ignore_index=True)


def select_by_positions(
    df: DataFrame, positions: Mapping[int, np.ndarray], *, keep: bool
) -> DataFrame:
    """Keep (or drop) the rows at the given per-partition offsets."""
    schema = df.schema
    pos_b = {pid: np.asarray(v) for pid, v in positions.items()}

    def fn(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        pid = TaskContext.get().partitionId()
        pdf = _collect_partition(it)
        if pdf is None:
            return
        offs = pos_b.get(pid)
        if offs is None or len(offs) == 0:
            if not keep:
                yield pdf
            return
        mask = np.zeros(len(pdf), dtype=bool)
        mask[offs] = True
        yield pdf.loc[mask if keep else ~mask]

    return df.mapInPandas(fn, schema=schema)


def select_random_per_partition(
    df: DataFrame,
    counts: Mapping[int, int],
    *,
    keep: bool,
    seed: int,
    round_no: int,
) -> DataFrame:
    """Keep (or drop) ``counts[pid]`` uniform rows per partition, with a
    deterministic stream per (seed, round, partition)."""
    schema = df.schema
    cnt_b = dict(counts)

    def fn(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        pid = TaskContext.get().partitionId()
        pdf = _collect_partition(it)
        if pdf is None:
            return
        k = cnt_b.get(pid, 0)
        if k <= 0:
            if not keep:
                yield pdf
            return
        rng = np.random.default_rng([seed, round_no, pid])
        idx = rng.choice(len(pdf), size=min(k, len(pdf)), replace=False)
        mask = np.zeros(len(pdf), dtype=bool)
        mask[idx] = True
        yield pdf.loc[mask if keep else ~mask]

    return df.mapInPandas(fn, schema=schema)


def select_mixed(
    df: DataFrame,
    spec: Mapping[int, tuple[str, object]],
    *,
    seed: int,
    round_no: int,
) -> DataFrame:
    """One fused pass applying a per-partition keep/drop spec.

    ``spec[pid] = (mode, payload)`` with mode ``"keep"``/``"drop"`` and
    payload either an offset array (centralized decisions) or an int
    count (distributed decisions, sampled locally with the deterministic
    per-(seed, round, partition) stream). Partitions absent from the
    spec pass through unchanged. This lets D-R-TBS's saturated-path
    delete+insert run as a single Spark job over ``reservoir ∪ batch``:
    union partition ids are the branch ids offset by the partition count
    of the branches before them, which the driver knows exactly.
    """
    schema = df.schema
    spec_b = dict(spec)

    def fn(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        pid = TaskContext.get().partitionId()
        pdf = _collect_partition(it)
        if pdf is None:
            return
        entry = spec_b.get(pid)
        if entry is None:
            yield pdf
            return
        mode, payload = entry
        if isinstance(payload, (int, np.integer)):
            k = int(payload)
            rng = np.random.default_rng([seed, round_no, pid])
            offs = rng.choice(len(pdf), size=min(k, len(pdf)), replace=False)
        else:
            offs = np.asarray(payload)
        mask = np.zeros(len(pdf), dtype=bool)
        if len(offs):
            mask[offs] = True
        yield pdf.loc[mask if mode == "keep" else ~mask]

    return df.mapInPandas(fn, schema=schema)


def tag_positions(df: DataFrame) -> DataFrame:
    """Append ``__pid``/``__pos`` columns identifying each row's slot —
    the (partition, position) tagging used by the centralized-decision
    retrieval joins (Fig. 6(a))."""
    fields = ", ".join(f"{f.name} {f.dataType.simpleString()}" for f in df.schema)
    schema = f"{fields}, __pid int, __pos long"

    def fn(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        pid = TaskContext.get().partitionId()
        pdf = _collect_partition(it)
        if pdf is None:
            return
        pdf = pdf.copy()
        pdf["__pid"] = pid
        pdf["__pos"] = np.arange(len(pdf), dtype=np.int64)
        yield pdf

    return df.mapInPandas(fn, schema=schema)


def positions_to_pandas(positions: Mapping[int, np.ndarray]) -> pd.DataFrame:
    """Flatten a positions dict into a (pid, pos) pandas frame — the
    paper's distributed location set Q."""
    pids: list[int] = []
    offs: list[int] = []
    for pid, arr in positions.items():
        pids.extend([pid] * len(arr))
        offs.extend(int(o) for o in arr)
    return pd.DataFrame({"__pid": pids, "__pos": offs})
