"""Distributed (Spark) implementations of the paper's samplers."""
from repro.distributed.drtbs import DRTBS
from repro.distributed.dttbs import DTTBS
from repro.distributed.reservoir import CoPartitionedReservoir, KVReservoir

__all__ = ["DRTBS", "DTTBS", "CoPartitionedReservoir", "KVReservoir"]
