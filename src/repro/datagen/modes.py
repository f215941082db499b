"""Temporal mode patterns (Sec. 6.2).

A *pattern* maps batch index t (1-based, after warm-up) to a mode:
``"normal"`` or ``"abnormal"``.

* ``SingleEvent`` — normal for t ≤ 10, abnormal for 10 < t ≤ 20, then
  normal again (Fig. 10(a)): a singular disruptive event.
* ``Periodic(δ, η)`` — δ normal batches alternating with η abnormal
  batches, denoted P(δ, η) in the paper (Fig. 10(b)).
"""
from __future__ import annotations

from dataclasses import dataclass

NORMAL = "normal"
ABNORMAL = "abnormal"


@dataclass(frozen=True)
class SingleEvent:
    """Normal → abnormal in (start, end] → normal."""

    start: int = 10
    end: int = 20

    def mode(self, t: int) -> str:
        return ABNORMAL if self.start < t <= self.end else NORMAL

    @property
    def name(self) -> str:
        return "SingleEvent"


@dataclass(frozen=True)
class Periodic:
    """δ normal batches alternating with η abnormal batches."""

    delta: int = 10
    eta: int = 10

    def mode(self, t: int) -> str:
        pos = (t - 1) % (self.delta + self.eta)
        return NORMAL if pos < self.delta else ABNORMAL

    @property
    def name(self) -> str:
        return f"P({self.delta},{self.eta})"
