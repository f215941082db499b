"""Latent fractional samples (Sec. 4.1 of the paper).

A latent sample ``L = (A, π, C)`` consists of a set ``A`` of ``⌊C⌋``
*full* items, a set ``π`` holding at most one *partial* item, and the
real-valued sample weight ``C``. A realized sample ``S`` is drawn from
``L`` via eq. (2): every full item is always included, the partial item
is included with probability ``frac(C)``, so ``E[|S|] = C`` (eq. (3)).

Items are opaque Python objects; the structure never inspects them.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import Any

import numpy as np

from repro.rng import sample_without_replacement


def frac(x: float) -> float:
    """Fractional part ``x − ⌊x⌋``."""
    return x - math.floor(x)


@dataclass
class LatentSample:
    """Mutable latent sample ``(A, π, C)`` with the paper's invariants."""

    full: list[Any] = field(default_factory=list)
    partial: Any | None = None
    weight: float = 0.0

    # ------------------------------------------------------------------
    # Invariants and views
    # ------------------------------------------------------------------
    def check_invariants(self) -> None:
        """Raise if (A, π, C) violates Sec. 4.1's structural invariants:
        |A| == ⌊C⌋ and π nonempty iff C is non-integral."""
        if self.weight < -1e-9:
            raise AssertionError(f"negative sample weight {self.weight}")
        if len(self.full) != math.floor(self.weight + 1e-9):
            raise AssertionError(
                f"|A|={len(self.full)} != floor(C)={math.floor(self.weight + 1e-9)}"
            )
        has_frac = frac(self.weight + 1e-9) > 2e-9
        if has_frac and self.partial is None:
            raise AssertionError(f"C={self.weight} fractional but no partial item")
        if not has_frac and self.partial is not None:
            raise AssertionError(f"C={self.weight} integral but partial item present")

    @property
    def footprint(self) -> int:
        """Number of stored items; always ≤ ⌊C⌋ + 1."""
        return len(self.full) + (1 if self.partial is not None else 0)

    def items(self) -> list[Any]:
        """All stored items (full items plus the partial one, if any)."""
        out = list(self.full)
        if self.partial is not None:
            out.append(self.partial)
        return out

    # ------------------------------------------------------------------
    # Subroutines Swap1 / Move1 (Sec. 4.2)
    # ------------------------------------------------------------------
    def swap1(self, rng: np.random.Generator) -> None:
        """Move a random item of ``A`` to ``π``; old partial (if any)
        joins ``A``: ``I ← Sample(A,1); A ← (A∖I) ∪ π; π ← I``."""
        (i,) = sample_without_replacement(rng, self.full, 1)
        self.full.remove(i)
        if self.partial is not None:
            self.full.append(self.partial)
        self.partial = i

    def move1(self, rng: np.random.Generator) -> None:
        """Move a random item of ``A`` to ``π``, ejecting the old partial:
        ``I ← Sample(A,1); A ← A∖I; π ← I``."""
        (i,) = sample_without_replacement(rng, self.full, 1)
        self.full.remove(i)
        self.partial = i

    # ------------------------------------------------------------------
    # Realization (eq. (2))
    # ------------------------------------------------------------------
    def realize(self, rng: np.random.Generator) -> list[Any]:
        """Draw a realized sample ``S`` from ``L``: full items surely,
        the partial item with probability ``frac(C)``."""
        out = list(self.full)
        f = frac(self.weight + 1e-9)
        if self.partial is not None and f > 2e-9 and rng.random() < f:
            out.append(self.partial)
        return out

    def copy(self) -> "LatentSample":
        return LatentSample(list(self.full), self.partial, self.weight)
