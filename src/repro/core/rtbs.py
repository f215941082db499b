"""R-TBS — Reservoir-based Time-Biased Sampling (Algorithm 2).

Maintains a latent fractional sample ``L_t = (A_t, π_t, C_t)`` with
``C_t = min(n, W_t)`` where ``W_t = Σ_j B_j e^{-λ(t-j)}`` is the total
decayed weight of everything seen so far. Guarantees, at every time t
(Theorem 4.2):

    Pr[i ∈ S_t] = (C_t / W_t) · e^{-λ(t - t_i)}

which yields the relative-inclusion property (1), a hard sample-size cap
``|S_t| ≤ n``, maximal expected sample size when unsaturated (Thm 4.3)
and minimal sample-size variance (Thm 4.4, via stochastic rounding).

Batches may arrive at arbitrary real-valued time gaps: ``advance``
takes ``dt`` and decays by ``e^{-λ·dt}`` (Sec. 2, "our results can be
applied to arbitrary sequences of real-valued batch arrival times").
"""
from __future__ import annotations

import math
from typing import Any, Iterable, Sequence

import numpy as np

from repro.core.downsample import downsample
from repro.core.latent import LatentSample
from repro.rng import make_rng, sample_without_replacement, stochastic_round

_EPS = 1e-9


class RTBS:
    """Reservoir-based time-biased sampler with decay rate ``lam`` and
    maximum sample size ``n``."""

    def __init__(
        self,
        lam: float,
        n: int,
        seed: int | np.random.Generator | None = 0,
        initial: Sequence[Any] = (),
    ):
        if lam < 0:
            raise ValueError("decay rate must be >= 0")
        if n < 1:
            raise ValueError("max sample size must be >= 1")
        if len(initial) > n:
            raise ValueError("|A_0| must be <= n")
        self.lam = float(lam)
        self.n = int(n)
        self.rng = make_rng(seed)
        self.latent = LatentSample(full=list(initial), weight=float(len(initial)))
        self.total_weight = float(len(initial))  # W

    # ------------------------------------------------------------------
    @property
    def sample_weight(self) -> float:
        """C_t = min(n, W_t) — the expected realized sample size."""
        return self.latent.weight

    def advance(self, batch: Iterable[Any], dt: float = 1.0) -> None:
        """Process one arriving batch after a time gap ``dt`` (Alg. 2)."""
        batch = list(batch)
        b = len(batch)
        decay = math.exp(-self.lam * dt)
        L, n = self.latent, self.n

        if self.total_weight < n - _EPS:
            # ---- previously unsaturated: C == W ----------------------
            W = self.total_weight * decay
            if W > _EPS and W < L.weight - _EPS:
                downsample(L, W, self.rng)
            elif W <= _EPS:
                L.full, L.partial, L.weight = [], None, 0.0
            W += b
            L.full.extend(batch)  # accept all new items (eq. (5): prob 1)
            L.weight += b
            self.total_weight = W
            if W > n + _EPS:  # overshoot: now saturated
                downsample(L, float(n), self.rng)
        else:
            # ---- previously saturated: C == n, π == ∅ ----------------
            W = self.total_weight * decay + b
            self.total_weight = W
            if W >= n - _EPS:
                # still saturated: accept E[m] = B_t·n/W items via
                # stochastic rounding; they replace random victims.
                m = stochastic_round(self.rng, b * n / W) if b else 0
                m = min(m, b, n)
                if m > 0:
                    # index-based victim removal: duplicate-safe for any
                    # item type (ids/equality never consulted).
                    idx = self.rng.choice(len(L.full), size=m, replace=False)
                    drop = set(int(i) for i in idx)
                    kept = [x for i, x in enumerate(L.full) if i not in drop]
                    L.full = kept + sample_without_replacement(self.rng, batch, m)
            else:
                # undershoot: decay weight below n; downsample then
                # accept the whole batch as full items.
                target = W - b  # = decay · W_{t-1} > 0
                downsample(L, target, self.rng)
                L.full.extend(batch)
                L.weight = W
        L.check_invariants()

    def sample(self, rng: np.random.Generator | None = None) -> list[Any]:
        """Realize S_t from L_t per eq. (2)."""
        return self.latent.realize(rng if rng is not None else self.rng)
