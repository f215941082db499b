"""Batch-size pattern generators (Fig. 1, Sec. 6.2 "varying batch size").

Each generator maps 1-based batch index t → batch size:

* constant(b)                — the default b=100 regime;
* multiplicative(b, φ, t0)   — fixed until t0, then B_{t+1} = φ·B_t
                               (Fig. 1(a) growth φ>1, Fig. 1(d) decay φ<1,
                               Sec. 6.2's 2%-growth = φ=1.02);
* uniform(lo, hi, seed)      — i.i.d. Uniform{lo..hi} (Fig. 1(c) and the
                               Uniform(0,200) kNN experiment).
"""
from __future__ import annotations

from typing import Callable

import numpy as np

from repro.rng import make_rng

SizeFn = Callable[[int], int]


def constant(b: int) -> SizeFn:
    def fn(t: int) -> int:
        return b

    return fn


def multiplicative(b: int, phi: float, t0: int) -> SizeFn:
    """Size b for t < t0, then b·φ^(t-t0+1) afterwards."""

    def fn(t: int) -> int:
        if t < t0:
            return b
        return max(0, int(round(b * phi ** (t - t0 + 1))))

    return fn


def uniform(lo: int, hi: int, seed: int | np.random.Generator = 0) -> SizeFn:
    rng = make_rng(seed)

    def fn(t: int) -> int:
        return int(rng.integers(lo, hi + 1))

    return fn
