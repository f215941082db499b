"""Gaussian-mixture classification stream (Sec. 6.2).

100 class centroids uniform in [0,80]×[0,80]; each item picks a
ground-truth class by mode-dependent relative frequency and draws its
coordinates from N(centroid, 1) per axis. In "normal" mode the first 50
classes are 5× more frequent than the last 50; in "abnormal" mode the
roles flip.
"""
from __future__ import annotations

import numpy as np

from repro.rng import make_rng


class GaussianMixtureStream:
    """Mode-switching 2-D Gaussian mixture over ``n_classes`` classes."""

    def __init__(
        self,
        n_classes: int = 100,
        box: float = 80.0,
        sigma: float = 1.0,
        freq_ratio: float = 5.0,
        seed: int | np.random.Generator = 0,
    ):
        if n_classes % 2 != 0:
            raise ValueError("n_classes must be even (two frequency groups)")
        self.rng = make_rng(seed)
        self.n_classes = n_classes
        self.sigma = sigma
        self.centroids = self.rng.uniform(0.0, box, size=(n_classes, 2))
        half = n_classes // 2
        w_norm = np.concatenate(
            [np.full(half, freq_ratio), np.full(half, 1.0)]
        )
        self._p = {
            "normal": w_norm / w_norm.sum(),
            "abnormal": w_norm[::-1] / w_norm.sum(),
        }

    def batch(self, mode: str, size: int) -> tuple[np.ndarray, np.ndarray]:
        """Generate one batch: returns (X, y) with X of shape (size, 2)."""
        if mode not in self._p:
            raise ValueError(f"unknown mode {mode!r}")
        y = self.rng.choice(self.n_classes, size=size, p=self._p[mode])
        X = self.centroids[y] + self.rng.normal(0.0, self.sigma, size=(size, 2))
        return X, y
