"""k-nearest-neighbour classifier (Sec. 6.2).

The paper's first application: "a class is predicted for each item in
an incoming batch by taking a majority vote of the classes of the k
nearest neighbors in the current sample, based on Euclidean distance".
kNN is the motivating *non-parametric* model — there is no incremental
variant, so periodic retraining on a sample is the natural fit.

Fully vectorized: one (batch × sample) distance matrix per prediction
call; ties in the majority vote break toward the nearest neighbour's
class (scan order of ``np.argmax`` over counts of nearest-sorted
votes), matching the usual kNN convention.
"""
from __future__ import annotations

import numpy as np


class KNNClassifier:
    """Majority-vote kNN over a (possibly re-assigned) training sample."""

    def __init__(self, k: int = 7):
        if k < 1:
            raise ValueError("k must be >= 1")
        self.k = k
        self._X: np.ndarray | None = None
        self._y: np.ndarray | None = None

    def fit(self, X: np.ndarray, y: np.ndarray) -> "KNNClassifier":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y)
        if len(X) != len(y):
            raise ValueError("X and y length mismatch")
        if len(X) == 0:
            raise ValueError("cannot fit kNN on an empty sample")
        self._X, self._y = X, y
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        if self._X is None:
            raise RuntimeError("fit() before predict()")
        X = np.asarray(X, dtype=float)
        k = min(self.k, len(self._X))
        # squared Euclidean distances, (m_test, m_train)
        d2 = (
            np.sum(X * X, axis=1)[:, None]
            - 2.0 * X @ self._X.T
            + np.sum(self._X * self._X, axis=1)[None, :]
        )
        # k nearest per row, then majority vote (nearest-first tiebreak)
        nn = np.argpartition(d2, kth=k - 1, axis=1)[:, :k]
        rows = np.arange(len(X))[:, None]
        order = np.argsort(d2[rows, nn], axis=1)
        nn_sorted = nn[rows, order]
        votes = self._y[nn_sorted]  # (m_test, k), nearest first
        out = np.empty(len(X), dtype=self._y.dtype)
        for i in range(len(X)):
            vals, first_pos, counts = np.unique(
                votes[i], return_index=True, return_counts=True
            )
            best = counts == counts.max()
            # tie -> the class whose nearest supporting vote is closest
            cand = vals[best]
            pos = first_pos[best]
            out[i] = cand[np.argmin(pos)]
        return out
