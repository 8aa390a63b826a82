"""The cheap hot-swap target of §8.3's second reconfiguration: a tiny fixed
decision tree over simple statistics of the last-k amounts. Orders of
magnitude cheaper per tuple than the recurrent auto-encoder."""
from __future__ import annotations

import numpy as np


class DecisionTree:
    """A fixed three-split stump forest over (mean, max, last/mean ratio)."""

    def __init__(self, mean_hi: float = 5000.0, spike: float = 4.0) -> None:
        self.mean_hi = mean_hi
        self.spike = spike

    def score(self, amounts: np.ndarray) -> float:
        x = np.asarray(amounts, dtype=np.float64).reshape(-1)
        x = x[x != 0] if (x != 0).any() else x
        m = float(np.mean(np.abs(x))) if x.size else 0.0
        last = float(abs(x[-1])) if x.size else 0.0
        p = 0.05
        if m > self.mean_hi:
            p += 0.45
        if m > 0 and last / m > self.spike:
            p += 0.45
        return min(p, 0.95)

    def score_batch(self, seqs: np.ndarray) -> np.ndarray:
        x = np.abs(np.asarray(seqs, dtype=np.float64))
        m = x.mean(axis=1)
        last = x[:, -1]
        p = np.full(x.shape[0], 0.05)
        p[m > self.mean_hi] += 0.45
        with np.errstate(divide="ignore", invalid="ignore"):
            ratio = np.where(m > 0, last / np.maximum(m, 1e-12), 0.0)
        p[ratio > self.spike] += 0.45
        return np.minimum(p, 0.95)
