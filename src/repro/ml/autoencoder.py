"""A fixed-weight numpy recurrent auto-encoder over the last-k payment
amounts — the stand-in for the paper's LSTM auto-encoder fraud model [38].

The paper uses the model only as (a) an expensive per-tuple function with
per-key state and (b) a reconfiguration target (hot-swap to a smaller model
/ decision tree). We reproduce both properties with a deterministic
untrained recurrent auto-encoder: weights are seeded, the anomaly score is
the reconstruction error of the sequence, and the per-tuple cost scales
with the hidden size — so "swap to a lighter model" measurably reduces
cost, as in §8.3.
"""
from __future__ import annotations

import numpy as np


class RecurrentAutoencoder:
    """Encoder–decoder RNN with tanh cells and a reconstruction-error score.

    ``hidden`` controls cost: the paper's heavy LSTM-AE maps to
    ``hidden=64``, the lighter LSTM-AE in the first hot-swap to
    ``hidden=16``.
    """

    def __init__(self, window: int = 10, hidden: int = 64, seed: int = 0) -> None:
        rng = np.random.default_rng(seed)
        self.window = window
        self.hidden = hidden
        s = 1.0 / np.sqrt(hidden)
        self.w_in = rng.normal(0, s, (1, hidden))
        self.w_h = rng.normal(0, s, (hidden, hidden))
        self.w_out = rng.normal(0, s, (hidden, 1))
        self.b_h = rng.normal(0, s, hidden)
        self.b_out = rng.normal(0, s, 1)

    def score(self, amounts: np.ndarray) -> float:
        """Anomaly score of one sequence (higher = more anomalous)."""
        x = np.asarray(amounts, dtype=np.float64).reshape(-1)[-self.window :]
        if x.size < self.window:
            x = np.concatenate([np.zeros(self.window - x.size), x])
        scale = np.abs(x).max() or 1.0
        xn = x / scale
        h = np.zeros(self.hidden)
        recon = np.empty(self.window)
        for i, v in enumerate(xn):
            h = np.tanh(v * self.w_in[0] + h @ self.w_h + self.b_h)
            recon[i] = np.tanh(h @ self.w_out + self.b_out)[0]
        err = float(np.mean((recon - xn) ** 2))
        return 1.0 - 1.0 / (1.0 + err)  # squash to (0, 1)

    def score_batch(self, seqs: np.ndarray) -> np.ndarray:
        """Vectorised scoring of an (n, window) batch (same math as
        :meth:`score`, row-wise)."""
        x = np.asarray(seqs, dtype=np.float64)
        n, w = x.shape
        if w < self.window:
            x = np.concatenate([np.zeros((n, self.window - w)), x], axis=1)
        elif w > self.window:
            x = x[:, -self.window :]
        scale = np.maximum(np.abs(x).max(axis=1), 1e-12)
        scale = np.where(scale == 0, 1.0, scale)
        xn = x / scale[:, None]
        h = np.zeros((n, self.hidden))
        recon = np.empty((n, self.window))
        for i in range(self.window):
            h = np.tanh(xn[:, i : i + 1] @ self.w_in + h @ self.w_h + self.b_h)
            recon[:, i] = np.tanh(h @ self.w_out + self.b_out)[:, 0]
        err = np.mean((recon - xn) ** 2, axis=1)
        return 1.0 - 1.0 / (1.0 + err)
