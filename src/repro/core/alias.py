"""Vose's alias method for O(1) weighted sampling (paper §3.3, [24]).

Motivo samples the root vertex of every treelet draw with probability
proportional to its colorful-treelet count using an alias table built
once after the build-up phase. Construction is O(n); each draw costs one
uniform integer, one uniform float and one comparison.
"""
from __future__ import annotations

import numpy as np


class AliasSampler:
    """Alias table over nonnegative weights; deterministic in the RNG."""

    def __init__(self, weights: np.ndarray):
        w = np.asarray(weights, dtype=np.float64)
        if len(w) == 0 or w.sum() <= 0 or (w < 0).any():
            raise ValueError("alias table needs nonnegative weights with positive sum")
        n = len(w)
        prob = w * (n / w.sum())
        alias = np.zeros(n, dtype=np.int64)
        small = [i for i, p in enumerate(prob) if p < 1.0]
        large = [i for i, p in enumerate(prob) if p >= 1.0]
        prob = prob.copy()
        while small and large:
            s, l = small.pop(), large.pop()
            alias[s] = l
            prob[l] = prob[l] - (1.0 - prob[s])
            (small if prob[l] < 1.0 else large).append(l)
        # leftovers are 1.0 up to float error
        self._prob = prob
        self._alias = alias
        self._n = n

    def draw(self, rng: np.random.Generator, size: int) -> np.ndarray:
        """Draw ``size`` indices i.i.d. with P(i) ∝ weights[i]."""
        cols = rng.integers(0, self._n, size=size)
        toss = rng.random(size)
        return np.where(toss < self._prob[cols], cols, self._alias[cols])
