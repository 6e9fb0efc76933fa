"""Vertex colorings for color coding (paper §2.1) and the biased variant (§3.4).

Uniform coloring draws each vertex's color u.a.r. from [k]; a fixed
k-subset of vertices becomes colorful with probability p_k = k!/k^k.

Biased coloring gives probability λ ≪ 1/k to each of the k-1 "light"
colors and the remaining mass to one heavy color; a fixed k-subset then
is colorful with probability k!·λ^(k-1)·(1-(k-1)λ). We make color 0 the
heavy color so that 0-rooting (storing k-treelets only at their color-0
node) keeps its meaning unchanged.
"""
from __future__ import annotations

import math

import numpy as np


def assign_colors(n: int, k: int, *, seed: int, lam: float | None = None) -> np.ndarray:
    """Color vector for vertices 0..n-1; deterministic in ``seed``.

    ``lam=None`` gives the uniform coloring; otherwise the biased one
    with light-color probability ``lam`` (requires (k-1)·lam < 1).
    """
    g = np.random.default_rng(seed)
    if lam is None:
        return g.integers(0, k, size=n).astype(np.int64)
    if not 0 < lam * (k - 1) < 1:
        raise ValueError(f"invalid biased-coloring lambda={lam} for k={k}")
    probs = [1.0 - (k - 1) * lam] + [lam] * (k - 1)
    return g.choice(np.arange(k), size=n, p=probs).astype(np.int64)


def p_colorful(k: int, lam: float | None = None) -> float:
    """Probability that a fixed set of k vertices receives k distinct colors."""
    if lam is None:
        return math.factorial(k) / k**k
    return math.factorial(k) * lam ** (k - 1) * (1.0 - (k - 1) * lam)
