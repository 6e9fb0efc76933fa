"""Count estimators and error metrics (paper §2.2, §5.2).

Naive (CC-style) estimation from uniform urn samples: a class ``H_i``
hit ``x_i`` times out of ``s`` samples has estimated *colorful* count
``(x_i/s) · t / σ_i`` (``t`` = total colorful k-treelets, ``σ_i`` =
spanning trees of ``H_i``), and estimated total count ``ĝ_i = ĉ_i/p_k``.

Error metrics are the paper's: per-class relative error err_H (Eq. 4,
``-1`` = missed class), the ℓ1 distance between frequency vectors, and
the "within ±50%" accuracy summaries of Figure 9.
"""
from __future__ import annotations

import numpy as np

from . import spanning as sp
from .buildup import CountTables


def naive_estimates(
    hits: dict[int, int], n_samples: int, tables: CountTables
) -> dict[int, float]:
    """ĝ_i per graphlet class from uniform treelet samples."""
    t_total = tables.total_treelets()
    p = tables.p_colorful
    out = {}
    for gcode, x in hits.items():
        sigma = sp.num_spanning_trees(gcode, tables.k)
        out[gcode] = (x / n_samples) * t_total / sigma / p
    return out


def err_h(estimate: float, truth: float) -> float:
    """Single-graphlet count error (Eq. 4): 0 = perfect, -1 = missed."""
    if truth == 0:
        raise ValueError("err_H undefined for truth = 0")
    return (estimate - truth) / truth


def error_distribution(
    estimates: dict[int, float], truth: dict[int, int]
) -> dict[int, float]:
    """err_H for every ground-truth class (missing estimate -> -1)."""
    return {g: err_h(estimates.get(g, 0.0), c) for g, c in truth.items() if c > 0}


def l1_error(estimates: dict[int, float], truth: dict[int, int]) -> float:
    """ℓ1 distance between estimated and true *frequency* vectors."""
    tot_t = sum(truth.values())
    tot_e = sum(estimates.values())
    if tot_t == 0 or tot_e == 0:
        raise ValueError("empty distributions")
    keys = set(truth) | set(estimates)
    return float(
        sum(abs(estimates.get(g, 0.0) / tot_e - truth.get(g, 0) / tot_t) for g in keys)
    )


def n_within(estimates: dict[int, float], truth: dict[int, int], tol: float = 0.5) -> int:
    """Number of classes with |err_H| <= tol (Figure 9's metric)."""
    errs = error_distribution(estimates, truth)
    return sum(1 for e in errs.values() if abs(e) <= tol)


def frac_within(estimates: dict[int, float], truth: dict[int, int], tol: float = 0.5) -> float:
    """Fraction of ground-truth classes estimated within ±tol."""
    errs = error_distribution(estimates, truth)
    return n_within(estimates, truth, tol) / len(errs) if errs else float("nan")


def rarest_found(
    hits: dict[int, int], truth: dict[int, int], min_hits: int = 10
) -> float:
    """Frequency of the rarest class seen >= min_hits times (Figure 10):
    the true relative frequency of the least frequent graphlet that the
    sampler reliably witnessed. NaN if none qualifies."""
    tot = sum(truth.values())
    freqs = [
        truth[g] / tot for g, x in hits.items() if x >= min_hits and truth.get(g, 0) > 0
    ]
    return min(freqs) if freqs else float("nan")


def l2_norm(truth: dict[int, int]) -> float:
    """ℓ2 norm of the graphlet frequency vector — the paper's skewness
    proxy (§5.3: AGS wins on high-ℓ2, loses slightly on low-ℓ2)."""
    tot = sum(truth.values())
    return float(np.sqrt(sum((c / tot) ** 2 for c in truth.values())))
