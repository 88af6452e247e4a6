"""Convergence-quality metrics (paper §5.2).

* :func:`kendall_tau_strict` — the paper's adapted Kendall-Tau: a pair
  is concordant iff strictly ordered the same way in both lists *or*
  tied in both; every other pair (including half-ties) is discordant.
  KT = (n+ − n−) / #pairs ∈ [−1, 1], equal to 1 iff the two lists
  induce identical pair relations. O(n log² n) via divide-and-conquer
  inversion counting.

* :func:`accuracy` — fraction of r-cliques whose τ equals κ (the
  paper's second metric, used in Fig. 7 and the active-ratio analysis).
"""
from __future__ import annotations

import numpy as np


def _inversions(a: np.ndarray):
    """(#pairs i<j with a[i] > a[j], sorted copy) by divide and conquer."""
    n = a.size
    if n < 2:
        return 0, np.sort(a)
    inv_l, left = _inversions(a[: n // 2])
    inv_r, right = _inversions(a[n // 2:])
    # Cross pairs: for each y on the right, count left elements > y.
    cross = int((left.size - np.searchsorted(left, right, side="right")).sum())
    return inv_l + inv_r + cross, np.sort(np.concatenate([left, right]))


def _tie_pairs(keys: np.ndarray) -> int:
    """Σ C(m, 2) over the multiplicities m of equal keys."""
    _, counts = np.unique(keys, return_counts=True)
    return int((counts * (counts - 1) // 2).sum())


def kendall_tau_strict(x, y) -> float:
    """The paper's strict Kendall-Tau between two equal-length lists."""
    x = np.asarray(x, dtype=np.int64)
    y = np.asarray(y, dtype=np.int64)
    if x.shape != y.shape:
        raise ValueError("x and y must have the same length")
    n = x.size
    total = n * (n - 1) // 2
    if total == 0:
        return 1.0
    tx = _tie_pairs(x)
    ty = _tie_pairs(y)
    # Both-tied pairs: ties of the combined (x, y) key.
    span = int(y.max() - y.min()) + 1 if n else 1
    combo = x * span + (y - y.min())
    txy = _tie_pairs(combo)
    # Strictly discordant pairs: sort by (x, y) ascending, count
    # inversions of y among strictly-x-different pairs. Equal-x runs are
    # y-ascending, so they contribute no (strict) inversions.
    order = np.lexsort((y, x))
    d_strict, _ = _inversions(y[order])
    strict_pairs = total - tx - ty + txy
    concordant_strict = strict_pairs - d_strict
    n_plus = concordant_strict + txy
    n_minus = total - n_plus
    return (n_plus - n_minus) / total


def accuracy(tau, kappa) -> float:
    """Fraction of positions where τ == κ (1.0 for empty input)."""
    tau = np.asarray(tau)
    kappa = np.asarray(kappa)
    if tau.shape != kappa.shape:
        raise ValueError("tau and kappa must have the same length")
    if tau.size == 0:
        return 1.0
    return float((tau == kappa).mean())


def kendall_tau_naive(x, y) -> float:
    """O(n²) reference for the strict Kendall-Tau (tests only)."""
    x = np.asarray(x)
    y = np.asarray(y)
    n = x.size
    total = n * (n - 1) // 2
    if total == 0:
        return 1.0
    n_plus = 0
    for i in range(n):
        for j in range(i + 1, n):
            if (x[i] < x[j] and y[i] < y[j]) or (x[i] > x[j] and y[i] > y[j]):
                n_plus += 1
            elif x[i] == x[j] and y[i] == y[j]:
                n_plus += 1
    return (2 * n_plus - total) / total
