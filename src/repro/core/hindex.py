"""h-index computation (paper §2.2, Definition 4; §4.3 heuristics).

H(K) = the largest h such that at least h elements of K are >= h.
"""
from __future__ import annotations

from typing import Iterable

import numpy as np


def h_index_naive(values: Iterable[float]) -> int:
    """Sort-based reference: h = max_i min(i, v_(i)) over the descending sort."""
    vs = sorted((v for v in values), reverse=True)
    h = 0
    for i, v in enumerate(vs, start=1):
        h = max(h, min(i, int(v)))
    return h


def h_index(values: np.ndarray) -> int:
    """Linear-time counting h-index (the paper's §4.3 sorting-free routine).

    Counts how many elements are >= each candidate h using a bounded
    histogram: values above n are clamped to n (they cannot raise the
    h-index beyond n = len(values)).
    """
    v = np.asarray(values)
    n = v.size
    if n == 0:
        return 0
    clamped = np.minimum(v.astype(np.int64), n)
    clamped = clamped[clamped > 0]
    hist = np.bincount(clamped, minlength=n + 1)
    # suffix[h] = #elements >= h
    total = 0
    for h in range(n, 0, -1):
        total += hist[h]
        if total >= h:
            return h
    return 0


def h_index_rows(group_ids: np.ndarray, values: np.ndarray, n_groups: int) -> np.ndarray:
    """Vectorized h-index per group over (group_id, value) rows.

    Sorts rows by (group, -value); within each group the descending rank
    is r = 1.., and H = max over rows of min(r, value). Groups with no
    rows get 0. This is the bulk kernel behind the sequential SND sweep.
    """
    out = np.zeros(n_groups, dtype=np.int64)
    if group_ids.size == 0:
        return out
    order = np.lexsort((-values, group_ids))
    g = group_ids[order]
    v = values[order]
    # rank within group: position - start_of_group + 1
    starts = np.r_[0, np.flatnonzero(g[1:] != g[:-1]) + 1]
    group_start = np.repeat(starts, np.diff(np.r_[starts, g.size]))
    rank = np.arange(g.size) - group_start + 1
    contrib = np.minimum(rank, v)
    np.maximum.at(out, g, contrib)
    return out
