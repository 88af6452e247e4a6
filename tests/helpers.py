"""Shared fixtures/utilities for the test suite."""
from __future__ import annotations

from typing import Dict, List, Sequence, Tuple

import numpy as np
import pandas as pd

from repro.graph import generators as gen

#: Small graphs used across parametrized tests (name -> pandas edges).
SMALL_GRAPHS: Dict[str, pd.DataFrame] = {
    "fig3": gen.fig3_graph(),
    "k5": gen.complete_graph(5),
    "k6": gen.complete_graph(6),
    "c6": gen.cycle_graph(6),
    "star5": gen.star_graph(5),
    "path5": gen.path_graph(5),
    "bowtie": gen.from_edge_list([(0, 1), (1, 2), (0, 2), (2, 3), (3, 4), (2, 4)]),
    "gnp15": gen.gnp(15, 0.35, seed=1),
    "gnp20": gen.gnp(20, 0.25, seed=2),
    "ws20": gen.watts_strogatz(20, 4, 0.2, seed=3),
    "ba20": gen.barabasi_albert(20, 3, seed=4, closure=0.5),
    "planted": gen.planted_cliques(2, 5, 8, 10, seed=5),
}

#: The paper's three evaluated decompositions.
RS_MAIN: List[Tuple[int, int]] = [(1, 2), (2, 3), (3, 4)]
#: Extra (r, s) pairs exercising the generalization.
RS_EXTRA: List[Tuple[int, int]] = [(1, 3), (1, 4), (2, 4)]


def naive_peel(n_r: int, scliques: Sequence[Tuple[int, ...]]) -> np.ndarray:
    """Literal Algorithm 1 with O(n²) min scans — independent oracle."""
    d = np.zeros(n_r, dtype=np.int64)
    incident: List[List[int]] = [[] for _ in range(n_r)]
    for si, S in enumerate(scliques):
        for x in S:
            d[x] += 1
            incident[x].append(si)
    processed = np.zeros(n_r, dtype=bool)
    used = np.zeros(len(scliques), dtype=bool)
    kappa = np.zeros(n_r, dtype=np.int64)
    for _ in range(n_r):
        best, bestd = -1, None
        for rid in range(n_r):
            if not processed[rid] and (bestd is None or d[rid] < bestd):
                best, bestd = rid, d[rid]
        rid = best
        kappa[rid] = d[rid]
        for si in incident[rid]:
            if used[si]:
                continue
            used[si] = True
            S = scliques[si]
            if any(processed[x] for x in S if x != rid):
                continue
            for x in S:
                if x != rid and d[x] > d[rid]:
                    d[x] -= 1
        processed[rid] = True
    return kappa
