"""Pure-Python reference clique enumeration.

Used (a) to cross-check the Spark enumeration in tests and (b) to build
the in-memory ``Nucleus`` structure for the sequential engine on small
graphs without a Spark round-trip. ``k_cliques`` is an ordered-adjacency
backtracking enumeration — fine up to a few hundred thousand cliques.
"""
from __future__ import annotations

from itertools import combinations
from typing import Dict, List, Sequence, Tuple

import numpy as np
import pandas as pd

Clique = Tuple[int, ...]


def adjacency(edges: pd.DataFrame) -> Dict[int, set]:
    """Adjacency sets from a canonical pandas edge list."""
    adj: Dict[int, set] = {}
    for u, v in zip(edges["src"].to_numpy(), edges["dst"].to_numpy()):
        adj.setdefault(int(u), set()).add(int(v))
        adj.setdefault(int(v), set()).add(int(u))
    return adj


def k_cliques(edges: pd.DataFrame, k: int) -> List[Clique]:
    """All k-cliques as sorted vertex tuples (ascending id order).

    k=1 returns vertices, k=2 the edges; k >= 3 extends each (k-1)-clique
    by common higher neighbors (ids strictly above the clique max).
    """
    if k < 1:
        raise ValueError("k must be >= 1")
    adj = adjacency(edges)
    verts = sorted(adj)
    if k == 1:
        return [(v,) for v in verts]
    cliques: List[Clique] = [
        (int(u), int(v))
        for u, v in zip(edges["src"].to_numpy(), edges["dst"].to_numpy())
    ]
    cliques.sort()
    for _ in range(k - 2):
        nxt: List[Clique] = []
        for cl in cliques:
            common = set(adj[cl[0]])
            for v in cl[1:]:
                common &= adj[v]
            hi = cl[-1]
            for w in sorted(common):
                if w > hi:
                    nxt.append(cl + (w,))
        cliques = nxt
    return cliques


def brute_k_cliques(edges: pd.DataFrame, k: int) -> List[Clique]:
    """O(n^k) itertools enumeration — the dumbest possible oracle."""
    adj = adjacency(edges)
    verts = sorted(adj)
    if k == 1:
        return [(v,) for v in verts]
    out: List[Clique] = []
    for combo in combinations(verts, k):
        if all(b in adj[a] for a, b in combinations(combo, 2)):
            out.append(combo)
    return out


def membership_local(edges: pd.DataFrame, r: int, s: int
                     ) -> Tuple[List[Clique], List[Tuple[int, ...]]]:
    """(r-clique list, s-clique member-index list) for the seq engine.

    Returns ``rids`` — every r-clique in the graph as a sorted vertex
    tuple — and ``scliques`` — for every s-clique, the tuple of indices
    into ``rids`` of its C(s, r) member r-cliques.
    """
    if not (1 <= r < s):
        raise ValueError("need 1 <= r < s")
    rids = k_cliques(edges, r)
    index = {cl: i for i, cl in enumerate(rids)}
    scl = k_cliques(edges, s)
    scliques = [
        tuple(index[sub] for sub in combinations(S, r)) for S in scl
    ]
    return rids, scliques


def s_degrees_local(n_r: int, scliques: Sequence[Tuple[int, ...]]) -> np.ndarray:
    """S-degree of each r-clique (by index) from the membership lists."""
    d = np.zeros(n_r, dtype=np.int64)
    for S in scliques:
        for ri in S:
            d[ri] += 1
    return d
