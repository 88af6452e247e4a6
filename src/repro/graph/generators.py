"""Deterministic synthetic graph generators.

The paper evaluates on 10 SNAP / NetworkRepository graphs (Table 3).
Those are not available offline, so this module provides synthetic
analogues (see ``SUITE``) chosen to mimic each graph's structural
flavour at ~1/1000 ("unit") and ~1/100 ("bench") scale. All generators
are pure numpy, deterministic in ``seed``, and return a pandas edge
list in canonical form (``src < dst``, distinct, no self loops).
"""
from __future__ import annotations

from typing import Callable, Dict, Tuple

import numpy as np
import pandas as pd


def _canon(src: np.ndarray, dst: np.ndarray) -> pd.DataFrame:
    """Canonicalize a raw pair list: orient, drop loops and duplicates."""
    lo = np.minimum(src, dst).astype(np.int64)
    hi = np.maximum(src, dst).astype(np.int64)
    keep = lo != hi
    pdf = pd.DataFrame({"src": lo[keep], "dst": hi[keep]})
    return (
        pdf.drop_duplicates()
        .sort_values(["src", "dst"])
        .reset_index(drop=True)
    )


def from_edge_list(pairs) -> pd.DataFrame:
    """Canonical edge frame from an iterable of (u, v) pairs."""
    arr = np.asarray(list(pairs), dtype=np.int64)
    if arr.size == 0:
        return pd.DataFrame({"src": np.array([], dtype=np.int64), "dst": np.array([], dtype=np.int64)})
    return _canon(arr[:, 0], arr[:, 1])


def gnp(n: int, p: float, seed: int = 0) -> pd.DataFrame:
    """Erdős–Rényi G(n, p). O(n^2) sampling — intended for small test graphs."""
    if n < 0 or not (0.0 <= p <= 1.0):
        raise ValueError("gnp requires n >= 0 and 0 <= p <= 1")
    g = np.random.default_rng(seed)
    iu, ju = np.triu_indices(n, k=1)
    mask = g.random(iu.shape[0]) < p
    return _canon(iu[mask], ju[mask])


def complete_graph(n: int) -> pd.DataFrame:
    """K_n. κ2 = n-1, κ3 = n-2, κ4 = n-3 for every clique — a gold fixture."""
    iu, ju = np.triu_indices(n, k=1)
    return _canon(iu, ju)


def cycle_graph(n: int) -> pd.DataFrame:
    """C_n: every vertex has κ2 = 2 (n >= 3), no triangles."""
    v = np.arange(n, dtype=np.int64)
    return _canon(v, (v + 1) % n)


def star_graph(n: int) -> pd.DataFrame:
    """Star K_{1,n}: hub 0 with n leaves; all core numbers are 1."""
    leaves = np.arange(1, n + 1, dtype=np.int64)
    return _canon(np.zeros(n, dtype=np.int64), leaves)


def path_graph(n: int) -> pd.DataFrame:
    """P_n on vertices 0..n-1."""
    v = np.arange(n - 1, dtype=np.int64)
    return _canon(v, v + 1)


def fig3_graph() -> pd.DataFrame:
    """The 6-vertex k-core toy of the paper's Figure 3.

    Reverse-engineered from the worked trace: degrees f:1 e:2 a:2 b:3
    c:2 d:2; τ1(a)=2, τ2(a)=1; κ2 = {a:1, b:2, c:2, d:2, e:1, f:1};
    SND converges in two iterations. Vertices a..f → 0..5.
    """
    a, b, c, d, e, f = range(6)
    return from_edge_list([(f, e), (e, a), (a, b), (b, c), (b, d), (c, d)])


def watts_strogatz(n: int, k: int, p: float, seed: int = 0) -> pd.DataFrame:
    """Watts–Strogatz small world: ring lattice (k nearest, k even) with
    rewiring probability p. High clustering → rich truss/nucleus structure."""
    if k % 2 or k >= n:
        raise ValueError("watts_strogatz requires even k < n")
    g = np.random.default_rng(seed)
    src_l, dst_l = [], []
    v = np.arange(n, dtype=np.int64)
    for off in range(1, k // 2 + 1):
        dst = (v + off) % n
        rewire = g.random(n) < p
        dst = dst.copy()
        dst[rewire] = g.integers(0, n, rewire.sum())
        src_l.append(v)
        dst_l.append(dst)
    return _canon(np.concatenate(src_l), np.concatenate(dst_l))


def barabasi_albert(n: int, m: int, seed: int = 0, closure: float = 0.0) -> pd.DataFrame:
    """Preferential attachment with optional triadic closure.

    Each new vertex attaches to ``m`` targets sampled from the repeated-
    endpoint urn (classic BA). With probability ``closure`` each non-first
    attachment copies a random neighbor of the previous target instead
    (Holme–Kim style), boosting the triangle density social networks show.
    """
    if m < 1 or n <= m:
        raise ValueError("barabasi_albert requires 1 <= m < n")
    g = np.random.default_rng(seed)
    urn: list[int] = []
    adj: list[list[int]] = [[] for _ in range(n)]
    src_l: list[int] = []
    dst_l: list[int] = []
    # Seed clique on m+1 vertices.
    for i in range(m + 1):
        for j in range(i + 1, m + 1):
            src_l.append(i)
            dst_l.append(j)
            adj[i].append(j)
            adj[j].append(i)
            urn += [i, j]
    for v in range(m + 1, n):
        targets: set[int] = set()
        prev = -1
        while len(targets) < m:
            if prev >= 0 and targets and g.random() < closure and adj[prev]:
                cand = int(adj[prev][g.integers(0, len(adj[prev]))])
            else:
                cand = int(urn[g.integers(0, len(urn))])
            if cand != v and cand not in targets:
                targets.add(cand)
                prev = cand
        for t in targets:
            src_l.append(v)
            dst_l.append(t)
            adj[v].append(t)
            adj[t].append(v)
            urn += [v, t]
    return _canon(np.asarray(src_l), np.asarray(dst_l))


def rmat(scale: int, edge_factor: int = 8, a: float = 0.57, b: float = 0.19,
         c: float = 0.19, seed: int = 0) -> pd.DataFrame:
    """R-MAT / Kronecker power-law graph on 2^scale vertices.

    Vertex ids are relabelled to a dense 0..n-1 range so clique-id
    packing stays narrow. d = 1 - a - b - c.
    """
    d = 1.0 - a - b - c
    if d < 0:
        raise ValueError("rmat probabilities must sum to <= 1")
    g = np.random.default_rng(seed)
    n = 1 << scale
    m = n * edge_factor
    src = np.zeros(m, dtype=np.int64)
    dst = np.zeros(m, dtype=np.int64)
    for bit in range(scale):
        r = g.random(m)
        # Quadrant choice per edge per bit.
        in_b = (r >= a) & (r < a + b)
        in_c = (r >= a + b) & (r < a + b + c)
        in_d = r >= a + b + c
        src |= ((in_c | in_d).astype(np.int64)) << bit
        dst |= ((in_b | in_d).astype(np.int64)) << bit
    pdf = _canon(src, dst)
    # Dense relabel.
    ids = np.unique(np.concatenate([pdf["src"].to_numpy(), pdf["dst"].to_numpy()]))
    lookup = {int(x): i for i, x in enumerate(ids)}
    pdf["src"] = pdf["src"].map(lookup).astype(np.int64)
    pdf["dst"] = pdf["dst"].map(lookup).astype(np.int64)
    return _canon(pdf["src"].to_numpy(), pdf["dst"].to_numpy())


def planted_cliques(n_cliques: int, clique_size: int, n_noise: int,
                    noise_edges: int, seed: int = 0,
                    bridge_per_clique: int = 2,
                    size_jitter: int = 0, dropout: float = 0.0) -> pd.DataFrame:
    """Dense blocks in a sparse sea — web-graph-like hierarchy.

    ``n_cliques`` disjoint cliques of ``clique_size`` vertices, plus
    ``n_noise`` background vertices wired with ``noise_edges`` random
    edges; each clique additionally gets ``bridge_per_clique`` random
    bridges into the background so everything is connected-ish. Yields
    strong, well-separated nuclei (like web-NotreDame's dense blocks).

    ``size_jitter`` draws each block's size uniformly from
    [clique_size - size_jitter, clique_size + size_jitter] and
    ``dropout`` removes that fraction of in-block edges — both create
    the S-degree gradients that make convergence non-trivial (a perfectly
    uniform block satisfies τ₀ = κ and converges in zero iterations).
    """
    g = np.random.default_rng(seed)
    src_l, dst_l = [], []
    base = 0
    for ci in range(n_cliques):
        size = clique_size
        if size_jitter:
            size = int(g.integers(max(3, clique_size - size_jitter),
                                  clique_size + size_jitter + 1))
        iu, ju = np.triu_indices(size, k=1)
        if dropout > 0.0:
            keep = g.random(iu.size) >= dropout
            iu, ju = iu[keep], ju[keep]
        src_l.append(base + iu)
        dst_l.append(base + ju)
        base += size
    nv_cliques = base
    n_total = nv_cliques + n_noise
    if n_noise > 1 and noise_edges > 0:
        src_l.append(g.integers(nv_cliques, n_total, noise_edges))
        dst_l.append(g.integers(nv_cliques, n_total, noise_edges))
    if n_noise > 0 and bridge_per_clique > 0 and nv_cliques > 0:
        src_l.append(g.integers(0, nv_cliques, bridge_per_clique * n_cliques))
        dst_l.append(g.integers(nv_cliques, n_total, bridge_per_clique * n_cliques))
    return _canon(np.concatenate(src_l), np.concatenate(dst_l))


# ---------------------------------------------------------------------------
# Dataset suite mirroring the paper's Table 3 (substitution documented in
# DESIGN.md §3). Keys are shortened paper names with a -lite suffix.
# ---------------------------------------------------------------------------

GraphFn = Callable[[], pd.DataFrame]


def _suite(scale: str) -> Dict[str, GraphFn]:
    big = scale == "bench"

    def s(unit_val: int, bench_val: int) -> int:
        return bench_val if big else unit_val

    return {
        # internet topology: heavy-tailed degrees
        "ask-lite": lambda: rmat(s(8, 11), edge_factor=6, seed=11),
        # dense social ego-network: very high clustering
        "fb-lite": lambda: watts_strogatz(s(150, 700), s(16, 20), 0.05, seed=12),
        # large online social nets: BA with triadic closure
        "slj-lite": lambda: barabasi_albert(s(300, 3000), s(6, 8), seed=13, closure=0.6),
        "ork-lite": lambda: barabasi_albert(s(350, 3500), s(8, 10), seed=14, closure=0.5),
        # trust network: small-world, moderate clustering
        "sse-lite": lambda: watts_strogatz(s(200, 1500), s(10, 12), 0.15, seed=15),
        # twitter follower graphs: power law + closure
        "hg-lite": lambda: barabasi_albert(s(250, 2500), s(7, 9), seed=16, closure=0.55),
        "tw-lite": lambda: watts_strogatz(s(120, 900), s(14, 18), 0.1, seed=17),
        # web graphs: planted dense blocks (heterogeneous sizes, eroded
        # edges -> non-trivial S-degree gradients) in sparse background
        "wgo-lite": lambda: planted_cliques(
            s(8, 40), s(8, 10), s(150, 1200), s(400, 3500), seed=18,
            size_jitter=s(3, 4), dropout=0.15),
        "wnd-lite": lambda: planted_cliques(
            s(6, 30), s(10, 14), s(100, 800), s(250, 2000), seed=19,
            size_jitter=s(4, 6), dropout=0.2),
        # wikipedia: power-law, lighter clustering
        "wiki-lite": lambda: rmat(s(8, 11), edge_factor=8, seed=20),
    }


SUITE_UNIT: Dict[str, GraphFn] = _suite("unit")
SUITE_BENCH: Dict[str, GraphFn] = _suite("bench")

#: Paper-graph ↔ suite-graph correspondence, for tables in EXPERIMENTS.md.
PAPER_NAMES: Dict[str, str] = {
    "ask-lite": "as-skitter (ASK)",
    "fb-lite": "facebook (FB)",
    "slj-lite": "soc-LiveJournal (SLJ)",
    "ork-lite": "soc-orkut (ORK)",
    "sse-lite": "soc-sign-epinions (SSE)",
    "hg-lite": "soc-twitter-higgs (HG)",
    "tw-lite": "twitter (TW)",
    "wgo-lite": "web-Google (WGO)",
    "wnd-lite": "web-NotreDame (WND)",
    "wiki-lite": "wikipedia-200611 (WIKI)",
}


def suite(scale: str = "unit") -> Dict[str, GraphFn]:
    """The named dataset suite at ``unit`` or ``bench`` scale."""
    if scale == "unit":
        return SUITE_UNIT
    if scale == "bench":
        return SUITE_BENCH
    raise ValueError(f"unknown scale {scale!r} (use 'unit' or 'bench')")


def load(name: str, scale: str = "unit") -> pd.DataFrame:
    """Generate suite graph ``name`` at ``scale``."""
    return suite(scale)[name]()
