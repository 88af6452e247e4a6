"""Sequential engine: peeling (Alg. 1), SND/AND sweeps, degree levels.

Everything operates on an in-memory :class:`Nucleus` — the generic
(r, s) incidence structure: ``scl[i]`` lists the C(s, r) member
r-clique indices of the i-th s-clique, with a CSR incidence from
r-cliques back to their s-cliques.

This engine is (a) the gold-standard correctness oracle for the Spark
implementations, (b) the paper-faithful AND (arbitrary processing
order, latest values, notification mechanism — §4.2/§4.2.1), and
(c) the sequential peeling baseline that the paper's Table 5 compares
against (the authors parallelize only clique counting; the peel itself
is sequential there too).
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass, field
from typing import List, Optional, Sequence, Tuple

import numpy as np
import pandas as pd

from repro.core.hindex import h_index, h_index_rows
from repro.graph import local as glocal


@dataclass
class Nucleus:
    """Generic (r, s) hypergraph: s-cliques over r-clique indices."""

    n_r: int
    scl: np.ndarray  # (n_s, C(s, r)) int64 member r-clique indices
    inc_ptr: np.ndarray = field(repr=False, default=None)  # CSR over r-cliques
    inc_idx: np.ndarray = field(repr=False, default=None)

    def __post_init__(self) -> None:
        arr = np.asarray(self.scl, dtype=np.int64)
        if arr.ndim != 2:
            arr = arr.reshape(0, 2)
        self.scl = arr
        flat = arr.ravel()
        counts = (
            np.bincount(flat, minlength=self.n_r)
            if flat.size
            else np.zeros(self.n_r, np.int64)
        )
        self.inc_ptr = np.zeros(self.n_r + 1, dtype=np.int64)
        np.cumsum(counts, out=self.inc_ptr[1:])
        # CSR fill by stable sort of the flattened member column.
        rows = np.repeat(np.arange(arr.shape[0], dtype=np.int64), arr.shape[1])
        order = np.argsort(flat, kind="stable")
        self.inc_idx = rows[order]

    @property
    def n_s(self) -> int:
        return self.scl.shape[0]

    @property
    def c(self) -> int:
        """Members per s-clique, C(s, r)."""
        return self.scl.shape[1]

    def incident(self, rid: int) -> np.ndarray:
        """Indices of the s-cliques containing r-clique ``rid``."""
        return self.inc_idx[self.inc_ptr[rid]: self.inc_ptr[rid + 1]]

    def degrees(self) -> np.ndarray:
        """S-degree of every r-clique."""
        return self.inc_ptr[1:] - self.inc_ptr[:-1]

    @classmethod
    def from_membership(cls, n_r: int, scliques: Sequence[Tuple[int, ...]]) -> "Nucleus":
        c = len(scliques[0]) if scliques else 2
        arr = np.asarray(scliques, dtype=np.int64).reshape(-1, c)
        return cls(n_r=n_r, scl=arr)

    @classmethod
    def from_edges(cls, edges: pd.DataFrame, r: int, s: int
                   ) -> Tuple["Nucleus", List[Tuple[int, ...]]]:
        """Build from a pandas edge list; also returns the r-clique tuples."""
        rids, scliques = glocal.membership_local(edges, r, s)
        return cls.from_membership(len(rids), scliques), rids


def nucleus_from_pandas_membership(rid_keys: np.ndarray, mdf: pd.DataFrame,
                                   c: int) -> Tuple[Nucleus, np.ndarray]:
    """Build a Nucleus from collected Spark membership tables.

    ``rid_keys``: packed keys of all r-cliques (defines index order).
    ``mdf``: columns ``sid``, ``rid`` (packed), exactly ``c`` rows per sid.
    Returns the Nucleus and the key array aligned with indices.
    """
    keys = np.asarray(rid_keys, dtype=np.int64)
    lookup = pd.Series(np.arange(keys.size), index=keys)
    if len(mdf) == 0:
        return Nucleus(n_r=keys.size, scl=np.zeros((0, c), dtype=np.int64)), keys
    m = mdf.sort_values("sid", kind="stable")
    ridx = lookup.loc[m["rid"].to_numpy()].to_numpy()
    if ridx.size % c != 0:
        raise ValueError("membership rows not a multiple of C(s, r)")
    scl = ridx.reshape(-1, c)
    return Nucleus(n_r=keys.size, scl=scl), keys


# ---------------------------------------------------------------------------
# Peeling (Algorithm 1) — bucket/lazy-heap implementation, O(total work).
# ---------------------------------------------------------------------------

def peel(nuc: Nucleus) -> np.ndarray:
    """Exact κ_s indices by the peeling process (paper Algorithm 1)."""
    return peel_full(nuc)[0]


def peel_full(nuc: Nucleus):
    """(κ_s indices, processing order) by the peeling process.

    Processes r-cliques in non-decreasing current S-degree; decrements
    are clamped at the degree of the clique being processed, and
    s-cliques containing an already-processed member are skipped. The
    returned processing order is a κ-non-decreasing order under which
    AND converges in a single iteration (Theorem 4).
    """
    d = nuc.degrees().astype(np.int64).copy()
    kappa = np.zeros(nuc.n_r, dtype=np.int64)
    processed = np.zeros(nuc.n_r, dtype=bool)
    scl_alive = np.ones(nuc.n_s, dtype=bool)
    order: List[int] = []
    heap = [(int(d[i]), i) for i in range(nuc.n_r)]
    heapq.heapify(heap)
    while heap:
        dv, rid = heapq.heappop(heap)
        if processed[rid] or dv != d[rid]:
            continue
        processed[rid] = True
        kappa[rid] = dv
        order.append(rid)
        for si in nuc.incident(rid):
            if not scl_alive[si]:
                continue
            members = nuc.scl[si]
            if processed[members].sum() > 1:  # some *other* member processed
                scl_alive[si] = False
                continue
            scl_alive[si] = False
            for other in members:
                if other != rid and d[other] > dv:
                    d[other] -= 1
                    heapq.heappush(heap, (int(d[other]), int(other)))
    return kappa, np.asarray(order, dtype=np.int64)


def degree_levels(nuc: Nucleus) -> int:
    """Number of degree levels (Definition 6) — the convergence bound."""
    return degree_levels_full(nuc)[0]


def degree_levels_full(nuc: Nucleus):
    """(number of levels, per-r-clique level index) per Definition 6.

    Each round removes the full argmin-S-degree set from the remaining
    structure (degrees recomputed by true removal, no clamping).
    """
    d = nuc.degrees().astype(np.int64).copy()
    alive = np.ones(nuc.n_r, dtype=bool)
    scl_alive = np.ones(nuc.n_s, dtype=bool)
    remaining = nuc.n_r
    levels = 0
    level_of = np.full(nuc.n_r, -1, dtype=np.int64)
    # Lazy bucket lists keyed by degree.
    max_d = int(d.max()) if nuc.n_r else 0
    buckets: List[List[int]] = [[] for _ in range(max_d + 2)]
    for i in range(nuc.n_r):
        buckets[d[i]].append(i)
    floor = 0
    while remaining > 0:
        while floor < len(buckets):
            # Does any live entry sit at this degree?
            if any(alive[x] and d[x] == floor for x in buckets[floor]):
                break
            buckets[floor] = []
            floor += 1
        level = [x for x in buckets[floor] if alive[x] and d[x] == floor]
        level = list(dict.fromkeys(level))
        buckets[floor] = []
        for rid in level:
            alive[rid] = False
            level_of[rid] = levels
        levels += 1
        remaining -= len(level)
        lowest_written = floor
        for rid in level:
            for si in nuc.incident(rid):
                if not scl_alive[si]:
                    continue
                scl_alive[si] = False
                for other in nuc.scl[si]:
                    if alive[other]:
                        d[other] -= 1
                        buckets[d[other]].append(int(other))
                        lowest_written = min(lowest_written, int(d[other]))
        floor = lowest_written
    return levels, level_of


def bulk_peel_rounds(nuc: Nucleus) -> int:
    """Number of synchronized rounds a *distributed* bulk peel needs.

    Simulates :func:`repro.core.peel_spark.peel_distributed`'s control
    flow: phase k repeatedly removes every r-clique with current
    S-degree <= k; each removal wave is one distributed round (a global
    shuffle + barrier in the dataflow engine). This is the
    machine-independent cost that the paper's "peeling needs global
    information" argument is about — compare with the local algorithms'
    iteration counts.
    """
    d = nuc.degrees().astype(np.int64).copy()
    alive = np.ones(nuc.n_r, dtype=bool)
    scl_alive = np.ones(nuc.n_s, dtype=bool)
    remaining = nuc.n_r
    rounds = 0
    k = 0
    while remaining > 0:
        k = max(k, int(d[alive].min()))
        while True:
            wave = np.flatnonzero(alive & (d <= k))
            if wave.size == 0:
                break
            rounds += 1
            alive[wave] = False
            remaining -= wave.size
            for rid in wave:
                for si in nuc.incident(rid):
                    if not scl_alive[si]:
                        continue
                    scl_alive[si] = False
                    for other in nuc.scl[si]:
                        if alive[other]:
                            d[other] -= 1
    return rounds


# ---------------------------------------------------------------------------
# SND (Algorithm 2) — synchronous, fully vectorized.
# ---------------------------------------------------------------------------

def _rho_matrix(tau: np.ndarray, scl: np.ndarray) -> np.ndarray:
    """ρ(S, R) for every membership cell: min τ over the *other* members."""
    vals = tau[scl]  # (n_s, c)
    part = np.partition(vals, 1, axis=1)
    min1 = part[:, 0][:, None]
    min2 = part[:, 1][:, None]
    return np.where(vals > min1, min1, min2)


def snd_seq(nuc: Nucleus, max_iter: Optional[int] = None,
            track_history: bool = False):
    """Synchronous iterated h-index (Algorithm 2) on the driver.

    Returns ``(kappa, iterations, history)`` where ``iterations`` counts
    sweeps that updated >= 1 τ index (Fig. 3 convention) and ``history``
    (if requested) holds τ_0, τ_1, ... including the converged value.
    """
    tau = nuc.degrees().astype(np.int64).copy()
    history = [tau.copy()] if track_history else None
    iters = 0
    if nuc.n_s == 0:
        return tau, 0, history
    flat_gid = nuc.scl.ravel()
    while max_iter is None or iters < max_iter:
        rho = _rho_matrix(tau, nuc.scl)
        new_tau = h_index_rows(flat_gid, rho.ravel(), nuc.n_r)
        if np.array_equal(new_tau, tau):
            break
        tau = new_tau
        iters += 1
        if track_history:
            history.append(tau.copy())
    return tau, iters, history


# ---------------------------------------------------------------------------
# AND (Algorithm 3) — asynchronous, arbitrary order, optional notification.
# ---------------------------------------------------------------------------

def and_seq(nuc: Nucleus, order: Optional[np.ndarray] = None,
            notify: bool = True, max_iter: Optional[int] = None,
            track_history: bool = False):
    """Asynchronous iterated h-index (Algorithm 3) on the driver.

    ``order`` is the per-sweep processing order (default: natural index
    order, matching the paper's "natural ordering" experiments).
    With ``notify`` the §4.2.1 notification mechanism skips idle
    r-cliques. Returns ``AndResult`` with κ, iteration count (sweeps
    with >= 1 update), total τ computations, and optional τ history
    snapshots taken at sweep boundaries.
    """
    tau = nuc.degrees().astype(np.int64).copy()
    n = nuc.n_r
    order = np.arange(n) if order is None else np.asarray(order)
    active = np.ones(n, dtype=bool)
    computations = 0
    iters = 0
    sweeps = 0
    history = [tau.copy()] if track_history else None
    while max_iter is None or sweeps < max_iter:
        changed_any = False
        did_work = False
        for rid in order:
            if notify and not active[rid]:
                continue
            sis = nuc.incident(rid)
            did_work = True
            computations += 1
            if sis.size == 0:
                h = 0
            else:
                rows = nuc.scl[sis]  # (k, c)
                vals = tau[rows]
                masked = np.where(rows == rid, np.iinfo(np.int64).max, vals)
                rho = masked.min(axis=1)
                h = h_index(rho)
            if h != tau[rid]:
                changed_any = True
                if notify:
                    peers = np.unique(nuc.scl[sis])
                    sel = (tau[peers] > h) & (tau[peers] <= tau[rid]) & (peers != rid)
                    active[peers[sel]] = True
                tau[rid] = h
            if notify:
                active[rid] = False
        sweeps += 1
        if changed_any:
            iters += 1
        if track_history:
            history.append(tau.copy())
        if notify:
            if not active.any():
                break
        elif not changed_any:
            break
        if not did_work:
            break
    return tau, iters, computations, history
