"""PKT-style k-truss decomposition (Kabir & Madduri [37], Che et al. [12]).

The specialized (2,3) competitor: edge-centric, level-synchronous
peeling over per-edge triangle supports with flat arrays — no general
(r,s) machinery, which is exactly why the paper can only compare
against it for k-truss. Returns the (2,3)-clique core number per edge
(support-at-peel), which tests check against the general algorithm.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from ..cliques.listing import enumerate_cliques
from ..graphs.csr import build_csr, orient_csr
from ..graphs.orient import degree_order

__all__ = ["pkt_truss", "PktResult"]


@dataclass
class PktResult:
    edges: np.ndarray  # (m, 2) canonical u < v
    core: np.ndarray  # (m,) (2,3)-clique core number per edge
    sublevels: int
    wall_seconds: float


def pkt_truss(edges: np.ndarray) -> PktResult:
    t0 = time.perf_counter()
    und = build_csr(edges)
    n = und.n
    dg = orient_csr(und, degree_order(und))
    tri = enumerate_cliques(dg, 3)  # rows sorted asc

    # Canonical edge ids via sorted packed keys.
    src = np.repeat(np.arange(n, dtype=np.int64), und.degrees())
    mask = src < und.nbrs
    eu, ev = src[mask], und.nbrs[mask]
    ekeys = eu * n + ev
    order = np.argsort(ekeys)
    ekeys, eu, ev = ekeys[order], eu[order], ev[order]
    m = len(ekeys)

    def eid(a: np.ndarray, b: np.ndarray) -> np.ndarray:
        return np.searchsorted(ekeys, a * n + b)

    tri_e = np.empty((len(tri), 3), dtype=np.int64)
    if len(tri):
        tri_e[:, 0] = eid(tri[:, 0], tri[:, 1])
        tri_e[:, 1] = eid(tri[:, 0], tri[:, 2])
        tri_e[:, 2] = eid(tri[:, 1], tri[:, 2])
    support = np.bincount(tri_e.ravel(), minlength=m) if len(tri) else np.zeros(m, np.int64)

    tri_alive = np.ones(len(tri), dtype=bool)
    edge_alive = np.ones(m, dtype=bool)
    core = np.zeros(m, dtype=np.int64)
    # Per-edge incident triangle lists (CSR over triangle ids).
    if len(tri):
        flat = tri_e.ravel()
        torder = np.argsort(flat, kind="stable")
        tids = np.repeat(np.arange(len(tri)), 3)[torder]
        toff = np.zeros(m + 1, dtype=np.int64)
        np.add.at(toff, flat + 1, 1)
        toff = np.cumsum(toff)
    sublevels = 0
    remaining = m
    k = 0
    while remaining > 0:
        if not (edge_alive & (support <= k)).any():
            alive_sup = support[edge_alive]
            k = int(alive_sup.min())
        frontier = np.flatnonzero(edge_alive & (support <= k))
        while len(frontier):
            sublevels += 1
            core[frontier] = k
            edge_alive[frontier] = False
            remaining -= len(frontier)
            if len(tri) == 0:
                break
            nxt: list[np.ndarray] = []
            for e in frontier:
                for t in tids[toff[e] : toff[e + 1]]:
                    if not tri_alive[t]:
                        continue
                    tri_alive[t] = False
                    others = tri_e[t][tri_e[t] != e]
                    for o in others:
                        if edge_alive[o]:
                            support[o] -= 1
                            if support[o] <= k:
                                nxt.append(o)
            frontier = np.unique(np.array(nxt, dtype=np.int64)) if nxt else np.empty(0, np.int64)
            frontier = frontier[edge_alive[frontier]]
    return PktResult(
        edges=np.stack([eu, ev], axis=1),
        core=core,
        sublevels=sublevels,
        wall_seconds=time.perf_counter() - t0,
    )
