"""Brute-force reference oracle for (r, s) nucleus decomposition.

Enumerates all cliques explicitly and peels minimum-count r-cliques one
at a time — the textbook sequential algorithm. Exponential-ish and only
for small test graphs, but independent of every optimized code path, so
it is the ground truth for all implementations in this repo.
"""
from __future__ import annotations

import heapq
from itertools import combinations

import numpy as np

from ..graphs.csr import CSR, build_csr

__all__ = ["brute_force_cliques", "reference_nucleus"]


def brute_force_cliques(und: CSR, c: int) -> list[tuple[int, ...]]:
    """All c-cliques as sorted tuples, by naive extension."""
    adj = [set(und.neighbors(v).tolist()) for v in range(und.n)]
    out: list[tuple[int, ...]] = []

    def extend(clique: tuple[int, ...], cand: set[int]) -> None:
        if len(clique) == c:
            out.append(clique)
            return
        for v in sorted(cand):
            extend(clique + (v,), {w for w in cand if w > v and w in adj[v]})

    extend((), set(range(und.n)))
    return out


def reference_nucleus(edges: np.ndarray, r: int, s: int, n: int | None = None) -> dict[tuple[int, ...], int]:
    """(r, s)-clique core number of every r-clique, by sequential peeling."""
    und = build_csr(edges, n)
    r_cliques = brute_force_cliques(und, r)
    s_cliques = brute_force_cliques(und, s)
    counts: dict[tuple[int, ...], int] = {R: 0 for R in r_cliques}
    incident: dict[tuple[int, ...], list[int]] = {R: [] for R in r_cliques}
    for si, S in enumerate(s_cliques):
        for sub in combinations(S, r):
            counts[sub] += 1
            incident[sub].append(si)
    s_alive = [True] * len(s_cliques)
    peeled: set[tuple[int, ...]] = set()
    core: dict[tuple[int, ...], int] = {}
    heap = [(c, R) for R, c in counts.items()]
    heapq.heapify(heap)
    k = 0
    while heap:
        c, R = heapq.heappop(heap)
        if R in peeled or c != counts[R]:
            continue  # stale entry
        k = max(k, c)
        core[R] = k
        peeled.add(R)
        for si in incident[R]:
            if not s_alive[si]:
                continue
            s_alive[si] = False  # destroying S decrements every other member
            for sub in combinations(s_cliques[si], r):
                if sub not in peeled:
                    counts[sub] -= 1
                    heapq.heappush(heap, (counts[sub], sub))
    return core
