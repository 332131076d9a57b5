"""ND and PND (Sariyüce et al. [56, 57]): global peeling baselines.

Both peel r-cliques *one at a time* in min-count order. ND is the
serial algorithm. PND parallelizes counting and each single peel's
update, but — to avoid the synchronization problems that
ARB-NUCLEUS-DECOMP's update-aggregation machinery solves — it does NOT
peel equal-count r-cliques simultaneously; every r-clique is its own
round with a synchronization barrier. This is exactly the behaviour
behind the paper's "PND performs 5608-84170x the number of rounds of
ARB-NUCLEUS-DECOMP" measurement: here ``rounds`` equals the number of
peeled r-cliques (minus free batches at round end).
"""
from __future__ import annotations

import heapq
import time
from itertools import combinations
from math import log2

import numpy as np

from ..cliques.listing import Stats, extend_cliques, s_counts_per_r_clique
from ..graphs.csr import build_csr, orient_csr
from ..graphs.orient import make_rank
from ..instrument import Counters

__all__ = ["nd_decomposition", "pnd_decomposition"]


def _sequential_peel(edges: np.ndarray, r: int, s: int, *, orientation: str = "degeneracy"):
    t0 = time.perf_counter()
    und = build_csr(edges)
    rank = make_rank(und, orientation)
    dg = orient_csr(und, rank)
    counters = Counters()
    stats = Stats()
    d = s_counts_per_r_clique(dg, r, s, stats=stats)
    counters.work += stats.intersect_work + stats.base_work
    counts = {k: int(round(v)) for k, v in d.items()}
    heap = [(c, k) for k, c in counts.items()]
    heapq.heapify(heap)
    peeled: set[tuple[int, ...]] = set()
    core: dict[tuple[int, ...], int] = {}
    log2n = log2(max(2, und.n))
    k_cur = 0
    while heap:
        c, R = heapq.heappop(heap)
        if R in peeled or c != counts[R]:
            continue
        k_cur = max(k_cur, c)
        core[R] = k_cur
        peeled.add(R)
        counters.rounds += 1  # one r-clique per round: no intra-bucket parallelism
        counters.span_logs += log2n
        upd = Stats()
        found: list[np.ndarray] = []
        if counts[R] > 0:

            def f(C: tuple[int, ...], batch: np.ndarray, R=R) -> None:
                blk = np.empty((len(batch), s), dtype=np.int64)
                blk[:, :r] = R
                if C:
                    blk[:, r : s - 1] = np.asarray(C, dtype=np.int64)
                blk[:, s - 1] = batch
                found.append(blk)

            extend_cliques(und, dg, np.array(R), s - r, f, stats=upd)
        counters.scliques_discovered += upd.cliques_found
        counters.work += upd.intersect_work + upd.base_work
        for blk in found:
            blk.sort(axis=1)
            for row in blk:
                subsets = [tuple(t) for t in combinations(row.tolist(), r)]
                if any(sub in peeled and sub != R for sub in subsets):
                    continue  # s-clique already destroyed by an earlier peel
                for sub in subsets:
                    if sub == R or sub in peeled:
                        continue
                    counts[sub] -= 1
                    heapq.heappush(heap, (counts[sub], sub))
                    counters.work += 1
    counters.wall_seconds = time.perf_counter() - t0
    return core, counters


def nd_decomposition(edges: np.ndarray, r: int, s: int):
    """Serial ND: returns (core_dict, counters); counters.rounds is #peels."""
    return _sequential_peel(edges, r, s)


def pnd_decomposition(edges: np.ndarray, r: int, s: int):
    """PND: same peel order/results; rounds dominate its parallel span."""
    return _sequential_peel(edges, r, s)
