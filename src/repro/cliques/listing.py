"""REC-LIST-CLIQUES (Algorithm 1) and the counting kernels built on it.

The recursion grows a clique C by intersecting the candidate set I with
the directed (O(alpha)-oriented) neighbourhood of each candidate, so
each c-clique is discovered exactly once, in DG order. At the base level
the whole candidate batch is handed to the callback at once, which lets
the counting kernels update C(s-1, r) subset counters with one
vectorized delta instead of per-clique Python work.

Work matches O(m * alpha^(c-2)) per Shi et al. [60]; ``Stats`` counts
the operations that the work-span cost model (instrument.py) consumes.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from itertools import combinations
from typing import Callable

import numpy as np

from ..graphs.csr import CSR

__all__ = [
    "Stats",
    "list_cliques",
    "count_cliques",
    "enumerate_cliques",
    "s_counts_per_r_clique",
    "extend_cliques",
    "intersect_neighborhoods",
]


@dataclass
class Stats:
    """Operation counters feeding the work-span cost model."""

    intersect_work: int = 0  # total elements touched by intersections
    cliques_found: int = 0  # c-cliques emitted at the base level
    base_work: int = 0  # per-clique base-level operations
    levels: int = 0

    def merge(self, other: "Stats") -> None:
        self.intersect_work += other.intersect_work
        self.cliques_found += other.cliques_found
        self.base_work += other.base_work
        self.levels = max(self.levels, other.levels)


def _rec(
    dg: CSR,
    I: np.ndarray,
    rl: int,
    C: tuple[int, ...],
    f: Callable[[tuple[int, ...], np.ndarray], None],
    stats: Stats,
) -> None:
    if rl == 1:
        stats.cliques_found += len(I)
        stats.base_work += len(I)
        if len(I):
            f(C, I)
        return
    for v in I:
        nb = dg.neighbors(int(v))
        stats.intersect_work += min(len(I), len(nb)) + 1
        I2 = np.intersect1d(I, nb, assume_unique=True)
        if len(I2) >= rl - 1:
            _rec(dg, I2, rl - 1, C + (int(v),), f, stats)


def list_cliques(
    dg: CSR,
    c: int,
    f: Callable[[tuple[int, ...], np.ndarray], None],
    *,
    roots: np.ndarray | None = None,
    stats: Stats | None = None,
) -> Stats:
    """Apply ``f(prefix, last_batch)`` to every c-clique of the oriented graph.

    Each clique is ``prefix + (v,)`` for v in ``last_batch``; vertices
    appear in DG order. ``roots`` restricts the first level to a subset
    of vertices (the Spark fan-out unit).
    """
    stats = stats if stats is not None else Stats()
    stats.levels = max(stats.levels, c)
    if c < 1:
        return stats
    root_iter = roots if roots is not None else np.arange(dg.n)
    if c == 1:
        arr = np.asarray(root_iter)
        stats.cliques_found += len(arr)
        f((), arr)
        return stats
    for v in root_iter:
        _rec(dg, dg.neighbors(int(v)), c - 1, (int(v),), f, stats)
    return stats


def count_cliques(dg: CSR, c: int, *, roots: np.ndarray | None = None) -> int:
    """Total number of c-cliques."""
    total = 0

    def f(C: tuple[int, ...], batch: np.ndarray) -> None:
        nonlocal total
        total += len(batch)

    list_cliques(dg, c, f, roots=roots)
    return total


def enumerate_cliques(dg: CSR, c: int) -> np.ndarray:
    """All c-cliques as an (n_c, c) matrix with sorted vertex rows."""
    rows: list[np.ndarray] = []

    def f(C: tuple[int, ...], batch: np.ndarray) -> None:
        block = np.empty((len(batch), c), dtype=np.int64)
        block[:, :-1] = C
        block[:, -1] = batch
        rows.append(block)

    list_cliques(dg, c, f)
    if not rows:
        return np.empty((0, c), dtype=np.int64)
    out = np.concatenate(rows)
    out.sort(axis=1)
    return out


def s_counts_per_r_clique(
    dg: CSR,
    r: int,
    s: int,
    *,
    roots: np.ndarray | None = None,
    stats: Stats | None = None,
) -> dict[tuple[int, ...], float]:
    """s-clique count of every r-clique (COUNT-FUNC of Algorithm 2).

    Includes r-cliques with zero incident s-cliques (they form the
    0-bucket). Keys are sorted vertex tuples. For each discovered
    s-clique prefix C plus base batch I, the C(s-1, r) subsets of C each
    gain len(I) and the C(s-1, r-1) subsets gain 1 per base vertex —
    the vectorized form of "add 1 to every size-r subset".
    """
    counts: dict[tuple[int, ...], float] = {}

    def init_r(C: tuple[int, ...], batch: np.ndarray) -> None:
        for v in batch:
            counts[tuple(sorted(C + (int(v),)))] = 0.0

    list_cliques(dg, r, init_r, roots=roots, stats=stats)

    # With a restricted root set (the Spark fan-out), an s-clique rooted
    # here may contain r-cliques rooted in *other* partitions, so counts
    # must not assume the zero-init above covered every touched key —
    # partial counts are merged downstream (groupBy().sum()).
    def on_s(C: tuple[int, ...], batch: np.ndarray) -> None:
        k = len(batch)
        for sub in combinations(C, r):
            key = tuple(sorted(sub))
            counts[key] = counts.get(key, 0.0) + k
        for sub in combinations(C, r - 1):
            base = tuple(sorted(sub))
            for v in batch:
                key = tuple(sorted(base + (int(v),)))
                counts[key] = counts.get(key, 0.0) + 1.0

    list_cliques(dg, s, on_s, roots=roots, stats=stats)
    return counts


def intersect_neighborhoods(und: CSR, R: np.ndarray, stats: Stats | None = None) -> np.ndarray:
    """Intersection of the *undirected* neighbourhoods of the vertices of R
    (Algorithm 2 line 16), starting from the minimum-degree vertex so the
    work is O(min_i deg(v_i)) — the quantity bounded by Lemma 4.1."""
    order = sorted(R, key=lambda v: und.degree(int(v)))
    I = und.neighbors(int(order[0]))
    if stats is not None:
        stats.intersect_work += len(I)
    for v in order[1:]:
        nb = und.neighbors(int(v))
        if stats is not None:
            stats.intersect_work += min(len(I), len(nb)) + 1
        I = np.intersect1d(I, nb, assume_unique=True)
        if len(I) == 0:
            break
    return I


def extend_cliques(
    und: CSR,
    dg: CSR,
    R: np.ndarray,
    need: int,
    f: Callable[[tuple[int, ...], np.ndarray], None],
    *,
    stats: Stats | None = None,
) -> None:
    """List every s-clique containing r-clique R, where need = s - r
    (UPDATE, Algorithm 2 lines 15-17). ``f`` receives the extra vertices
    only: prefix of extras plus a base batch."""
    stats = stats if stats is not None else Stats()
    I = intersect_neighborhoods(und, R, stats)
    if len(I) < need:
        return
    if need == 1:
        stats.cliques_found += len(I)
        f((), I)
        return
    _rec(dg, I, need, (), f, stats)
