"""Shared small graphs for correctness tests.

``FIG1_EDGES`` is the paper's Figure 1 worked example: K5 on
{a..e}=0..4, f=5 attached to {a,b,e}, g=6 attached to {c,d}. The paper
states its exact (3,4) decomposition (cdg -> 0; abf, aef, bef -> 1; the
ten K5 triangles -> 2), which several tests assert verbatim.
"""
from __future__ import annotations

from itertools import combinations

import numpy as np

from repro.graphs.gen import community_graph, erdos_renyi, rmat

FIG1_EDGES = np.array(
    sorted(
        list(combinations(range(5), 2))  # K5 on 0..4
        + [(0, 5), (1, 5), (4, 5)]  # f = 5
        + [(2, 6), (3, 6)]  # g = 6
    ),
    dtype=np.int64,
)

FIG1_34_CORE = {
    (2, 3, 6): 0,
    (0, 1, 5): 1,
    (0, 4, 5): 1,
    (1, 4, 5): 1,
    **{tuple(sorted(t)): 2 for t in combinations(range(5), 3)},
}


def k_complete(k: int) -> np.ndarray:
    return np.array(list(combinations(range(k), 2)), dtype=np.int64)


def path(k: int) -> np.ndarray:
    return np.array([(i, i + 1) for i in range(k - 1)], dtype=np.int64)


def two_triangles_shared_edge() -> np.ndarray:
    return np.array([(0, 1), (0, 2), (1, 2), (1, 3), (2, 3)], dtype=np.int64)


SMALL_GRAPHS: dict[str, np.ndarray] = {
    "fig1": FIG1_EDGES,
    "k4": k_complete(4),
    "k6": k_complete(6),
    "k7": k_complete(7),
    "path6": path(6),
    "bowtie": np.array(
        [(0, 1), (0, 2), (1, 2), (2, 3), (2, 4), (3, 4)], dtype=np.int64
    ),
    "two-tri": two_triangles_shared_edge(),
    "er30": erdos_renyi(30, 0.3, seed=7),
    "er40": erdos_renyi(40, 0.25, seed=8),
    "comm": community_graph(4, 4, 7, p_intra=0.9, inter_per_vertex=1.0, seed=9),
    "rmat6": rmat(6, 160, seed=10),
}

MEDIUM_GRAPHS: dict[str, np.ndarray] = {
    "er60": erdos_renyi(60, 0.2, seed=21),
    "comm-m": community_graph(8, 5, 9, p_intra=0.85, inter_per_vertex=1.2, seed=22),
    "rmat8": rmat(8, 900, seed=23),
}
