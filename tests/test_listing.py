"""REC-LIST-CLIQUES vs brute-force enumeration."""
from itertools import combinations
from math import comb

import numpy as np
import pytest

from repro.cliques.listing import (
    Stats,
    count_cliques,
    enumerate_cliques,
    extend_cliques,
    intersect_neighborhoods,
    s_counts_per_r_clique,
)
from repro.graphs.csr import build_csr, orient_csr
from repro.graphs.orient import degeneracy_order, degree_order, make_rank
from repro.nucleus.reference import brute_force_cliques

from .fixtures import SMALL_GRAPHS


def setup(name, orientation="degree"):
    und = build_csr(SMALL_GRAPHS[name])
    dg = orient_csr(und, make_rank(und, orientation))
    return und, dg


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
@pytest.mark.parametrize("c", [2, 3, 4, 5])
def test_count_matches_brute_force(name, c):
    und, dg = setup(name)
    assert count_cliques(dg, c) == len(brute_force_cliques(und, c))


@pytest.mark.parametrize("name", ["fig1", "k6", "er30", "comm"])
@pytest.mark.parametrize("c", [3, 4])
@pytest.mark.parametrize("orientation", ["degree", "degeneracy", "goodrich-pszona"])
def test_count_orientation_invariant(name, c, orientation):
    und, dg = setup(name, orientation)
    assert count_cliques(dg, c) == len(brute_force_cliques(und, c))


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
def test_enumerate_matches_brute_force(name):
    und, dg = setup(name)
    got = {tuple(r_) for r_ in enumerate_cliques(dg, 3).tolist()}
    assert got == set(brute_force_cliques(und, 3))


def test_k_complete_counts():
    _, dg = setup("k7")
    for c in range(1, 8):
        assert count_cliques(dg, c) == comb(7, c)


def test_fig1_triangle_count():
    _, dg = setup("fig1")
    assert count_cliques(dg, 3) == 14  # stated in the paper


@pytest.mark.parametrize("name", ["fig1", "k6", "er30", "comm", "two-tri"])
@pytest.mark.parametrize("r,s", [(1, 2), (2, 3), (2, 4), (3, 4), (3, 5)])
def test_s_counts_per_r_clique(name, r, s):
    und, dg = setup(name)
    got = s_counts_per_r_clique(dg, r, s)
    s_cliques = brute_force_cliques(und, s)
    expected = {R: 0 for R in brute_force_cliques(und, r)}
    for S in s_cliques:
        for sub in combinations(S, r):
            expected[sub] += 1
    assert {k: int(round(v)) for k, v in got.items()} == expected


def test_fig1_34_initial_counts():
    """Paper: cdg->0; abf,aef,bef->1; abe->3; the rest->2."""
    _, dg = setup("fig1")
    got = {k: int(v) for k, v in s_counts_per_r_clique(dg, 3, 4).items()}
    assert got[(2, 3, 6)] == 0
    assert got[(0, 1, 5)] == got[(0, 4, 5)] == got[(1, 4, 5)] == 1
    assert got[(0, 1, 4)] == 3
    assert sorted(got.values()) == [0, 1, 1, 1, 2, 2, 2, 2, 2, 2, 2, 2, 2, 3]


@pytest.mark.parametrize("name", ["fig1", "k6", "er30", "comm"])
@pytest.mark.parametrize("r,s", [(2, 3), (2, 4), (3, 4), (3, 5)])
def test_extend_lists_scliques_containing_R(name, r, s):
    und, dg = setup(name)
    s_cliques = brute_force_cliques(und, s)
    for R in brute_force_cliques(und, r)[:20]:
        found = []

        def f(C, batch):
            for v in batch:
                found.append(tuple(sorted(R + C + (int(v),))))

        extend_cliques(und, dg, np.array(R), s - r, f)
        expected = {S for S in s_cliques if set(R) <= set(S)}
        assert set(found) == expected
        assert len(found) == len(set(found)), "each s-clique listed once"


def test_intersect_neighborhoods():
    und, _ = setup("fig1")
    # common neighbours of a=0, b=1 in Fig 1: c, d, e, f
    got = intersect_neighborhoods(und, np.array([0, 1]))
    assert got.tolist() == [2, 3, 4, 5]


def test_stats_counts_cliques():
    _, dg = setup("k6")
    stats = Stats()
    n = count_cliques(dg, 3)
    from repro.cliques.listing import list_cliques

    list_cliques(dg, 3, lambda C, b: None, stats=stats)
    assert stats.cliques_found == n == 20


def test_roots_partition_counts():
    """Counting over a partition of roots must sum to the full count."""
    _, dg = setup("er30")
    total = count_cliques(dg, 3)
    part = sum(
        count_cliques(dg, 3, roots=np.arange(lo, min(lo + 7, dg.n)))
        for lo in range(0, dg.n, 7)
    )
    assert part == total
