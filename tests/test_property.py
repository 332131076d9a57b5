"""Property-based testing: random graphs vs the brute-force oracle."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.nucleus.decomp import DecompConfig, nucleus_decomposition
from repro.nucleus.reference import reference_nucleus
from repro.tables.clique_table import TableConfig


@st.composite
def random_edges(draw, max_n=14):
    n = draw(st.integers(4, max_n))
    density = draw(st.floats(0.2, 0.7))
    seed = draw(st.integers(0, 10_000))
    g = np.random.default_rng(seed)
    iu, iv = np.triu_indices(n, k=1)
    mask = g.random(len(iu)) < density
    if not mask.any():
        mask[0] = True
    return np.stack([iu[mask], iv[mask]], axis=1)


@given(random_edges(), st.sampled_from([(2, 3), (3, 4), (2, 4), (1, 2)]))
@settings(max_examples=40, deadline=None)
def test_decomp_matches_reference_random(edges, rs):
    r, s = rs
    res = nucleus_decomposition(edges, r, s)
    assert res.core_dict() == reference_nucleus(edges, r, s)


@given(random_edges(max_n=12), st.sampled_from([1, 2, 3]))
@settings(max_examples=20, deadline=None)
def test_table_levels_equivalent_random(edges, levels):
    cfg = DecompConfig(
        table=TableConfig(levels=levels, first_level="hash" if levels > 2 else "array")
    )
    res = nucleus_decomposition(edges, 3, 4, cfg)
    assert res.core_dict() == reference_nucleus(edges, 3, 4)


@given(random_edges(max_n=12))
@settings(max_examples=20, deadline=None)
def test_frac_updates_equal_exact_random(edges):
    frac = nucleus_decomposition(edges, 2, 3, DecompConfig(frac_updates=True))
    exact = nucleus_decomposition(edges, 2, 3, DecompConfig(frac_updates=False))
    assert frac.core_dict() == exact.core_dict()
