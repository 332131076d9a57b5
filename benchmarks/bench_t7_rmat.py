"""Table T7 (paper Fig 15): rMAT size/density scaling."""
from repro.experiments import save_table, table_rmat_scaling


def test_t7_rmat(once):
    df = once(table_rmat_scaling)
    save_table(df, "t7_rmat_scaling")
    # Fig 15's observation: runtime scales with the number of s-cliques,
    # which grows with density; check time grows with density per size.
    for (log2n, r, s), grp in df.groupby(["log2_n", "r", "s"]):
        grp = grp.sort_values("edges_per_vertex")
        assert grp["n_scliques"].is_monotonic_increasing
