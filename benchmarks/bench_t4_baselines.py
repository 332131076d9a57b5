"""Table T4 (paper Fig 12): ARB vs ND / PND / AND / AND-NN / PKT."""
from repro.experiments import save_table, table_baselines


def test_t4_baselines(once):
    df = once(table_baselines)
    save_table(df, "t4_baselines")
    # Paper's headline relationships (shape, not absolute factors):
    assert (df["pnd_rounds_ratio"] > 5).all(), "PND's sequential-peel round blowup"
    assert (df["and_scliques_ratio"] > 1).all(), "AND re-discovers s-cliques"
    assert (
        df["andnn_scliques_ratio"] <= df["and_scliques_ratio"] + 1e-9
    ).all(), "notification reduces rediscovery"
    assert (df["andnn_extra_mem_bytes"] > 0).all(), "AND-NN pays memory for it"
