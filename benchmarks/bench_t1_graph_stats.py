"""Table T1 (paper Fig 7): rho and max (r,s)-core numbers per graph."""
from repro.experiments import save_table, table_graph_stats


def test_t1_graph_stats(once):
    df = once(table_graph_stats)
    save_table(df, "t1_graph_stats")
    assert (df["rho"] >= 1).all()
    assert (df["max_core"] >= df["rho"] * 0).all()
