"""Table T3 (paper Fig 11): relabeling / aggregation / contraction."""
from repro.experiments import save_table, table_other_optimizations


def test_t3_other_opts(once):
    df = once(table_other_optimizations)
    save_table(df, "t3_other_opts")
    # §5.5's point, via the contention model: the list buffer beats the
    # simple array at P=60 everywhere, by a large factor where update
    # volume is high; the hash table wins for (2,3) (its clear-work cost
    # is amortized by the large per-round update sets there).
    lb = df[df["optimization"] == "agg=list-buffer"]
    assert (lb["sim_speedup_p60"] >= 0.99).all()
    assert lb["sim_speedup_p60"].max() > 1.5
    ht23 = df[(df["optimization"] == "agg=hash") & (df["s"] == 3)]
    assert (ht23["sim_speedup_p60"] > 1.0).all()
