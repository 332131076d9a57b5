"""Table T6 (paper Fig 14): thread scalability (work-span model) and
measured Spark counting-stage scaling."""
from repro.experiments import (
    save_table,
    table_scalability,
    table_spark_counting_scalability,
)


def test_t6a_scalability_sim(once):
    df = once(table_scalability)
    save_table(df, "t6a_scalability_sim")
    # Speedup must be monotone in P and materially > 1 at 60 threads.
    for (g, r, s), grp in df.groupby(["graph", "r", "s"]):
        sp = grp.sort_values("threads")["sim_speedup"].to_numpy()
        assert (sp[1:] >= sp[:-1] - 1e-9).all()
        assert sp[-1] > 3.0


def test_t6b_spark_counting_scaling(once, spark):
    df = once(table_spark_counting_scalability, spark)
    save_table(df, "t6b_spark_counting_scaling")
    assert df["n_rcliques"].nunique() == 1, "result independent of slicing"
