"""Fig. 13 — one-shot batch elapsed time for all 22 queries."""
from repro.experiments import save_table
from repro.experiments.fig12_13_tpch import run_batch_times


def test_fig13_batch_times(benchmark, spark):
    df = benchmark.pedantic(lambda: run_batch_times(spark, sf=0.01), rounds=1, iterations=1)
    save_table("fig13_tpch_batch", df)
    assert len(df) == 22
    assert (df["elapsed_ms"] > 0).all()
