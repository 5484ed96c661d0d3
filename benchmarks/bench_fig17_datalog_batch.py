"""Fig. 17 — bottom-up Datalog (tc, sg) on tree / grid / G(n,p) graphs."""
from repro.experiments import save_table
from repro.experiments.fig17_datalog_batch import run


def test_fig17_datalog_batch(benchmark, spark):
    df = benchmark.pedantic(lambda: run(spark), rounds=1, iterations=1)
    save_table("fig17_datalog_batch", df)
    assert (df["tc_rows"] > 0).all() and (df["sg_rows"] > 0).all()
    # sg produces far more tuples than it is given (the Datalog workload trait)
    assert (df["sg_rows"] > df["edges"]).any()
