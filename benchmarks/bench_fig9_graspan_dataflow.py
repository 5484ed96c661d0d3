"""Fig. 9 — Graspan dataflow analysis: batch runtimes (9a/9b) and
incremental null-assignment removal (9c)."""
from repro.experiments import save_table
from repro.experiments.fig9_10_graspan import run_dataflow, run_dataflow_incremental


def test_fig9ab_dataflow_batch(benchmark, spark):
    df = benchmark.pedantic(lambda: run_dataflow(spark), rounds=1, iterations=1)
    save_table("fig9ab_graspan_dataflow", df)
    assert (df["result_pairs"] > 0).all()
    # larger graphs take longer (the linux > psql > httpd ordering)
    t = df.set_index("graph")["elapsed_s"]
    assert t["linux-lite"] >= t["httpd-lite"]


def test_fig9c_incremental_removal(benchmark, spark):
    df = benchmark.pedantic(
        lambda: run_dataflow_incremental(spark, n_removals=50), rounds=1, iterations=1
    )
    save_table("fig9c_graspan_incremental", df)
    # Fig. 9c: corrections are interactive (ms) vs seconds for full eval.
    assert (df["increm_max_ms"] / 1000 < df["full_eval_s"]).all()
    assert (df["increm_median_ms"] < 1000).all()
