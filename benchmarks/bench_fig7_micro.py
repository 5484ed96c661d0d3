"""Fig. 7(e)/(f) — arrangement microbenchmarks: amortized-merge eagerness
and join work proportional to the small side."""
from repro.experiments import save_table
from repro.experiments.fig7_micro import run_join_proportionality, run_merge_effort


def test_fig7e_merge_effort(benchmark, spark):
    df = benchmark.pedantic(
        lambda: run_merge_effort(spark, n_rounds=16, rows_per_round=20_000),
        rounds=1,
        iterations=1,
    )
    save_table("fig7e_merge_effort", df)
    by = df.set_index("merge_effort")
    # eager collapses to one batch, lazy accumulates them
    assert by.loc["eager", "final_batches"] == 1
    assert by.loc["lazy", "final_batches"] > by.loc["default", "final_batches"]
    assert by.loc["eager", "merges"] > by.loc["default", "merges"] > 0


def test_fig7f_join_proportionality(benchmark, spark):
    df = benchmark.pedantic(
        lambda: run_join_proportionality(spark, arranged_rows=500_000, n_keys=500_000),
        rounds=1,
        iterations=1,
    )
    save_table("fig7f_join_proportionality", df)
    sh = df[df["mode"] == "shared"].set_index("batch")
    un = df[df["mode"] == "not shared"].set_index("batch")
    # Attaching a new join to an existing arrangement beats re-indexing the
    # 500k-row collection, most dramatically for small batches.
    small = sh.index.min()
    assert sh.loc[small, "install_and_first_result_ms"] < un.loc[small, "install_and_first_result_ms"]
    # Work tracks the small side: big batches cost more than small ones.
    assert sh.loc[sh.index.max(), "install_and_first_result_ms"] > sh.loc[small, "install_and_first_result_ms"]
