"""Fig. 5(a)/(c) — interactive graph query mix: latency and memory,
shared vs unshared edge arrangements."""
from repro.experiments import save_table
from repro.experiments.fig5_fig6_graph import run_fig5


def test_fig5_graph_sharing(benchmark, spark):
    df = benchmark.pedantic(
        lambda: run_fig5(spark, n_nodes=50_000, n_edges=320_000, n_rounds=4),
        rounds=1,
        iterations=1,
    )
    save_table("fig5_graph_sharing", df)
    shared = df[df["mode"] == "shared"].iloc[0]
    unshared = df[df["mode"] == "not shared"].iloc[0]
    # two shared edge arrangements vs one private copy per use
    assert shared["edge_arrangements"] == 2
    assert unshared["edge_arrangements"] >= 6
    # Fig. 5c: memory scales with the number of reuses of the collection
    assert unshared["memory_mb"] > 2 * shared["memory_mb"]
    # Fig. 5a: redundant maintenance inflates update latency without sharing
    assert unshared["round_p50_ms"] > shared["round_p50_ms"]
