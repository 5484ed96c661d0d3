"""Fig. 6 — graph query latency vs concurrent-query batch size 10^0..10^3."""
from repro.experiments import save_table
from repro.experiments.fig5_fig6_graph import run_fig6


def test_fig6_graph_query_batches(benchmark, spark):
    df = benchmark.pedantic(
        lambda: run_fig6(spark, n_nodes=100_000, n_edges=640_000),
        rounds=1,
        iterations=1,
    )
    save_table("fig6_graph_queries", df)
    # Throughput grows with batching: 1000 concurrent queries cost far less
    # than 1000x a single query (the paper's 'DD, 10^3' row).
    one = df[df["batch"] == 1].iloc[0]
    thousand = df[df["batch"] == 1000].iloc[0]
    for kind in ("lookup", "onehop", "twohop", "path"):
        assert thousand[f"{kind}_ms"] < 100 * one[f"{kind}_ms"]
