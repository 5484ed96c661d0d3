"""Fig. 5/6 job: interactive graph queries — batching and sharing.

    spark-submit jobs/fig6_graph_queries.py [--nodes 100000] [--edges 640000]
"""
import argparse

from repro.experiments import print_table
from repro.experiments.fig5_fig6_graph import run_fig5, run_fig6
from repro.session import get_session


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--nodes", type=int, default=100_000)
    ap.add_argument("--edges", type=int, default=640_000)
    args = ap.parse_args()
    spark = get_session("fig5-6")
    print_table(
        "Fig. 6 — query latency vs batch size",
        run_fig6(spark, n_nodes=args.nodes, n_edges=args.edges),
    )
    print_table(
        "Fig. 5 — shared vs not shared query mix",
        run_fig5(spark, n_nodes=args.nodes, n_edges=args.edges),
    )
    spark.stop()


if __name__ == "__main__":
    main()
