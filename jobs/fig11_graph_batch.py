"""Fig. 11/14/15 job: batch graph computation on scaled social graphs.

    spark-submit jobs/fig11_graph_batch.py
"""
from repro.experiments import print_table
from repro.experiments.fig11_graph_batch import run
from repro.session import get_session


def main() -> None:
    spark = get_session("fig11")
    print_table("Fig. 11/14/15 — batch graph computation", run(spark))
    spark.stop()


if __name__ == "__main__":
    main()
