"""Fig. 8/17 job: Datalog — seeded top-down queries and bottom-up batch.

    spark-submit jobs/fig8_datalog.py [--args 10]
"""
import argparse

from repro.experiments import print_table
from repro.experiments.fig8_datalog import run as run_fig8
from repro.experiments.fig17_datalog_batch import run as run_fig17
from repro.session import get_session


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--args", type=int, default=10, dest="n_args")
    args = ap.parse_args()
    spark = get_session("fig8-17")
    print_table("Fig. 8 — top-down Datalog vs full evaluation", run_fig8(spark, n_args=args.n_args))
    print_table("Fig. 17 — bottom-up Datalog", run_fig17(spark))
    spark.stop()


if __name__ == "__main__":
    main()
