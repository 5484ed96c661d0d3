"""Fig. 12/13 job: TPC-H streaming update rates and batch elapsed times.

    spark-submit jobs/fig12_tpch_rates.py [--sf 0.01]
"""
import argparse

from repro.experiments import print_table
from repro.experiments.fig12_13_tpch import run_batch_times, run_rates
from repro.session import get_session


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.01)
    args = ap.parse_args()
    spark = get_session("fig12-13")
    print_table("Fig. 12 — streaming update rates", run_rates(spark, sf=args.sf))
    print_table("Fig. 13 — batch elapsed times", run_batch_times(spark, sf=args.sf))
    spark.stop()


if __name__ == "__main__":
    main()
