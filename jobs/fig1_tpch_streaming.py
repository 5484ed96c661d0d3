"""Fig. 1 job: streaming TPC-H install/update/memory, shared vs not shared.

    spark-submit jobs/fig1_tpch_streaming.py [--sf 0.01] [--rounds 6] [--live 4]
"""
import argparse

from repro.experiments import print_table
from repro.experiments.fig1_tpch_streaming import run
from repro.session import get_session


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.01)
    ap.add_argument("--rounds", type=int, default=6)
    ap.add_argument("--live", type=int, default=4)
    args = ap.parse_args()
    spark = get_session("fig1")
    print_table(
        "Fig. 1 — streaming TPC-H (shared vs not shared)",
        run(spark, sf=args.sf, n_rounds=args.rounds, target_live=args.live),
    )
    spark.stop()


if __name__ == "__main__":
    main()
