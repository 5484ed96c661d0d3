"""Fig. 7 job: arrangement microbenchmarks (merge eagerness, join work).

    spark-submit jobs/fig7_micro.py
"""
from repro.experiments import print_table
from repro.experiments.fig7_micro import run_join_proportionality, run_merge_effort
from repro.session import get_session


def main() -> None:
    spark = get_session("fig7")
    print_table("Fig. 7e — merge eagerness", run_merge_effort(spark))
    print_table("Fig. 7f — join proportionality", run_join_proportionality(spark))
    spark.stop()


if __name__ == "__main__":
    main()
