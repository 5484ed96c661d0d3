"""Fig. 9/10 job: Graspan dataflow + points-to analyses.

    spark-submit jobs/fig9_10_graspan.py
"""
from repro.experiments import print_table
from repro.experiments.fig9_10_graspan import (
    run_dataflow,
    run_dataflow_incremental,
    run_pointsto,
)
from repro.session import get_session


def main() -> None:
    spark = get_session("fig9-10")
    print_table("Fig. 9a/b — dataflow analysis", run_dataflow(spark))
    print_table("Fig. 9c — incremental null removal", run_dataflow_incremental(spark))
    print_table("Fig. 10 — points-to (plain vs Opt)", run_pointsto(spark))
    spark.stop()


if __name__ == "__main__":
    main()
