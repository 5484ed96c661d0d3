"""Fig. 12 / Fig. 13 — per-query TPC-H streaming rates and batch times.

Fig. 12: streaming update rates (lineitem tuples/second) through each
installed query, dimension tables pre-loaded, logical batches of updates.
Fig. 13: one-shot batch elapsed seconds per query.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.tpch.queries import QUERIES
from repro.tpch.workload import run_batch, run_update_rate


def run_rates(
    spark: SparkSession,
    sf: float = 0.01,
    batch_rows: int = 2000,
    n_batches: int = 3,
    queries=None,
) -> pd.DataFrame:
    rows = []
    for qname in queries or sorted(QUERIES):
        rate = run_update_rate(
            spark, qname, sf=sf, batch_rows=batch_rows, n_batches=n_batches
        )
        rows.append({"query": qname, "tuples_per_s": int(rate)})
    return pd.DataFrame(rows)


def run_batch_times(spark: SparkSession, sf: float = 0.01, queries=None) -> pd.DataFrame:
    rows = []
    for qname in queries or sorted(QUERIES):
        rows.append(
            {"query": qname, "elapsed_ms": int(run_batch(spark, qname, sf=sf) * 1000)}
        )
    return pd.DataFrame(rows)
