"""Fig. 1 — streaming TPC-H with interactive queries, shared vs not shared.

Reports the three headline metrics as summary statistics (the paper plots
full distributions): query installation latency (1a), per-round update
processing latency (1b), and arrangement memory footprint (1c).
"""
from __future__ import annotations

from typing import Optional, Sequence

import pandas as pd
from pyspark.sql import SparkSession

from repro.tpch.workload import run_streaming_mix

#: a representative mix: six lineitem-derived queries + two that are not
DEFAULT_MIX = ["q01", "q03", "q04", "q05", "q06", "q10", "q11", "q13"]


def run(
    spark: SparkSession,
    sf: float = 0.01,
    n_rounds: int = 6,
    target_live: int = 4,
    query_names: Optional[Sequence[str]] = None,
) -> pd.DataFrame:
    rows = []
    for shared in (True, False):
        stats = run_streaming_mix(
            spark,
            sf=sf,
            n_rounds=n_rounds,
            shared=shared,
            target_live=target_live,
            query_names=list(query_names or DEFAULT_MIX),
        )
        inst = stats.install_summary()
        upd = stats.update_summary()
        mem = stats.memory_summary()
        rows.append(
            {
                "mode": "shared" if shared else "not shared",
                "install_p50_s": round(inst["p50"], 3),
                "install_p99_s": round(inst["p99"], 3),
                "install_max_s": round(inst["max"], 3),
                "update_p50_s": round(upd["p50"], 3),
                "update_p99_s": round(upd["p99"], 3),
                "mem_mean_mb": round(mem["mean"] / 1e6, 2),
                "mem_max_mb": round(mem["max"] / 1e6, 2),
            }
        )
    return pd.DataFrame(rows)
