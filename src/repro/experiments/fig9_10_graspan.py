"""Fig. 9 / Fig. 10 — Graspan program analyses.

9a/9b: ``dataflow`` (null propagation) runtimes per graph, with shared
arrangements (index built once, reused) vs fresh per-run indexing.
9c: median/max latency to remove each of the first N null assignments from
the completed analysis, via the maintained per-source arrangement.
10a/10b: ``points-to`` runtimes, plain plan vs the optimized (Opt) plan.
"""
from __future__ import annotations

import time as _time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.graspan.analyses import (
    MaintainedDataflow,
    dataflow_analysis,
    pointsto_analysis,
)
from repro.graspan.gen import (
    DATAFLOW_PRESETS,
    POINTSTO_PRESETS,
    dataflow_graph,
    pointsto_graph,
)


def run_dataflow(spark: SparkSession) -> pd.DataFrame:
    """Fig. 9a/9b analogue: dataflow-analysis elapsed seconds per graph."""
    rows = []
    for name, params in DATAFLOW_PRESETS.items():
        graph = dataflow_graph(**params, seed=1)
        t0 = _time.perf_counter()
        n_df, ev = dataflow_analysis(spark, graph)
        pairs = n_df.count()
        elapsed = _time.perf_counter() - t0
        rows.append(
            {
                "graph": name,
                "edges": len(graph.edges),
                "null_srcs": len(graph.null_sources),
                "result_pairs": pairs,
                "elapsed_s": round(elapsed, 2),
                "index_build_s": round(ev.index_build_secs, 2),
                "iterations": ev.iterations,
            }
        )
        ev.unpersist_edb()
    return pd.DataFrame(rows)


def run_dataflow_incremental(spark: SparkSession, n_removals: int = 50) -> pd.DataFrame:
    """Fig. 9c analogue: remove the first N null assignments, incrementally."""
    rows = []
    for name, params in DATAFLOW_PRESETS.items():
        graph = dataflow_graph(**params, seed=1)
        t0 = _time.perf_counter()
        n_df, ev = dataflow_analysis(spark, graph)
        full_secs = _time.perf_counter() - t0
        maintained = MaintainedDataflow.from_result(n_df)
        lats = []
        for victim in graph.null_sources[:n_removals]:
            _, secs = maintained.remove_source(victim)
            lats.append(secs)
        rows.append(
            {
                "graph": name,
                "removals": len(lats),
                "increm_median_ms": round(float(np.median(lats)) * 1000, 3),
                "increm_max_ms": round(float(np.max(lats)) * 1000, 3),
                "full_eval_s": round(full_secs, 2),
            }
        )
        ev.unpersist_edb()
    return pd.DataFrame(rows)


def run_pointsto(spark: SparkSession) -> pd.DataFrame:
    """Fig. 10 analogue: points-to elapsed seconds, plain vs Opt plan."""
    rows = []
    for name, params in POINTSTO_PRESETS.items():
        graph = pointsto_graph(**params, seed=2)
        timings = {}
        sizes = {}
        for opt in (False, True):
            t0 = _time.perf_counter()
            rels, ev = pointsto_analysis(spark, graph, opt=opt)
            counts = {r: df.count() for r, df in rels.items()}
            timings[opt] = _time.perf_counter() - t0
            sizes[opt] = counts
            ev.unpersist_edb()
        rows.append(
            {
                "graph": name,
                "vf_pairs": sizes[False]["VF"],
                "va_pairs": sizes[False].get("VA", 0),
                "ma_pairs": sizes[False]["MA"],
                "plain_s": round(timings[False], 2),
                "opt_s": round(timings[True], 2),
            }
        )
    return pd.DataFrame(rows)
