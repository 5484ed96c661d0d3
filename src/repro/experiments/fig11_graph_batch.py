"""Fig. 11/14/15/16 — batch graph computation vs single-threaded baselines.

For each scaled social graph: index-f / index-r build time, reach, sssp, wcc
elapsed seconds for the Spark engine, plus the purpose-written single-thread
array and hash-map baselines the paper includes.
"""
from __future__ import annotations

import time as _time

import pandas as pd
from pyspark.sql import SparkSession

from repro.graphs import baselines
from repro.graphs.batch_algos import build_indexes, default_source, reach, sssp, wcc
from repro.graphs.gen import random_graph

#: node/edge counts = the paper's graphs divided by ~1000 (DESIGN.md §2.5)
GRAPH_PRESETS = {
    "livejournal-lite": dict(n_nodes=4_800, n_edges=68_000),
    "orkut-lite": dict(n_nodes=3_000, n_edges=117_000),
    "twitter-lite": dict(n_nodes=42_000, n_edges=1_400_000),
}


def run(spark: SparkSession, graphs=None, seed: int = 0) -> pd.DataFrame:
    rows = []
    for name, params in (graphs or GRAPH_PRESETS).items():
        edges = random_graph(**params, seed=seed, weights=True)
        n = params["n_nodes"]
        src = default_source(edges)

        t0 = _time.perf_counter()
        st_reach = baselines.reach_array(edges, n, src)
        st_reach_s = _time.perf_counter() - t0
        t0 = _time.perf_counter()
        baselines.sssp_array(edges, n, src)
        st_sssp_s = _time.perf_counter() - t0
        t0 = _time.perf_counter()
        baselines.wcc_array(edges, n)
        st_wcc_s = _time.perf_counter() - t0
        t0 = _time.perf_counter()
        baselines.reach_hashmap(edges, src)
        hm_reach_s = _time.perf_counter() - t0
        t0 = _time.perf_counter()
        baselines.sssp_hashmap(edges, src)
        hm_sssp_s = _time.perf_counter() - t0
        t0 = _time.perf_counter()
        baselines.wcc_hashmap(edges)
        hm_wcc_s = _time.perf_counter() - t0

        fwd, rev = build_indexes(spark, edges)
        t0 = _time.perf_counter()
        n_reach = reach(spark, fwd, src).count()
        dd_reach_s = _time.perf_counter() - t0
        assert n_reach == st_reach
        t0 = _time.perf_counter()
        sssp(spark, fwd, src).count()
        dd_sssp_s = _time.perf_counter() - t0
        t0 = _time.perf_counter()
        wcc(spark, fwd, rev).count()
        dd_wcc_s = _time.perf_counter() - t0

        rows.append(
            {
                "graph": name,
                "index_f_s": round(fwd.build_secs, 2),
                "index_r_s": round(rev.build_secs, 2),
                "dd_reach_s": round(dd_reach_s, 2),
                "dd_sssp_s": round(dd_sssp_s, 2),
                "dd_wcc_s": round(dd_wcc_s, 2),
                "st_reach_s": round(st_reach_s, 3),
                "st_sssp_s": round(st_sssp_s, 3),
                "st_wcc_s": round(st_wcc_s, 3),
                "hm_reach_s": round(hm_reach_s, 3),
                "hm_sssp_s": round(hm_sssp_s, 3),
                "hm_wcc_s": round(hm_wcc_s, 3),
            }
        )
        fwd.unpersist()
        rev.unpersist()
    return pd.DataFrame(rows)
