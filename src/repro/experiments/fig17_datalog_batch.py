"""Fig. 17 — bottom-up Datalog: tc and sg on tree, grid, and G(n,p) graphs."""
from __future__ import annotations

import time as _time

import pandas as pd
from pyspark.sql import SparkSession

from repro.datalog.queries import sg_full, tc_full
from repro.graphs.gen import gnp_graph, grid_graph, tree_graph

GRAPHS = {
    "tree-7": lambda: tree_graph(7, 2),
    "grid-12": lambda: grid_graph(12),
    "gnp-500": lambda: gnp_graph(500, 1.5, seed=1),
}


def run(spark: SparkSession) -> pd.DataFrame:
    rows = []
    for name, gen in GRAPHS.items():
        edges = gen()
        t0 = _time.perf_counter()
        tc, ev_tc = tc_full(spark, edges)
        tc_rows = tc.count()
        tc_secs = _time.perf_counter() - t0
        t0 = _time.perf_counter()
        sg, ev_sg = sg_full(spark, edges)
        sg_rows = sg.count()
        sg_secs = _time.perf_counter() - t0
        rows.append(
            {
                "graph": name,
                "edges": len(edges),
                "tc_rows": tc_rows,
                "tc_s": round(tc_secs, 2),
                "sg_rows": sg_rows,
                "sg_s": round(sg_secs, 2),
            }
        )
        ev_tc.unpersist_edb()
        ev_sg.unpersist_edb()
    return pd.DataFrame(rows)
