"""Fig. 5 / Fig. 6 — interactive graph queries against an evolving graph.

Fig. 6: average latency to perform and await batches of 10^0..10^3 concurrent
queries per class (the 'DD, 10^k' rows).  Fig. 5(a)/(c): latency and memory
of the mixed workload with and without sharing the two edge arrangements.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.graphs.gen import random_graph
from repro.graphs.interactive import GraphQuerySession

KINDS = ("lookup", "onehop", "twohop", "path")


def _args_for(kind: str, rng, n_nodes: int, count: int, qid0: int) -> pd.DataFrame:
    qids = np.arange(qid0, qid0 + count)
    if kind == "path":
        return pd.DataFrame(
            {"qid": qids, "ps": rng.integers(0, n_nodes, count), "pt": rng.integers(0, n_nodes, count)}
        )
    return pd.DataFrame({"qid": qids, "node": rng.integers(0, n_nodes, count)})


def run_fig6(
    spark: SparkSession,
    n_nodes: int = 100_000,
    n_edges: int = 640_000,
    batch_sizes=(1, 10, 100, 1000),
    seed: int = 0,
) -> pd.DataFrame:
    """Per-class latency to process one batch of b concurrent query installs."""
    rng = np.random.default_rng(seed)
    session = GraphQuerySession.start(spark, random_graph(n_nodes, n_edges, seed=seed))
    rows = []
    qid0 = 1
    for b in batch_sizes:
        row = {"batch": b}
        for kind in KINDS:
            session.issue(kind, _args_for(kind, rng, n_nodes, b, qid0))
            qid0 += b
            row[f"{kind}_ms"] = round(session.step() * 1000, 1)
        rows.append(row)
    return pd.DataFrame(rows)


def run_fig5(
    spark: SparkSession,
    n_nodes: int = 100_000,
    n_edges: int = 640_000,
    n_rounds: int = 5,
    updates_per_round: int = 200,
    queries_per_round: int = 200,
    seed: int = 0,
) -> pd.DataFrame:
    """Mixed graph updates + query-argument churn, shared vs not shared."""
    rows = []
    for shared in (True, False):
        rng = np.random.default_rng(seed)
        edges = random_graph(n_nodes, n_edges, seed=seed)
        session = GraphQuerySession.start(spark, edges, shared=shared)
        lat = []
        qid0 = 1_000_000
        for _ in range(n_rounds):
            session.update_graph(random_graph(n_nodes, updates_per_round, seed=int(rng.integers(1e9))))
            per_kind = max(1, queries_per_round // len(KINDS))
            for kind in KINDS:
                session.issue(kind, _args_for(kind, rng, n_nodes, per_kind, qid0))
                qid0 += per_kind
            lat.append(session.step())
        rows.append(
            {
                "mode": "shared" if shared else "not shared",
                "round_p50_ms": round(float(np.percentile(lat, 50)) * 1000, 1),
                "round_p99_ms": round(float(np.percentile(lat, 99)) * 1000, 1),
                "memory_mb": round(session.memory_bytes() / 1e6, 2),
                "edge_arrangements": sum(
                    1 for n in session.flow.store.nodes
                    if n.arrangement.name.startswith("edges")
                ),
            }
        )
    return pd.DataFrame(rows)
