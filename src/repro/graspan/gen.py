"""Synthetic program graphs for the Graspan analyses.

The paper analyses the linux/psql/httpd system graphs (unavailable); these
generators produce graphs with the same *rule structure*: a sparse mostly
forward assignment-flow graph ``e`` with designated null-assignment sources
for the ``dataflow`` analysis, and assignment (``a``) + dereference (``d``)
edge sets for ``points-to``.  Three presets scale like the paper's three
inputs relative to each other.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List

import numpy as np
import pandas as pd


@dataclass
class DataflowGraph:
    edges: pd.DataFrame  # assignment-flow edges (src, dst)
    null_sources: List[int]


def dataflow_graph(n_nodes: int, n_edges: int, n_nulls: int, seed: int = 0) -> DataflowGraph:
    """Mostly forward (DAG-like) assignment graph with null sources.

    Forward bias keeps reachable sets bounded, like real program flow; a
    small fraction of back edges exercises cycles in the fixpoint.
    """
    g = np.random.default_rng(seed)
    src = g.integers(0, n_nodes - 1, n_edges)
    # span scales with graph size so the propagation depth (and hence the
    # fixpoint iteration count) stays roughly constant across presets
    span = np.maximum(1, (g.exponential(max(4.0, n_nodes / 50), n_edges)).astype(int))
    dst = np.minimum(src + span, n_nodes - 1)
    back = g.random(n_edges) < 0.02
    dst = np.where(back, g.integers(0, n_nodes, n_edges), dst)
    edges = pd.DataFrame({"src": src, "dst": dst}).drop_duplicates(ignore_index=True)
    nulls = sorted(g.choice(n_nodes, size=n_nulls, replace=False).tolist())
    return DataflowGraph(edges=edges, null_sources=nulls)


def pointsto_graph(n_vars: int, n_assign: int, n_deref: int, seed: int = 0) -> Dict[str, pd.DataFrame]:
    """Assignment (``a``) and dereference (``d``) edge sets over variables."""
    g = np.random.default_rng(seed)
    src = g.integers(0, n_vars - 1, n_assign)
    span = np.maximum(1, (g.exponential(6, n_assign)).astype(int))
    dst = np.minimum(src + span, n_vars - 1)
    a = pd.DataFrame({"src": src, "dst": dst}).drop_duplicates(ignore_index=True)
    d = pd.DataFrame(
        {
            "src": g.integers(0, n_vars, n_deref),
            "dst": g.integers(0, n_vars, n_deref),
        }
    ).drop_duplicates(ignore_index=True)
    return {"a": a, "d": d}


#: preset scales, ordered like the paper's linux > psql > httpd.  Forward
#: spans make reachable sets O(distance-to-sink), so pair counts stay
#: proportional to n_nulls x n_nodes — these sizes keep the largest result
#: in the low hundreds of thousands of tuples.
DATAFLOW_PRESETS = {
    "linux-lite": dict(n_nodes=4_000, n_edges=8_000, n_nulls=120),
    "psql-lite": dict(n_nodes=2_000, n_edges=4_000, n_nulls=60),
    "httpd-lite": dict(n_nodes=800, n_edges=1_600, n_nulls=30),
}

POINTSTO_PRESETS = {
    "linux-lite": dict(n_vars=400, n_assign=800, n_deref=160),
    "psql-lite": dict(n_vars=250, n_assign=500, n_deref=100),
    "httpd-lite": dict(n_vars=120, n_assign=240, n_deref=50),
}
