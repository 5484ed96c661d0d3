"""Synthetic graph generators (pandas edge lists, deterministic in seed).

Stand-ins for the paper's datasets (DESIGN.md §2.5): the interactive-query
graph (10M nodes / 64M edges) and the social graphs (livejournal, orkut,
twitter) are scaled-down uniform random graphs with the same average degree;
trees, grids, and G(n,p) graphs mirror the Datalog benchmark inputs.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def random_graph(n_nodes: int, n_edges: int, seed: int = 0, weights: bool = False) -> pd.DataFrame:
    """Uniform random directed multigraph with ``n_edges`` edges."""
    g = np.random.default_rng(seed)
    pdf = pd.DataFrame(
        {
            "src": g.integers(0, n_nodes, n_edges),
            "dst": g.integers(0, n_nodes, n_edges),
        }
    )
    if weights:
        pdf["w"] = g.integers(1, 101, n_edges)
    return pdf


def tree_graph(depth: int, fanout: int = 2) -> pd.DataFrame:
    """Complete ``fanout``-ary tree of the given depth, edges parent→child."""
    rows = []
    frontier = [0]
    nxt = 1
    for _ in range(depth):
        new = []
        for p in frontier:
            for _ in range(fanout):
                rows.append((p, nxt))
                new.append(nxt)
                nxt += 1
        frontier = new
    return pd.DataFrame(rows, columns=["src", "dst"])


def grid_graph(n: int) -> pd.DataFrame:
    """n x n grid, edges rightward and downward (the Datalog 'grid' input)."""
    rows = []
    for i in range(n):
        for j in range(n):
            v = i * n + j
            if j + 1 < n:
                rows.append((v, v + 1))
            if i + 1 < n:
                rows.append((v, v + n))
    return pd.DataFrame(rows, columns=["src", "dst"])


def gnp_graph(n: int, avg_degree: float = 2.0, seed: int = 0) -> pd.DataFrame:
    """G(n, p) with p = avg_degree / n, materialized by edge sampling."""
    g = np.random.default_rng(seed)
    m = int(n * avg_degree)
    return pd.DataFrame(
        {"src": g.integers(0, n, m), "dst": g.integers(0, n, m)}
    ).drop_duplicates(ignore_index=True)
