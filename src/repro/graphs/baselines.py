"""Purpose-written single-threaded baselines (the paper's 'Single thread' /
'w/hash map' rows in Fig. 11/14/15/16).

Array variants assume dense pre-processed integer ids (the paper notes this
is what makes them fast but inflexible); hash-map variants replace the
per-node state arrays with dicts, the penalty the paper quantifies.  wcc uses
union-find rather than label propagation — the paper deliberately lets the
baseline pick the better algorithm.
"""
from __future__ import annotations

import heapq
from typing import Dict, List

import numpy as np
import pandas as pd


def _adj_arrays(edges: pd.DataFrame, n_nodes: int):
    """CSR-ish adjacency from an edge list (sorted by src)."""
    order = np.argsort(edges["src"].to_numpy(), kind="stable")
    src = edges["src"].to_numpy()[order]
    dst = edges["dst"].to_numpy()[order]
    starts = np.searchsorted(src, np.arange(n_nodes + 1))
    return dst, starts, order


def reach_array(edges: pd.DataFrame, n_nodes: int, source: int) -> int:
    """BFS over array adjacency; returns number of reached nodes."""
    dst, starts, _ = _adj_arrays(edges, n_nodes)
    seen = np.zeros(n_nodes, dtype=bool)
    seen[source] = True
    stack = [source]
    while stack:
        u = stack.pop()
        for v in dst[starts[u]:starts[u + 1]]:
            if not seen[v]:
                seen[v] = True
                stack.append(int(v))
    return int(seen.sum())


def reach_hashmap(edges: pd.DataFrame, source: int) -> int:
    """BFS with dict adjacency and a set of seen nodes."""
    adj: Dict[int, List[int]] = {}
    for u, v in zip(edges["src"].to_numpy(), edges["dst"].to_numpy()):
        adj.setdefault(int(u), []).append(int(v))
    seen = {source}
    stack = [source]
    while stack:
        u = stack.pop()
        for v in adj.get(u, ()):
            if v not in seen:
                seen.add(v)
                stack.append(v)
    return len(seen)


def sssp_array(edges: pd.DataFrame, n_nodes: int, source: int) -> np.ndarray:
    """Dijkstra with array distances; returns the distance array."""
    order = np.argsort(edges["src"].to_numpy(), kind="stable")
    src = edges["src"].to_numpy()[order]
    dst = edges["dst"].to_numpy()[order]
    w = edges["w"].to_numpy()[order]
    starts = np.searchsorted(src, np.arange(n_nodes + 1))
    dist = np.full(n_nodes, np.inf)
    dist[source] = 0
    pq = [(0, source)]
    while pq:
        d, u = heapq.heappop(pq)
        if d > dist[u]:
            continue
        for i in range(starts[u], starts[u + 1]):
            nd = d + w[i]
            v = dst[i]
            if nd < dist[v]:
                dist[v] = nd
                heapq.heappush(pq, (nd, int(v)))
    return dist


def sssp_hashmap(edges: pd.DataFrame, source: int) -> Dict[int, float]:
    """Dijkstra with dict adjacency and dict distances."""
    adj: Dict[int, List[tuple]] = {}
    for u, v, w in zip(edges["src"], edges["dst"], edges["w"]):
        adj.setdefault(int(u), []).append((int(v), int(w)))
    dist = {source: 0.0}
    pq = [(0.0, source)]
    while pq:
        d, u = heapq.heappop(pq)
        if d > dist.get(u, np.inf):
            continue
        for v, w in adj.get(u, ()):
            nd = d + w
            if nd < dist.get(v, np.inf):
                dist[v] = nd
                heapq.heappush(pq, (nd, v))
    return dist


class _UnionFind:
    def __init__(self, n: int) -> None:
        self.parent = np.arange(n)

    def find(self, x: int) -> int:
        p = self.parent
        root = x
        while p[root] != root:
            root = p[root]
        while p[x] != root:
            p[x], x = root, p[x]
        return int(root)

    def union(self, a: int, b: int) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra != rb:
            self.parent[max(ra, rb)] = min(ra, rb)


def wcc_array(edges: pd.DataFrame, n_nodes: int) -> np.ndarray:
    """Union-find connectivity; returns the min-id component label per node."""
    uf = _UnionFind(n_nodes)
    for u, v in zip(edges["src"].to_numpy(), edges["dst"].to_numpy()):
        uf.union(int(u), int(v))
    return np.array([uf.find(i) for i in range(n_nodes)])


def wcc_hashmap(edges: pd.DataFrame) -> Dict[int, int]:
    """Union-find with dict parent pointers."""
    parent: Dict[int, int] = {}

    def find(x: int) -> int:
        parent.setdefault(x, x)
        root = x
        while parent[root] != root:
            root = parent[root]
        while parent[x] != root:
            parent[x], x = root, parent[x]
        return root

    for u, v in zip(edges["src"], edges["dst"]):
        ra, rb = find(int(u)), find(int(v))
        if ra != rb:
            parent[max(ra, rb)] = min(ra, rb)
    return {x: find(x) for x in list(parent)}
