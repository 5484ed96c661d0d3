"""Batch graph algorithms vs single-threaded baselines (Fig. 11/14/15 logic)."""
import numpy as np
import pytest

from repro.graphs import baselines
from repro.graphs.batch_algos import build_indexes, default_source, reach, sssp, wcc
from repro.graphs.gen import random_graph


@pytest.fixture(scope="module")
def graph():
    return random_graph(300, 1200, seed=11, weights=True)


@pytest.fixture(scope="module")
def indexes(spark, graph):
    fwd, rev = build_indexes(spark, graph)
    yield fwd, rev
    fwd.unpersist()
    rev.unpersist()


class TestReach:
    def test_matches_bfs(self, spark, graph, indexes):
        fwd, _ = indexes
        src = default_source(graph)
        got = reach(spark, fwd, src).count()
        assert got == baselines.reach_array(graph, 300, src)
        assert got == baselines.reach_hashmap(graph, src)


class TestSssp:
    def test_matches_dijkstra(self, spark, graph, indexes):
        fwd, _ = indexes
        src = default_source(graph)
        got = {r["node"]: r["dist"] for r in sssp(spark, fwd, src).collect()}
        ref_arr = baselines.sssp_array(graph, 300, src)
        ref = {i: d for i, d in enumerate(ref_arr) if np.isfinite(d)}
        assert got == ref


class TestWcc:
    def test_matches_union_find(self, spark, graph, indexes):
        fwd, rev = indexes
        got = {r["node"]: r["comp"] for r in wcc(spark, fwd, rev).collect()}
        labels = baselines.wcc_array(graph, 300)
        touched = set(graph["src"]) | set(graph["dst"])
        ref = {n: int(labels[n]) for n in touched}
        assert got == ref

    def test_hashmap_baseline_agrees(self, graph):
        arr = baselines.wcc_array(graph, 300)
        hm = baselines.wcc_hashmap(graph)
        touched = set(map(int, set(graph["src"]) | set(graph["dst"])))
        assert {n: int(arr[n]) for n in touched} == {n: hm[n] for n in touched}


class TestIndexes:
    def test_forward_and_reverse_built(self, spark, graph):
        fwd, rev = build_indexes(spark, graph)
        assert fwd.rows == rev.rows == len(graph)
        assert fwd.build_secs > 0 and rev.build_secs > 0
        fwd.unpersist()
        rev.unpersist()
