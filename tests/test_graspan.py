"""Graspan analyses against brute-force references."""
import pandas as pd
import pytest

from repro.graspan.analyses import (
    MaintainedDataflow,
    dataflow_analysis,
    pointsto_analysis,
)
from repro.graspan.gen import DataflowGraph, dataflow_graph, pointsto_graph


def py_reach_pairs(edges, sources):
    adj = {}
    for u, v in zip(edges["src"], edges["dst"]):
        adj.setdefault(int(u), set()).add(int(v))
    out = set()
    for s in sources:
        seen, stack = {s}, [s]
        while stack:
            x = stack.pop()
            for y in adj.get(x, ()):
                if y not in seen:
                    seen.add(y)
                    stack.append(y)
        out |= {(s, t) for t in seen}
    return out


def _closure(rel):
    rel = set(rel)
    while True:
        more = {(x, z) for (x, y) in rel for (y2, z) in rel if y == y2}
        if more <= rel:
            return rel
        rel |= more


def py_pointsto(a_edges, d_edges):
    """Naive closure of the VF/VA/MA grammar (reference).

    Mirrors the Datalog programs: VF = closure(a ∪ MA);
    VA = VF⁻¹∘VF ∪ VF ∪ VF⁻¹; MA = d⁻¹∘VA∘d ∪ d⁻¹∘d.
    """
    a = {(int(u), int(v)) for u, v in zip(a_edges["src"], a_edges["dst"])}
    d = {(int(u), int(v)) for u, v in zip(d_edges["src"], d_edges["dst"])}
    ma = set()
    while True:
        vf = _closure(a | ma)
        inv = {(y, x) for (x, y) in vf}
        va = {(x, y) for (z, x) in vf for (z2, y) in vf if z == z2} | vf | inv
        new_ma = {
            (x, y)
            for (a1, x) in d
            for (b1, y) in d
            if a1 == b1 or (a1, b1) in va
        }
        if new_ma == ma:
            return vf, ma
        ma = new_ma


def rows(df):
    return {(r["src"], r["dst"]) for r in df.collect()}


@pytest.fixture(scope="module")
def small_flow_graph():
    return dataflow_graph(n_nodes=200, n_edges=400, n_nulls=10, seed=3)


class TestDataflowAnalysis:
    def test_matches_multi_source_reachability(self, spark, small_flow_graph):
        n, _ = dataflow_analysis(spark, small_flow_graph)
        assert rows(n) == py_reach_pairs(
            small_flow_graph.edges, small_flow_graph.null_sources
        )

    def test_incremental_removal_matches_recompute(self, spark, small_flow_graph):
        n, _ = dataflow_analysis(spark, small_flow_graph)
        maintained = MaintainedDataflow.from_result(n)
        srcs = list(small_flow_graph.null_sources)
        for victim in srcs[:5]:
            dropped, secs = maintained.remove_source(victim)
            assert secs >= 0 and dropped >= 0
            srcs.remove(victim)
            ref = py_reach_pairs(small_flow_graph.edges, srcs)
            assert set(map(tuple, maintained.pairs[["src", "dst"]].to_numpy())) == ref
            assert maintained.nullable_locations() == len({t for _, t in ref})

    def test_deterministic_generator(self):
        a = dataflow_graph(100, 200, 5, seed=1)
        b = dataflow_graph(100, 200, 5, seed=1)
        pd.testing.assert_frame_equal(a.edges, b.edges)
        assert a.null_sources == b.null_sources


class TestPointsTo:
    @pytest.fixture(scope="class")
    def graph(self):
        return pointsto_graph(n_vars=60, n_assign=90, n_deref=25, seed=4)

    def test_plain_matches_reference(self, spark, graph):
        rels, _ = pointsto_analysis(spark, graph, opt=False)
        vf_ref, ma_ref = py_pointsto(graph["a"], graph["d"])
        assert rows(rels["VF"]) == vf_ref
        assert rows(rels["MA"]) == ma_ref

    def test_opt_matches_plain(self, spark, graph):
        plain, _ = pointsto_analysis(spark, graph, opt=False)
        opt, _ = pointsto_analysis(spark, graph, opt=True)
        assert rows(plain["VF"]) == rows(opt["VF"])
        assert rows(plain["MA"]) == rows(opt["MA"])

    def test_opt_avoids_va(self, spark, graph):
        opt, _ = pointsto_analysis(spark, graph, opt=True)
        assert "VA" not in opt
