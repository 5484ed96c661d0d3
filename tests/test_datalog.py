"""Datalog engine + tc/sg programs against pure-Python references."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.datalog.engine import Atom, Evaluator, Program, Rule
from repro.datalog.queries import (
    SG_PROGRAM,
    TC_PROGRAM,
    build_indexes,
    sg_from,
    sg_full,
    tc_from,
    tc_full,
    tc_to,
)
from repro.graphs.gen import gnp_graph, grid_graph, tree_graph


def py_tc(edges):
    adj = {}
    for u, v in zip(edges["src"], edges["dst"]):
        adj.setdefault(int(u), set()).add(int(v))
    out = set()
    for s in set(adj):
        stack, seen = list(adj[s]), set()
        while stack:
            x = stack.pop()
            if x in seen:
                continue
            seen.add(x)
            stack.extend(adj.get(x, ()))
        out |= {(s, t) for t in seen}
    return out


def py_sg(edges):
    children = {}
    for u, v in zip(edges["src"], edges["dst"]):
        children.setdefault(int(u), set()).add(int(v))
    sg = {(x, y) for kids in children.values() for x in kids for y in kids if x != y}
    while True:
        new = set()
        for (a, b) in sg:
            for x in children.get(a, ()):
                for y in children.get(b, ()):
                    if (x, y) not in sg:
                        new.add((x, y))
        if not new:
            return sg
        sg |= new


def rows(df):
    return {(r["src"], r["dst"]) for r in df.collect()}


@pytest.fixture(scope="module")
def tree():
    return tree_graph(4, 2)


class TestEngineBasics:
    def test_rule_arity_validation(self):
        with pytest.raises(ValueError):
            Rule("x", (Atom("a"), Atom("b"), Atom("c")))

    def test_missing_edb_rejected(self, spark):
        with pytest.raises(ValueError, match="missing EDB"):
            Evaluator(spark, TC_PROGRAM, {})

    def test_copy_rule(self, spark, tree):
        p = Program([Rule("out", (Atom("e"),))])
        ev = Evaluator(spark, p, {"e": spark.createDataFrame(tree)})
        assert rows(ev.run()["out"]) == {(u, v) for u, v in zip(tree["src"], tree["dst"])}

    def test_inverted_copy_rule(self, spark, tree):
        p = Program([Rule("out", (Atom("e", inverted=True),))])
        ev = Evaluator(spark, p, {"e": spark.createDataFrame(tree)})
        assert rows(ev.run()["out"]) == {(v, u) for u, v in zip(tree["src"], tree["dst"])}

    def test_empty_idb_materialized(self, spark):
        p = Program([Rule("out", (Atom("e"), Atom("out")))])
        e = spark.createDataFrame(pd.DataFrame({"src": [1], "dst": [2]}))
        ev = Evaluator(spark, p, {"e": e})
        assert ev.run()["out"].count() == 0


class TestTransitiveClosure:
    def test_tc_tree(self, spark, tree):
        tc, _ = tc_full(spark, tree)
        assert rows(tc) == py_tc(tree)

    def test_tc_grid(self, spark):
        g = grid_graph(5)
        tc, _ = tc_full(spark, g)
        assert rows(tc) == py_tc(g)

    def test_tc_with_cycles(self, spark):
        g = gnp_graph(30, 2.0, seed=1)
        tc, _ = tc_full(spark, g)
        assert rows(tc) == py_tc(g)

    def test_tc_shared_indexes_same_result(self, spark, tree):
        idx = build_indexes(spark, tree)
        a, _ = tc_full(spark, tree, indexes=idx)
        b, _ = tc_full(spark, tree)
        assert rows(a) == rows(b)


class TestSeededQueries:
    def test_tc_from_matches_full(self, spark):
        g = grid_graph(5)
        idx = build_indexes(spark, g)
        full = py_tc(g)
        node = 0
        got = rows(tc_from(spark, idx, node)) - {(node, node)}
        assert got == {(s, t) for s, t in full if s == node}

    def test_tc_to_matches_full(self, spark):
        g = grid_graph(5)
        idx = build_indexes(spark, g)
        full = py_tc(g)
        node = 24
        got = {(t, s) for s, t in rows(tc_to(spark, idx, node))} - {(node, node)}
        assert got == {(s, t) for s, t in full if t == node}

    def test_sg_from_matches_full(self, spark, tree):
        idx = build_indexes(spark, tree)
        full = py_sg(tree)
        node = 5
        got = rows(sg_from(spark, idx, node))
        assert got == {(x, y) for x, y in full if x == node}


class TestSameGeneration:
    def test_sg_tree(self, spark, tree):
        sg, _ = sg_full(spark, tree)
        assert rows(sg) == py_sg(tree)

    def test_sg_gnp(self, spark):
        g = gnp_graph(25, 1.5, seed=2)
        sg, _ = sg_full(spark, g)
        assert rows(sg) == py_sg(g)

    def test_index_reuse_skips_build_time(self, spark, tree):
        idx = build_indexes(spark, tree)
        _, ev = tc_full(spark, tree, indexes=idx)
        assert ev.index_build_secs == 0.0
        _, ev2 = tc_full(spark, tree)
        assert ev2.index_build_secs > 0.0
