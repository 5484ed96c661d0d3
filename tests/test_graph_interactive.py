"""Interactive graph queries: correctness and shared/unshared behaviour."""
import pandas as pd
import pytest

from repro.graphs import baselines
from repro.graphs.gen import random_graph
from repro.graphs.interactive import GraphQuerySession


@pytest.fixture(scope="module")
def edges():
    return random_graph(120, 480, seed=21)


def adj(edges):
    out = {}
    for u, v in zip(edges["src"], edges["dst"]):
        out.setdefault(int(u), set()).add(int(v))
    return out


def shortest_leq4(edges, s, t):
    if s == t:
        return 0
    a = adj(edges)
    frontier = {s}
    seen = {s}
    for depth in range(1, 5):
        frontier = {y for x in frontier for y in a.get(x, ())} - seen
        if t in frontier:
            return depth
        seen |= frontier
    return None


@pytest.fixture(scope="module")
def session(spark, edges):
    return GraphQuerySession.start(spark, edges, shared=True)


class TestQueries:
    def test_lookup(self, session, edges):
        node = int(edges["src"].iloc[0])
        session.issue("lookup", pd.DataFrame({"qid": [1], "node": [node]}))
        session.step()
        res = session.queries["lookup"].result()
        assert set(res["dst"]) == adj(edges)[node]

    def test_onehop_and_twohop(self, session, edges):
        node = int(edges["src"].iloc[1])
        session.issue("onehop", pd.DataFrame({"qid": [2], "node": [node]}))
        session.issue("twohop", pd.DataFrame({"qid": [2], "node": [node]}))
        session.step()
        a = adj(edges)
        one = set(session.queries["onehop"].result()["dst"])
        assert one == a[node]
        two = set(session.queries["twohop"].result()["dst"])
        assert two == {y for x in a[node] for y in a.get(x, ())}

    def test_path_query(self, session, edges):
        a = adj(edges)
        s = int(edges["src"].iloc[2])
        mid = next(iter(a[s]))
        t_candidates = a.get(mid, set()) - {s}
        t = next(iter(t_candidates)) if t_candidates else mid
        session.issue("path", pd.DataFrame({"qid": [3], "ps": [s], "pt": [t]}))
        session.step()
        res = session.queries["path"].result()
        expect = shortest_leq4(edges, s, t)
        got = dict(zip(res["qid"], res["dist"])).get(3)
        assert got == expect

    def test_path_unreachable_absent(self, spark):
        iso_edges = pd.DataFrame({"src": [0, 2], "dst": [1, 3]})
        sess = GraphQuerySession.start(spark, iso_edges, shared=True)
        sess.issue("path", pd.DataFrame({"qid": [9], "ps": [0], "pt": [3]}))
        sess.step()
        assert len(sess.queries["path"].result()) == 0

    def test_argument_retraction(self, session, edges):
        node = int(edges["src"].iloc[3])
        session.issue("lookup", pd.DataFrame({"qid": [4], "node": [node]}))
        session.step()
        session.issue("lookup", pd.DataFrame({"qid": [4], "node": [node]}), diff=-1)
        session.step()
        res = session.queries["lookup"].result()
        assert 4 not in set(res["qid"])

    def test_graph_update_maintains_results(self, session, edges):
        node = 777  # fresh node
        session.issue("lookup", pd.DataFrame({"qid": [5], "node": [node]}))
        session.step()
        assert 5 not in set(session.queries["lookup"].result()["qid"])
        session.update_graph(pd.DataFrame({"src": [node], "dst": [778]}))
        session.step()
        res = session.queries["lookup"].result()
        assert set(res[res["qid"] == 5]["dst"]) == {778}


class TestSharing:
    def test_unshared_uses_more_arrangements_and_memory(self, spark, edges):
        shared = GraphQuerySession.start(spark, edges, shared=True)
        unshared = GraphQuerySession.start(spark, edges, shared=False)
        n_sh = sum(
            1 for n in shared.flow.store.nodes
            if n.arrangement.name.startswith("edges")
        )
        n_un = sum(
            1 for n in unshared.flow.store.nodes
            if n.arrangement.name.startswith("edges")
        )
        assert n_sh == 2  # by src, by dst
        assert n_un >= 6  # one private copy per use across the four queries
        assert unshared.memory_bytes() > 2 * shared.memory_bytes()

    def test_shared_unshared_same_answers(self, spark, edges):
        results = {}
        for mode in (True, False):
            sess = GraphQuerySession.start(spark, edges, shared=mode)
            node = int(edges["src"].iloc[5])
            sess.issue("twohop", pd.DataFrame({"qid": [7], "node": [node]}))
            sess.step()
            results[mode] = set(sess.queries["twohop"].result()["dst"])
        assert results[True] == results[False]
