"""Reference-trace semantics: multiversioned reads and lossless compaction."""
from hypothesis import given, settings, strategies as st

from repro.core.lattice import Frontier
from repro.core.pytrace import PyTrace


def test_read_at_accumulates():
    tr = PyTrace()
    tr.insert([("a", (1,), 1), ("b", (2,), 1), ("a", (3,), -1)])
    assert tr.read_at((1,)) == {"a": 1}
    assert tr.read_at((2,)) == {"a": 1, "b": 1}
    assert tr.read_at((3,)) == {"b": 1}


def test_cancelled_updates_dropped():
    tr = PyTrace()
    tr.insert([("a", (1,), 1), ("a", (1,), -1)])
    assert not tr.updates


def test_partial_order_read():
    tr = PyTrace()
    tr.insert([("x", (1, 0), 1), ("y", (0, 1), 1)])
    assert tr.read_at((1, 0)) == {"x": 1}
    assert tr.read_at((0, 1)) == {"y": 1}
    assert tr.read_at((1, 1)) == {"x": 1, "y": 1}


def test_compaction_preserves_views_beyond_frontier():
    tr = PyTrace()
    tr.insert([("a", (1,), 1), ("a", (2,), -1), ("b", (2,), 1), ("c", (4,), 1)])
    before = {t: tr.read_at((t,)) for t in range(3, 7)}
    tr.compact(Frontier.at(3))
    after = {t: tr.read_at((t,)) for t in range(3, 7)}
    assert before == after


def test_compaction_coalesces_history():
    tr = PyTrace()
    tr.insert([("a", (1,), 1), ("a", (2,), 2), ("a", (3,), 3)])
    tr.compact(Frontier.at(5))
    assert tr.distinct_times() == [(5,)]
    assert tr.read_at((5,)) == {"a": 6}


def test_compaction_to_empty_frontier_drops_everything():
    tr = PyTrace()
    tr.insert([("a", (1,), 1)])
    tr.compact(Frontier())
    assert not tr.updates


def test_read_below_compaction_frontier_rejected():
    tr = PyTrace()
    tr.insert([("a", (1,), 1)])
    tr.compact(Frontier.at(3))
    import pytest

    with pytest.raises(ValueError):
        tr.read_at((2,))


@settings(max_examples=100, deadline=None)
@given(
    updates=st.lists(
        st.tuples(
            st.sampled_from("abc"),
            st.tuples(st.integers(0, 5), st.integers(0, 5)),
            st.integers(-2, 2),
        ),
        max_size=20,
    ),
    frontier=st.lists(
        st.tuples(st.integers(0, 5), st.integers(0, 5)), min_size=1, max_size=3
    ).map(Frontier),
)
def test_compaction_lossless_property(updates, frontier):
    """read_at(t) is invariant under compaction for every t beyond F."""
    a, b = PyTrace(), PyTrace()
    a.insert(updates)
    b.insert(updates)
    b.compact(frontier)
    for i in range(7):
        for j in range(7):
            t = (i, j)
            if frontier.beyond(t):
                assert a.read_at(t) == b.read_at(t)
