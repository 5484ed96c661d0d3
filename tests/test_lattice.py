"""Appendix A: frontiers, rep_F, and the compaction theorems (property tests)."""
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.lattice import (
    Frontier,
    glb,
    indistinguishable,
    int_time,
    leq,
    lub,
    rep_f,
)

times2 = st.tuples(st.integers(0, 6), st.integers(0, 6))
frontiers2 = st.lists(times2, min_size=1, max_size=4).map(Frontier)


def brute_equiv(t1, t2, frontier, bound=8):
    """Brute-force t1 ≡_F t2 over the finite grid of times beyond F."""
    dims = len(t1)
    grid = [(i, j) for i in range(bound) for j in range(bound)] if dims == 2 else [
        (i,) for i in range(bound)
    ]
    for f in grid:
        if frontier.beyond(f) and (leq(t1, f) != leq(t2, f)):
            return False
    return True


class TestLatticeOps:
    def test_leq_total_order_ints(self):
        assert leq((1,), (2,)) and not leq((2,), (1,)) and leq((2,), (2,))

    def test_leq_partial_order(self):
        assert leq((1, 1), (2, 2))
        assert not leq((1, 2), (2, 1)) and not leq((2, 1), (1, 2))

    def test_lub_glb(self):
        assert lub((1, 4), (3, 2)) == (3, 4)
        assert glb((1, 4), (3, 2)) == (1, 2)

    def test_lub_is_upper_bound(self):
        a, b = (1, 5), (4, 2)
        assert leq(a, lub(a, b)) and leq(b, lub(a, b))

    def test_glb_is_lower_bound(self):
        a, b = (1, 5), (4, 2)
        assert leq(glb(a, b), a) and leq(glb(a, b), b)


class TestFrontier:
    def test_antichain_reduction(self):
        f = Frontier([(1, 1), (2, 2), (0, 3)])
        assert (2, 2) not in f.elements  # dominated by (1, 1)
        assert set(f.elements) == {(1, 1), (0, 3)}

    def test_beyond(self):
        f = Frontier([(2, 0), (0, 2)])
        assert f.beyond((2, 0)) and f.beyond((3, 5)) and f.beyond((0, 2))
        assert not f.beyond((1, 1)) and not f.beyond((0, 0))

    def test_empty_frontier(self):
        assert Frontier().is_empty()
        assert not Frontier().beyond((0, 0))

    def test_dominates(self):
        assert Frontier.at(5).dominates(Frontier.at(3))
        assert not Frontier.at(3).dominates(Frontier.at(5))

    def test_meet_is_lower_envelope(self):
        m = Frontier([(4,)]).meet(Frontier([(2,)]))
        assert m.beyond((2,)) and m.beyond((4,)) and not m.beyond((1,))

    def test_int_time_helper(self):
        assert int_time(7) == (7,)

    def test_at_tuple(self):
        assert Frontier.at((1, 2)).elements == ((1, 2),)


class TestRepF:
    def test_int_lattice_rep_is_max(self):
        f = Frontier.at(5)
        assert rep_f((3,), f) == (5,)
        assert rep_f((7,), f) == (7,)
        assert rep_f((5,), f) == (5,)

    def test_rep_multi_element_frontier(self):
        f = Frontier([(2, 0), (0, 2)])
        # glb(lub(t,(2,0)), lub(t,(0,2))) for t = (1, 0):
        assert rep_f((1, 0), f) == glb(lub((1, 0), (2, 0)), lub((1, 0), (0, 2)))

    def test_rep_empty_frontier_raises(self):
        with pytest.raises(ValueError):
            rep_f((0,), Frontier())

    @settings(max_examples=200, deadline=None)
    @given(t=times2, f=frontiers2)
    def test_theorem1_correctness(self, t, f):
        """Theorem 1: t ≡_F rep_F(t)."""
        assert brute_equiv(t, rep_f(t, f), f)

    @settings(max_examples=200, deadline=None)
    @given(t1=times2, t2=times2, f=frontiers2)
    def test_theorem2_optimality(self, t1, t2, f):
        """Theorem 2: t1 ≡_F t2 implies rep_F(t1) == rep_F(t2)."""
        if brute_equiv(t1, t2, f):
            assert rep_f(t1, f) == rep_f(t2, f)

    @settings(max_examples=200, deadline=None)
    @given(t1=times2, t2=times2, f=frontiers2)
    def test_indistinguishable_matches_bruteforce(self, t1, t2, f):
        assert indistinguishable(t1, t2, f) == brute_equiv(t1, t2, f)

    @settings(max_examples=100, deadline=None)
    @given(t=times2, f=frontiers2)
    def test_rep_idempotent(self, t, f):
        assert rep_f(rep_f(t, f), f) == rep_f(t, f)

    @settings(max_examples=100, deadline=None)
    @given(t=times2, f=frontiers2)
    def test_rep_of_beyond_time_is_identity(self, t, f):
        if f.beyond(t):
            assert rep_f(t, f) == t
