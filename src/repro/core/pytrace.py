"""Pure-Python reference trace for partially ordered times.

The Spark trace (:mod:`repro.core.trace`) uses the 1-dimensional integer
lattice for speed.  This module implements the *general* collection-trace
semantics of §4.1 and Appendix A over arbitrary product-lattice times, and is
used by the test suite to validate the compaction math (``rep_F``) against a
brute-force model and to document the full multiversioned contract.

The two implementations share the same logical model: a trace is a set of
update triples; ``read_at(t)`` accumulates ``diff`` over ``time <= t``;
compaction to a frontier ``F`` replaces each time by ``rep_F(time)`` and
coalesces — which must preserve ``read_at(t)`` for every ``t`` beyond ``F``
(Theorem 1) and is the coarsest such rewriting (Theorem 2).
"""
from __future__ import annotations

from collections import Counter
from typing import Dict, Hashable, Iterable, List, Tuple

from repro.core.lattice import Frontier, Time, leq, rep_f

Update = Tuple[Hashable, Time, int]


class PyTrace:
    """An in-memory multiversioned multiset index over (data, time, diff)."""

    def __init__(self) -> None:
        self.updates: Counter = Counter()  # (data, time) -> diff
        self.compaction_frontier: Frontier | None = None

    def insert(self, triples: Iterable[Update]) -> None:
        """Append update triples; identical (data, time) diffs accumulate."""
        for data, time, diff in triples:
            self.updates[(data, tuple(time))] += diff
        self._drop_cancelled()

    def _drop_cancelled(self) -> None:
        self.updates = Counter({k: v for k, v in self.updates.items() if v != 0})

    def read_at(self, t: Time) -> Dict[Hashable, int]:
        """Accumulated collection at time ``t`` (multiplicities != 0)."""
        if self.compaction_frontier is not None and not self.compaction_frontier.beyond(t):
            raise ValueError(f"read_at({t}) not beyond compaction frontier")
        acc: Counter = Counter()
        for (data, time), diff in self.updates.items():
            if leq(time, t):
                acc[data] += diff
        return {k: v for k, v in acc.items() if v != 0}

    def compact(self, frontier: Frontier) -> None:
        """Coalesce updates at times indistinguishable as of ``frontier``.

        Each time is mapped through Appendix A's ``rep_F``; by Theorem 1 the
        view at every time beyond ``frontier`` is unchanged, and by Theorem 2
        no coarser sound rewriting exists.
        """
        if frontier.is_empty():
            self.updates = Counter()
            self.compaction_frontier = frontier
            return
        compacted: Counter = Counter()
        for (data, time), diff in self.updates.items():
            compacted[(data, rep_f(time, frontier))] += diff
        self.updates = Counter({k: v for k, v in compacted.items() if v != 0})
        self.compaction_frontier = frontier

    def distinct_times(self) -> List[Time]:
        return sorted({time for (_, time) in self.updates})
