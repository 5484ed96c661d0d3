"""Differential-dataflow-style incremental engine with shared arrangements.

Layering (bottom → top):

* ``lattice``    — logical timestamps, frontiers, compaction math (App. A).
* ``trace``      — multiversioned collection traces over Spark DataFrames.
* ``arrange``    — the arrange operator, ``Arrangement`` and ``TraceHandle``.
* ``store``      — the sharing registry (shared vs. per-query private state).
* ``collection`` — streams of update triples + stateless operators.
* ``join``/``reduce`` — arrangement-aware stateful operators.
* ``iterate``    — semi-naive fixpoints and DRed incremental recursion.
* ``dataflow``   — query wiring, rounds, install/retire of live queries.
"""

from repro.core.lattice import Frontier, rep_f  # noqa: F401
from repro.core.store import ArrangementStore  # noqa: F401
from repro.core.dataflow import Dataflow  # noqa: F401
