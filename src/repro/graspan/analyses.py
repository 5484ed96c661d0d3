"""The Graspan analyses as CFL-reachability Datalog programs.

``dataflow`` propagates null assignments along assignment-flow edges:
``N(S, X)`` holds when the null value born at source ``S`` reaches program
location ``X``.  Tracking per-source pairs (rather than a flat nullable set)
is what makes interactive removal of individual null assignments (Fig. 9c)
incremental: the derivations of distinct sources are disjoint, so removing
source ``n`` retracts exactly the arranged rows ``N(n, ·)``, and the
"locations reached by any null" view is maintained by reference counts —
no delete–rederive pass is needed (DESIGN.md §2.4).

``points-to`` is the mutually recursive value-flow / value-alias /
memory-alias grammar (Graspan §2): with ``VF*`` the reflexive closure,

    VF ::= a | MA | VF VF          (value flow)
    VA ::= VF*⁻¹ VF*               (value alias)
    MA ::= d⁻¹ VA d                (memory alias)

The plain plan materializes the large ``VA`` relation, which is used exactly
once; the optimized plan (``DD (Opt)`` in Fig. 10) pushes the dereference
restriction inside — ``MA ::= VFD⁻¹ VFD`` with ``VFD ::= d | VF d`` — never
materializing ``VA`` and reusing the arranged ``VF`` several times, which is
precisely the rewrite the paper says benefits from shared arrangements.
Both plans provably derive the same ``VF``/``MA``.
"""
from __future__ import annotations

import time as _time
from dataclasses import dataclass
from typing import Dict, Optional, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, functions as F

from repro.datalog.engine import Atom, Evaluator, Program, Rule
from repro.graspan.gen import DataflowGraph

DATAFLOW_PROGRAM = Program([Rule("N", (Atom("N"), Atom("e")))])

POINTSTO_PLAIN = Program(
    [
        Rule("VF", (Atom("a"),)),
        Rule("VF", (Atom("MA"),)),
        Rule("VF", (Atom("VF"), Atom("VF"))),
        # VA = (VF*)^-1 ∘ VF*, split by the reflexive cases:
        Rule("VA", (Atom("VF", inverted=True), Atom("VF"))),
        Rule("VA", (Atom("VF"),)),
        Rule("VA", (Atom("VF", inverted=True),)),
        # MA = d^-1 ∘ VA ∘ d  (+ the VA-identity case d^-1 ∘ d)
        Rule("T1", (Atom("d", inverted=True), Atom("VA"))),
        Rule("MA", (Atom("T1"), Atom("d"))),
        Rule("MA", (Atom("d", inverted=True), Atom("d"))),
    ]
)

POINTSTO_OPT = Program(
    [
        Rule("VF", (Atom("a"),)),
        Rule("VF", (Atom("MA"),)),
        Rule("VF", (Atom("VF"), Atom("VF"))),
        # VFD = (VF ∪ id) ∘ d — the dereference-restricted value flow
        Rule("VFD", (Atom("d"),)),
        Rule("VFD", (Atom("VF"), Atom("d"))),
        Rule("MA", (Atom("VFD", inverted=True), Atom("VFD"))),
    ]
)


# ---------------------------------------------------------------------------
# dataflow analysis (Fig. 9) + incremental null-source removal (Fig. 9c)
# ---------------------------------------------------------------------------

def dataflow_analysis(
    spark: SparkSession,
    graph: DataflowGraph,
    indexes: Optional[Dict[str, DataFrame]] = None,
) -> Tuple[DataFrame, Evaluator]:
    """Full null-propagation: returns ``N(src=source, dst=location)``."""
    seeds = spark.createDataFrame(
        pd.DataFrame({"src": graph.null_sources, "dst": graph.null_sources})
    )
    ev = Evaluator(
        spark,
        DATAFLOW_PROGRAM,
        {"e": spark.createDataFrame(graph.edges)},
        indexes=indexes,
    )
    return ev.run(seeds={"N": seeds})["N"], ev


@dataclass
class MaintainedDataflow:
    """The dataflow result kept interactive: per-source pairs arranged by
    source, plus reference counts per reached location."""

    pairs: pd.DataFrame  # (src, dst) — driver-side mirror of the arrangement
    counts: pd.Series  # location -> number of sources reaching it

    @classmethod
    def from_result(cls, n_df: DataFrame) -> "MaintainedDataflow":
        pairs = n_df.toPandas()
        return cls(pairs=pairs, counts=pairs.groupby("dst").size())

    def nullable_locations(self) -> int:
        return int((self.counts > 0).sum())

    def remove_source(self, source: int) -> Tuple[int, float]:
        """Retract one null assignment; returns (#locations corrected, secs).

        Per-source derivations are disjoint, so the retraction is exactly the
        arranged rows of ``source``; the nullable-set view updates by
        decrementing reference counts — the incremental path of Fig. 9c.
        """
        t0 = _time.perf_counter()
        mine = self.pairs[self.pairs["src"] == source]
        dec = mine.groupby("dst").size()
        self.counts = self.counts.sub(dec, fill_value=0)
        dropped = int((self.counts <= 0).sum() - (self.counts < 0).sum())
        self.counts = self.counts[self.counts > 0]
        self.pairs = self.pairs[self.pairs["src"] != source]
        return dropped, _time.perf_counter() - t0


# ---------------------------------------------------------------------------
# points-to analysis (Fig. 10)
# ---------------------------------------------------------------------------

def pointsto_analysis(
    spark: SparkSession,
    graph: Dict[str, pd.DataFrame],
    opt: bool = False,
    indexes: Optional[Dict[str, DataFrame]] = None,
) -> Tuple[Dict[str, DataFrame], Evaluator]:
    """Run the plain or optimized points-to plan; returns all IDB relations."""
    program = POINTSTO_OPT if opt else POINTSTO_PLAIN
    ev = Evaluator(
        spark,
        program,
        {name: spark.createDataFrame(df) for name, df in graph.items()},
        indexes=indexes,
    )
    return ev.run(), ev
