"""TPC-H-lite schema: relations, primary keys, and dataflow declaration.

Of the eight relations, seven have meaningful primary keys and are the
candidates for shared arrangement (§6.1.1); ``lineitem`` is a stream of
fulfilment events, never arranged globally — each query observes it windowed
from its own installation (``QueryContext.stream``).
"""
from __future__ import annotations

from typing import Dict, List

from repro.core.dataflow import Dataflow
from repro.synth_data import TPCH_TABLES, tpch_lite

#: relation -> primary key columns (the shared arrangement keys)
PRIMARY_KEYS: Dict[str, List[str]] = {
    "orders": ["o_orderkey"],
    "customer": ["c_custkey"],
    "part": ["p_partkey"],
    "supplier": ["s_suppkey"],
    "partsupp": ["ps_partkey", "ps_suppkey"],
    "nation": ["n_nationkey"],
    "region": ["r_regionkey"],
}

#: the streamed, windowed fact relation
STREAMED = "lineitem"

#: relation -> column list, derived from the generators at trivial scale
COLUMNS: Dict[str, List[str]] = {
    name: list(gen(sf=1e-6, seed=0).columns) for name, gen in TPCH_TABLES.items()
}


def declare_inputs(flow: Dataflow) -> None:
    """Declare all eight TPC-H-lite relations as inputs of ``flow``."""
    for name, cols in COLUMNS.items():
        flow.input(name, cols)


def generate(sf: float, seed: int = 0) -> dict:
    """All eight relations as pandas frames (see ``synth_data.tpch_lite``)."""
    return tpch_lite(sf=sf, seed=seed)
