"""The streaming TPC-H harness of §6.1.1 (Fig. 1) and Appendix B (Fig. 12/13).

``run_streaming_mix`` progressively loads the eight relations round-robin
while interactively deploying and retiring queries, with up to ``target_live``
concurrently active — mimicking analysts and dashboards.  It records the
three Fig. 1 metrics: query installation latency, per-round update processing
latency, and the arrangement memory footprint over time.

``run_update_rate`` (Fig. 12) measures per-query streaming throughput:
dimension tables pre-loaded, then lineitem fed in logical batches.
``run_batch`` (Fig. 13) measures one-shot elapsed time per query.
"""
from __future__ import annotations

import time as _time
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.dataflow import Dataflow
from repro.tpch.queries import QUERIES
from repro.tpch.schema import declare_inputs, generate


@dataclass
class StreamingStats:
    """Everything the Fig. 1 plots are drawn from."""

    shared: bool
    install_secs: Dict[str, List[float]] = field(default_factory=dict)
    step_secs: List[float] = field(default_factory=list)
    memory_bytes: List[int] = field(default_factory=list)

    def record_install(self, qname: str, secs: float) -> None:
        self.install_secs.setdefault(qname, []).append(secs)

    def install_summary(self) -> Dict[str, float]:
        all_ = sorted(s for v in self.install_secs.values() for s in v)
        return _dist_summary(all_)

    def update_summary(self) -> Dict[str, float]:
        return _dist_summary(sorted(self.step_secs))

    def memory_summary(self) -> Dict[str, float]:
        m = self.memory_bytes or [0]
        return {"min": min(m), "max": max(m), "mean": float(np.mean(m))}


def _dist_summary(xs: Sequence[float]) -> Dict[str, float]:
    if not xs:
        return {"p50": 0.0, "p95": 0.0, "p99": 0.0, "max": 0.0}
    a = np.asarray(xs)
    return {
        "p50": float(np.percentile(a, 50)),
        "p95": float(np.percentile(a, 95)),
        "p99": float(np.percentile(a, 99)),
        "max": float(a.max()),
    }


def _chunks(pdf: pd.DataFrame, n: int) -> List[pd.DataFrame]:
    bounds = np.linspace(0, len(pdf), n + 1).astype(int)
    return [pdf.iloc[a:b] for a, b in zip(bounds, bounds[1:])]


def run_streaming_mix(
    spark: SparkSession,
    sf: float = 0.01,
    n_rounds: int = 8,
    shared: bool = True,
    target_live: int = 4,
    query_names: Optional[Sequence[str]] = None,
    seed: int = 0,
    li_fraction: float = 0.25,
) -> StreamingStats:
    """Fig. 1: progressive round-robin load + interactive deploy/retire.

    Each round feeds the next slice of every relation; one query is retired
    (oldest) and one installed (cycling through ``query_names``) per round
    once ``target_live`` are active.  ``li_fraction`` thins the lineitem
    stream: in the paper's setup the (windowed, per-query) fulfilment state
    is small relative to the accumulated dimension tables whose arrangements
    are shared — at lite scale the generator's 4:1 lineitem:orders ratio
    would otherwise let per-query window state mask the sharing effect.
    Returns the recorded statistics.
    """
    names = list(query_names or sorted(QUERIES))
    tables = generate(sf=sf, seed=seed)
    tables["lineitem"] = tables["lineitem"].sample(
        frac=li_fraction, random_state=seed
    ).reset_index(drop=True)
    chunks = {name: _chunks(pdf, n_rounds) for name, pdf in tables.items()}
    flow = Dataflow(spark, shared=shared)
    declare_inputs(flow)
    stats = StreamingStats(shared=shared)
    live: List[str] = []
    next_q = 0

    def install_next() -> None:
        nonlocal next_q
        qname = names[next_q % len(names)]
        next_q += 1
        instance = f"{qname}#{next_q}"
        q = flow.install(instance, QUERIES[qname].build)
        stats.record_install(qname, q.install_secs)
        live.append(instance)

    for r in range(n_rounds):
        for name, cs in chunks.items():
            flow.feed(name, cs[r])
        stats.step_secs.append(flow.step())
        if len(live) >= target_live:
            flow.retire(live.pop(0))
        install_next()
        stats.memory_bytes.append(flow.memory_bytes())
    return stats


def run_update_rate(
    spark: SparkSession,
    qname: str,
    sf: float = 0.01,
    batch_rows: int = 2000,
    n_batches: int = 4,
    seed: int = 0,
) -> float:
    """Fig. 12: streaming lineitem tuples/second through one installed query."""
    tables = generate(sf=sf, seed=seed)
    flow = Dataflow(spark, shared=True)
    declare_inputs(flow)
    for name, pdf in tables.items():
        if name != "lineitem":
            flow.feed(name, pdf)
    flow.step()
    flow.install(qname, QUERIES[qname].build)
    li = tables["lineitem"]
    total = 0
    t0 = _time.perf_counter()
    for b in range(n_batches):
        batch = li.iloc[b * batch_rows : (b + 1) * batch_rows]
        if len(batch) == 0:
            break
        flow.feed("lineitem", batch)
        flow.step()
        total += len(batch)
    elapsed = _time.perf_counter() - t0
    return total / elapsed if elapsed > 0 else 0.0


def run_batch(spark: SparkSession, qname: str, sf: float = 0.01, seed: int = 0) -> float:
    """Fig. 13: one-shot elapsed seconds for a query over the full input."""
    tables = generate(sf=sf, seed=seed)
    flow = Dataflow(spark, shared=True)
    declare_inputs(flow)
    q = flow.install(qname, QUERIES[qname].build)
    for name, pdf in tables.items():
        flow.feed(name, pdf)
    t0 = _time.perf_counter()
    flow.step()
    q.result()
    return _time.perf_counter() - t0
