"""Fig. 7 (e)/(f) — microbenchmarks of the arrangement design.

7e: per-round arrangement maintenance latency distribution under eager /
default / lazy amortized-merge settings — eager pays merge spikes in the
tail, lazy accumulates batches, the default sits between.

7f: latency to install, execute, and complete a *new* dataflow that joins a
small collection of varying size against a pre-existing arrangement — with
sharing, the cost tracks the small collection; the unshared baseline pays the
full re-indexing of the large side regardless of batch size.
"""
from __future__ import annotations

import time as _time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.dataflow import Dataflow
from repro.synth_data import uniform_keys_pdf


def run_merge_effort(
    spark: SparkSession,
    n_rounds: int = 20,
    rows_per_round: int = 20_000,
    n_keys: int = 200_000,
) -> pd.DataFrame:
    """Fig. 7e analogue: per-round latency stats by merge eagerness."""
    rows = []
    for effort in ("eager", "default", "lazy"):
        flow = Dataflow(spark, shared=True, merge_effort=effort)
        flow.input("ids", ["k", "v"])
        flow.install("touch", lambda ctx: ctx.arranged("ids", ["k"]).as_stream())
        lats = []
        for r in range(n_rounds):
            flow.feed("ids", uniform_keys_pdf(n=rows_per_round, n_keys=n_keys, seed=r))
            lats.append(flow.step())
        trace = flow.store.nodes[0].arrangement.trace
        rows.append(
            {
                "merge_effort": effort,
                "p50_ms": round(float(np.percentile(lats, 50)) * 1000, 1),
                "p99_ms": round(float(np.percentile(lats, 99)) * 1000, 1),
                "max_ms": round(float(np.max(lats)) * 1000, 1),
                "final_batches": len(trace.batches),
                "merges": trace.merge_count,
            }
        )
    return pd.DataFrame(rows)


def run_join_proportionality(
    spark: SparkSession,
    arranged_rows: int = 1_000_000,
    n_keys: int = 1_000_000,
    batch_sizes=(100, 1_000, 10_000, 100_000),
) -> pd.DataFrame:
    """Fig. 7f analogue: new-dataflow join latency vs batch size.

    ``shared_ms`` installs a join against the existing arrangement and feeds
    a batch of the given size; ``unshared_ms`` must first re-index the large
    collection (the record-at-a-time / no-sharing cost floor).
    """
    base = uniform_keys_pdf(n=arranged_rows, n_keys=n_keys, seed=0)
    results = []
    for shared in (True, False):
        flow = Dataflow(spark, shared=shared)
        flow.input("big", ["k", "v"])
        flow.input("probe", ["k", "p"])
        # Seed the shared arrangement (in unshared mode this copy is ignored
        # by later queries, which is exactly the point).
        flow.install("warm", lambda ctx: ctx.arranged("big", ["k"]).as_stream())
        flow.feed("big", base)
        flow.step()
        for i, b in enumerate(batch_sizes):
            probe = uniform_keys_pdf(n=b, n_keys=n_keys, seed=100 + i).rename(
                columns={"v": "p"}
            )

            def build(ctx):
                big = ctx.arranged("big", ["k"]).rename({"k": "bk", "v": "bv"})
                return ctx.join(
                    ctx.stream("probe"), big, (["k"], ["bk"]), select=["k", "p", "bv"]
                )

            t0 = _time.perf_counter()
            q = flow.install(f"join{shared}-{b}", build)
            flow.feed("probe", probe)
            flow.step()
            elapsed = _time.perf_counter() - t0
            results.append(
                {
                    "mode": "shared" if shared else "not shared",
                    "batch": b,
                    "install_and_first_result_ms": round(elapsed * 1000, 1),
                    "output_rows": len(q.result()),
                }
            )
            flow.retire(f"join{shared}-{b}")
    return pd.DataFrame(results)
