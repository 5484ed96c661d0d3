"""Batch graph algorithms over static arrangements (§6.3.3, Appendix C).

The tasks of Fig. 11/14/15/16: single-source reachability (``reach``),
single-source shortest paths (``sssp``), and undirected connectivity
(``wcc``), each driven by :mod:`repro.core.iterate` fixpoints over
:class:`~repro.core.iterate.StaticIndex` edge arrangements.  Index build
times are reported separately (the ``index-f``/``index-r`` columns), exactly
as the paper splits them.
"""
from __future__ import annotations

from typing import Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, functions as F

from repro.core.iterate import StaticIndex, fixpoint_min, semi_naive


def build_indexes(spark: SparkSession, edges: pd.DataFrame) -> Tuple[StaticIndex, StaticIndex]:
    """Forward (by src) and reverse (by dst) arrangements of the edge list."""
    df = spark.createDataFrame(edges)
    fwd = StaticIndex(df, ["src"], name="edges[src]")
    rev = StaticIndex(df, ["dst"], name="edges[dst]")
    return fwd, rev


def default_source(edges: pd.DataFrame) -> int:
    """First vertex with outgoing edges (the paper's source convention)."""
    return int(edges["src"].min())


def reach(spark: SparkSession, fwd: StaticIndex, source: int) -> DataFrame:
    """Nodes reachable from ``source`` along forward edges."""
    init = spark.createDataFrame(pd.DataFrame({"node": [source]}))

    def expand(delta: DataFrame) -> DataFrame:
        return delta.join(
            fwd.df, delta["node"] == fwd.df["src"], "inner"
        ).select(F.col("dst").alias("node"))

    return semi_naive(spark, init, expand, ["node"])


def sssp(spark: SparkSession, fwd: StaticIndex, source: int) -> DataFrame:
    """Shortest weighted distance from ``source`` to every reachable node."""
    init = spark.createDataFrame(pd.DataFrame({"node": [source], "dist": [0]}))

    def expand(delta: DataFrame) -> DataFrame:
        return delta.join(
            fwd.df, delta["node"] == fwd.df["src"], "inner"
        ).select(F.col("dst").alias("node"), (F.col("dist") + F.col("w")).alias("dist"))

    return fixpoint_min(spark, init, expand, "node", "dist")


def wcc(spark: SparkSession, fwd: StaticIndex, rev: StaticIndex) -> DataFrame:
    """Undirected connectivity: min-label propagation over both directions.

    Returns ``(node, comp)`` where ``comp`` is the smallest node id in the
    component.  Requires both edge arrangements, like the paper's wcc.
    """
    nodes = (
        fwd.df.select(F.col("src").alias("node"))
        .unionByName(fwd.df.select(F.col("dst").alias("node")))
        .distinct()
    )
    init = nodes.withColumn("comp", F.col("node"))

    def expand(delta: DataFrame) -> DataFrame:
        out = delta.join(fwd.df, delta["node"] == fwd.df["src"], "inner").select(
            F.col("dst").alias("node"), F.col("comp")
        )
        back = delta.join(rev.df, delta["node"] == rev.df["dst"], "inner").select(
            F.col("src").alias("node"), F.col("comp")
        )
        return out.unionByName(back)

    return fixpoint_min(spark, init, expand, "node", "comp")
