"""Memory accounting: estimates and the Spark block-manager meter."""
import pandas as pd

from repro.core.dataflow import Dataflow
from repro.core.memory import cached_rdd_count, spark_cached_bytes


def test_spark_cached_bytes_reflects_arrangement_state(spark):
    before = spark_cached_bytes(spark)
    flow = Dataflow(spark, shared=True)
    flow.input("a", ["k", "v"])
    flow.install("q", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
    flow.feed("a", pd.DataFrame({"k": range(20000), "v": range(20000)}))
    flow.step()
    after = spark_cached_bytes(spark)
    assert after > before
    assert cached_rdd_count(spark) > 0


def test_estimate_tracks_growth(spark):
    flow = Dataflow(spark, shared=True)
    flow.input("a", ["k", "v"])
    flow.install("q", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
    flow.feed("a", pd.DataFrame({"k": range(1000), "v": range(1000)}))
    flow.step()
    m1 = flow.memory_bytes()
    flow.feed("a", pd.DataFrame({"k": range(1000, 3000), "v": range(2000)}))
    flow.step()
    assert flow.memory_bytes() > m1


def test_estimate_zero_when_empty(spark):
    flow = Dataflow(spark, shared=True)
    flow.input("a", ["k", "v"])
    assert flow.memory_bytes() == 0
