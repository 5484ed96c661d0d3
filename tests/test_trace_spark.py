"""Spark collection trace: sealing, merging, compaction, multiversioned reads."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.trace import DIFF_COL, MULT_COL, T_COL, Trace


def updates(spark, rows, t):
    pdf = pd.DataFrame(rows, columns=["k", "v"])
    pdf[T_COL] = t
    pdf[DIFF_COL] = pdf.pop("v")
    return spark.createDataFrame(pdf)


def read_dict(df):
    if df is None:
        return {}
    return {r["k"]: r[MULT_COL] for r in df.collect()}


@pytest.fixture
def trace():
    return Trace(["k"], ["k"], merge_effort="default")


class TestSeal:
    def test_empty_trace_reads_none(self, trace):
        assert trace.updates() is None
        assert trace.read_at(0) is None

    def test_seal_and_read(self, spark, trace):
        trace.seal(updates(spark, [(1, 1), (2, 1)], t=1), upper=2)
        assert read_dict(trace.read_at(1)) == {1: 1, 2: 1}

    def test_seal_none_advances_upper(self, trace):
        trace.seal(None, upper=5)
        assert trace.upper == 5

    def test_seal_regression_rejected(self, spark, trace):
        trace.seal(updates(spark, [(1, 1)], t=1), upper=2)
        with pytest.raises(ValueError):
            trace.seal(None, upper=2)

    def test_cancelled_batch_not_stored(self, spark, trace):
        trace.seal(updates(spark, [(1, 1), (1, -1)], t=1), upper=2)
        assert trace.batches == []

    def test_multiversioned_reads(self, spark, trace):
        trace.seal(updates(spark, [(1, 1)], t=1), upper=2)
        trace.seal(updates(spark, [(1, -1), (2, 1)], t=2), upper=3)
        assert read_dict(trace.read_at(1)) == {1: 1}
        assert read_dict(trace.read_at(2)) == {2: 1}

    def test_updates_in_range(self, spark, trace):
        trace.seal(updates(spark, [(1, 1)], t=1), upper=2)
        trace.seal(updates(spark, [(2, 1)], t=2), upper=3)
        got = trace.updates_in(2, 3).collect()
        assert [(r["k"], r[DIFF_COL]) for r in got] == [(2, 1)]


class TestMerging:
    def test_default_keeps_few_batches(self, spark):
        tr = Trace(["k"], ["k"], merge_effort="default")
        for t in range(1, 9):
            tr.seal(updates(spark, [(t, 1)], t=t), upper=t + 1)
        assert len(tr.batches) <= 4  # logarithmically many
        assert read_dict(tr.read_at(8)) == {t: 1 for t in range(1, 9)}

    def test_eager_single_batch(self, spark):
        tr = Trace(["k"], ["k"], merge_effort="eager")
        for t in range(1, 6):
            tr.seal(updates(spark, [(t, 1)], t=t), upper=t + 1)
        assert len(tr.batches) == 1

    def test_lazy_accumulates_batches(self, spark):
        tr = Trace(["k"], ["k"], merge_effort="lazy")
        for t in range(1, 6):
            tr.seal(updates(spark, [(t, 1)], t=t), upper=t + 1)
        assert len(tr.batches) == 5
        assert tr.merge_count == 0

    def test_merge_preserves_content(self, spark):
        tr = Trace(["k"], ["k"], merge_effort="eager")
        for t in range(1, 6):
            tr.seal(updates(spark, [(t, 1), (t - 1, -1)], t=t), upper=t + 1)
        assert read_dict(tr.read_at(5)) == {0: -1, 5: 1}

    def test_unknown_effort_rejected(self):
        with pytest.raises(ValueError):
            Trace(["k"], ["k"], merge_effort="sometimes")

    def test_bad_key_rejected(self):
        with pytest.raises(ValueError):
            Trace(["k"], ["nope"])


class TestCompaction:
    def test_compaction_coalesces_and_preserves(self, spark):
        tr = Trace(["k"], ["k"], merge_effort="eager")
        tr.seal(updates(spark, [(1, 1)], t=1), upper=2)
        tr.seal(updates(spark, [(1, 1)], t=2), upper=3)
        tr.advance_compaction_frontier(3)
        tr.seal(updates(spark, [(2, 1)], t=3), upper=4)
        # all history coalesced to a single time >= 3
        times = {r[T_COL] for r in tr.updates().collect()}
        assert times == {3}
        assert read_dict(tr.read_at(3)) == {1: 2, 2: 1}

    def test_read_below_frontier_rejected(self, spark):
        tr = Trace(["k"], ["k"])
        tr.seal(updates(spark, [(1, 1)], t=1), upper=2)
        tr.advance_compaction_frontier(3)
        with pytest.raises(ValueError):
            tr.read_at(2)

    def test_compacted_cancellation_drops_rows(self, spark):
        tr = Trace(["k"], ["k"], merge_effort="eager")
        tr.seal(updates(spark, [(1, 1)], t=1), upper=2)
        tr.advance_compaction_frontier(5)
        tr.seal(updates(spark, [(1, -1)], t=5), upper=6)
        assert tr.total_rows() == 0

    def test_accounting(self, spark):
        tr = Trace(["k"], ["k"], merge_effort="lazy")
        tr.seal(updates(spark, [(1, 1), (2, 1)], t=1), upper=2)
        assert tr.total_rows() == 2
        assert tr.estimated_bytes() > 0
        tr.unpersist()
        assert tr.total_rows() == 0
