"""Streaming workload harness: deploy/retire mechanics and metrics capture."""
import pytest

from repro.tpch.workload import (
    StreamingStats,
    _chunks,
    _dist_summary,
    run_batch,
    run_streaming_mix,
    run_update_rate,
)
from repro.tpch.schema import generate


class TestHelpers:
    def test_chunks_cover_everything(self):
        pdf = generate(sf=0.001)["orders"]
        cs = _chunks(pdf, 5)
        assert sum(len(c) for c in cs) == len(pdf)
        assert len(cs) == 5

    def test_dist_summary_empty(self):
        assert _dist_summary([]) == {"p50": 0.0, "p95": 0.0, "p99": 0.0, "max": 0.0}

    def test_dist_summary_percentiles(self):
        s = _dist_summary(list(range(1, 101)))
        assert s["p50"] == pytest.approx(50.5)
        assert s["max"] == 100

    def test_stats_record(self):
        st = StreamingStats(shared=True)
        st.record_install("q01", 0.5)
        st.record_install("q01", 1.5)
        assert st.install_summary()["max"] == 1.5


class TestStreamingMix:
    def test_mix_runs_and_records(self, spark):
        stats = run_streaming_mix(
            spark,
            sf=0.001,
            n_rounds=3,
            shared=True,
            target_live=2,
            query_names=["q01", "q06", "q11"],
        )
        assert len(stats.step_secs) == 3
        assert len(stats.memory_bytes) == 3
        assert sum(len(v) for v in stats.install_secs.values()) == 3
        assert stats.memory_bytes[-1] > 0

    def test_unshared_uses_more_memory(self, spark):
        kw = dict(
            sf=0.001, n_rounds=3, target_live=3, query_names=["q03", "q05", "q10"]
        )
        shared = run_streaming_mix(spark, shared=True, **kw)
        unshared = run_streaming_mix(spark, shared=False, **kw)
        assert unshared.memory_bytes[-1] > shared.memory_bytes[-1]


class TestRateAndBatch:
    def test_update_rate_positive(self, spark):
        rate = run_update_rate(spark, "q06", sf=0.001, batch_rows=500, n_batches=2)
        assert rate > 0

    def test_batch_elapsed_positive(self, spark):
        assert run_batch(spark, "q01", sf=0.001) > 0
