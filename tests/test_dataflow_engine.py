"""End-to-end engine semantics: incremental == batch, sharing == no sharing."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.dataflow import Dataflow
from repro.core.reduce import PandasAgg, SqlAgg, w_count, w_sum


def kv(rows):
    return pd.DataFrame(rows, columns=["k", "v"])


def sorted_records(pdf):
    if len(pdf) == 0:
        return []
    return sorted(map(tuple, pdf.to_numpy().tolist()))


@pytest.fixture
def flow(spark):
    df = Dataflow(spark, shared=True)
    df.input("a", ["k", "v"])
    df.input("b", ["k", "w"])
    return df


class TestInputsAndStateless:
    def test_input_flows_to_sink(self, flow):
        q = flow.install("q", lambda ctx: ctx.stream("a"))
        flow.feed("a", kv([(1, 10), (2, 20)]))
        flow.step()
        assert sorted_records(q.result()) == [(1, 10), (2, 20)]

    def test_retraction_cancels(self, flow):
        q = flow.install("q", lambda ctx: ctx.stream("a"))
        flow.feed("a", kv([(1, 10), (2, 20)]))
        flow.step()
        flow.feed("a", kv([(1, 10)]), diff=-1)
        flow.step()
        assert sorted_records(q.result()) == [(2, 20)]

    def test_filter_and_map(self, flow):
        def build(ctx):
            return (
                ctx.stream("a")
                .filter(F.col("v") > 10)
                .map(lambda df: df.withColumn("v", F.col("v") * 2), ["k", "v"])
            )

        q = flow.install("q", build)
        flow.feed("a", kv([(1, 10), (2, 20)]))
        flow.step()
        assert sorted_records(q.result()) == [(2, 40)]

    def test_concat_and_negate_except(self, flow):
        def build(ctx):
            a = ctx.stream("a").select("k")
            b = ctx.stream("b").select("k")
            return a.concat(b.negate())

        q = flow.install("q", build)
        flow.feed("a", kv([(1, 0), (2, 0)]))
        flow.feed("b", pd.DataFrame([(2, 0)], columns=["k", "w"]))
        flow.step()
        assert sorted_records(q.result()) == [(1,)]

    def test_multiplicity_expansion(self, flow):
        q = flow.install("q", lambda ctx: ctx.stream("a").select("k"))
        flow.feed("a", kv([(1, 10), (1, 20)]))
        flow.step()
        assert sorted_records(q.result()) == [(1,), (1,)]


class TestJoin:
    def build_join(self, ctx):
        a = ctx.arranged("a", ["k"])
        b = ctx.arranged("b", ["k"]).rename({"k": "k2"})
        return ctx.join(a, b, (["k"], ["k2"]), select=["k", "v", "w"])

    def test_basic_join(self, flow):
        q = flow.install("q", self.build_join)
        flow.feed("a", kv([(1, 10), (2, 20)]))
        flow.feed("b", pd.DataFrame([(1, 100), (3, 300)], columns=["k", "w"]))
        flow.step()
        assert sorted_records(q.result()) == [(1, 10, 100)]

    def test_join_incremental_matches_batch(self, flow, spark):
        q = flow.install("q", self.build_join)
        flow.feed("a", kv([(1, 10)]))
        flow.step()
        flow.feed("b", pd.DataFrame([(1, 100)], columns=["k", "w"]))
        flow.step()
        flow.feed("a", kv([(1, 11)]))
        flow.feed("b", pd.DataFrame([(1, 101)], columns=["k", "w"]))
        flow.step()
        flow.feed("a", kv([(1, 10)]), diff=-1)
        flow.step()
        # batch equivalent
        assert sorted_records(q.result()) == [
            (1, 11, 100),
            (1, 11, 101),
        ]

    def test_join_multiplicities_multiply(self, flow):
        q = flow.install("q", self.build_join)
        flow.feed("a", kv([(1, 10), (1, 10)]))
        flow.feed("b", pd.DataFrame([(1, 100), (1, 100)], columns=["k", "w"]))
        flow.step()
        assert len(q.result()) == 4

    def test_key_renaming_required_on_collision(self, flow):
        def bad(ctx):
            a = ctx.arranged("a", ["k"])
            b = ctx.arranged("a", ["k"])
            return ctx.join(a, b, (["k"], ["k"]))

        with pytest.raises(ValueError, match="share column names"):
            flow.install("bad", bad)


class TestReduce:
    def test_sql_agg_count_sum(self, flow):
        def build(ctx):
            return ctx.reduce(
                ctx.stream("a"),
                ["k"],
                SqlAgg([w_count().alias("n"), w_sum("v").alias("s")], ["n", "s"]),
            )

        q = flow.install("q", build)
        flow.feed("a", kv([(1, 10), (1, 20), (2, 5)]))
        flow.step()
        assert sorted_records(q.result()) == [(1, 2, 30.0), (2, 1, 5.0)]
        flow.feed("a", kv([(1, 10)]), diff=-1)
        flow.step()
        assert sorted_records(q.result()) == [(1, 1, 20.0), (2, 1, 5.0)]

    def test_group_disappears_when_empty(self, flow):
        def build(ctx):
            return ctx.reduce(ctx.stream("a"), ["k"], SqlAgg([w_count().alias("n")], ["n"]))

        q = flow.install("q", build)
        flow.feed("a", kv([(1, 10)]))
        flow.step()
        flow.feed("a", kv([(1, 10)]), diff=-1)
        flow.step()
        assert len(q.result()) == 0

    def test_global_reduce(self, flow):
        def build(ctx):
            return ctx.reduce(ctx.stream("a"), [], SqlAgg([w_sum("v").alias("s")], ["s"]))

        q = flow.install("q", build)
        flow.feed("a", kv([(1, 10), (2, 20)]))
        flow.step()
        assert sorted_records(q.result()) == [(30.0,)]
        flow.feed("a", kv([(3, 5)]))
        flow.step()
        assert sorted_records(q.result()) == [(35.0,)]

    def test_pandas_agg_topk(self, flow):
        def top2(pdf):
            expanded = pdf.loc[pdf.index.repeat(pdf["__mult"])]
            return expanded.nlargest(2, "v")[["k", "v"]].rename(
                columns={"k": "kk", "v": "vv"}
            )

        def build(ctx):
            return ctx.reduce(
                ctx.stream("a"), [], PandasAgg(top2, "kk long, vv long", ["kk", "vv"])
            )

        q = flow.install("q", build)
        flow.feed("a", kv([(1, 10), (2, 30), (3, 20)]))
        flow.step()
        assert sorted_records(q.result()) == [(2, 30), (3, 20)]
        flow.feed("a", kv([(4, 99)]))
        flow.step()
        assert sorted_records(q.result()) == [(2, 30), (4, 99)]

    def test_reduce_output_is_joinable_reader(self, flow):
        """§5.3.2: a downstream join consumes the group's output arrangement."""

        def build(ctx):
            counts = ctx.reduce(
                ctx.stream("a"), ["k"], SqlAgg([w_count().alias("n")], ["n"])
            )
            b = ctx.arranged("b", ["k"]).rename({"k": "k2"})
            return ctx.join(counts, b, (["k"], ["k2"]), select=["k", "n", "w"])

        q = flow.install("q", build)
        flow.feed("a", kv([(1, 10), (1, 20)]))
        flow.feed("b", pd.DataFrame([(1, 100)], columns=["k", "w"]))
        flow.step()
        assert sorted_records(q.result()) == [(1, 2, 100)]


class TestSemiAntiJoin:
    def test_semi_join(self, flow):
        def build(ctx):
            return ctx.semi_join(
                ctx.arranged("a", ["k"]), ctx.stream("b"), (["k"], ["k"])
            )

        q = flow.install("q", build)
        flow.feed("a", kv([(1, 10), (2, 20)]))
        flow.feed("b", pd.DataFrame([(1, 0), (1, 1)], columns=["k", "w"]))
        flow.step()
        assert sorted_records(q.result()) == [(1, 10)]  # not duplicated

    def test_anti_join(self, flow):
        def build(ctx):
            return ctx.anti_join(
                ctx.arranged("a", ["k"]), ctx.stream("b"), (["k"], ["k"])
            )

        q = flow.install("q", build)
        flow.feed("a", kv([(1, 10), (2, 20)]))
        flow.feed("b", pd.DataFrame([(1, 0)], columns=["k", "w"]))
        flow.step()
        assert sorted_records(q.result()) == [(2, 20)]
        flow.feed("b", pd.DataFrame([(1, 0)], columns=["k", "w"]), diff=-1)
        flow.step()
        assert sorted_records(q.result()) == [(1, 10), (2, 20)]


class TestInstallImport:
    def test_late_query_sees_history(self, flow):
        """§4.3 import: a new query immediately reflects all prior events."""
        flow.install("early", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
        flow.feed("a", kv([(1, 10), (2, 20)]))
        flow.step()
        late = flow.install("late", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
        assert sorted_records(late.result()) == [(1, 10), (2, 20)]

    def test_windowed_stream_does_not_see_history(self, flow):
        flow.install("early", lambda ctx: ctx.stream("a"))
        flow.feed("a", kv([(1, 10)]))
        flow.step()
        late = flow.install("late", lambda ctx: ctx.stream("a"))
        assert len(late.result()) == 0
        flow.feed("a", kv([(2, 20)]))
        flow.step()
        assert sorted_records(late.result()) == [(2, 20)]

    def test_late_join_over_shared_arrangements(self, flow):
        flow.install("early", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
        flow.feed("a", kv([(1, 10)]))
        flow.feed("b", pd.DataFrame([(1, 100)], columns=["k", "w"]))
        flow.step()
        late = flow.install("late", TestJoin().build_join)
        assert sorted_records(late.result()) == [(1, 10, 100)]
        flow.feed("a", kv([(2, 2)]))
        flow.feed("b", pd.DataFrame([(2, 200)], columns=["k", "w"]))
        flow.step()
        assert sorted_records(late.result()) == [(1, 10, 100), (2, 2, 200)]

    def test_shared_arrangement_reused(self, flow):
        flow.install("q1", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
        n1 = flow.store.arrangement_count()
        flow.install("q2", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
        assert flow.store.arrangement_count() == n1  # no new index built

    def test_unshared_builds_duplicates(self, spark):
        df = Dataflow(spark, shared=False)
        df.input("a", ["k", "v"])
        df.install("q1", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
        df.install("q2", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
        assert df.store.arrangement_count() == 2


class TestRetire:
    def test_retire_releases_private_state(self, spark):
        df = Dataflow(spark, shared=False)
        df.input("a", ["k", "v"])
        df.install("q", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
        df.feed("a", kv([(1, 10)]))
        df.step()
        assert df.memory_bytes() > 0
        df.retire("q")
        assert df.memory_bytes() == 0

    def test_shared_state_survives_retire(self, flow):
        flow.install("q1", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
        flow.install("q2", lambda ctx: ctx.arranged("a", ["k"]).as_stream())
        flow.feed("a", kv([(1, 10)]))
        flow.step()
        flow.retire("q1")
        assert flow.memory_bytes() > 0
        flow.feed("a", kv([(2, 20)]))
        flow.step()
        assert sorted_records(flow.queries["q2"].result()) == [(1, 10), (2, 20)]


class TestSharedUnsharedEquivalence:
    def _run(self, spark, shared):
        df = Dataflow(spark, shared=shared)
        df.input("a", ["k", "v"])
        df.input("b", ["k", "w"])
        q1 = df.install("q1", TestJoin().build_join)

        def q2_build(ctx):
            return ctx.reduce(
                ctx.arranged("a", ["k"]), ["k"], SqlAgg([w_sum("v").alias("s")], ["s"])
            )

        df.feed("a", kv([(1, 10), (2, 20)]))
        df.feed("b", pd.DataFrame([(1, 100)], columns=["k", "w"]))
        df.step()
        q2 = df.install("q2", q2_build)
        df.feed("a", kv([(1, 30)]))
        df.feed("b", pd.DataFrame([(2, 200)], columns=["k", "w"]))
        df.step()
        df.feed("a", kv([(2, 20)]), diff=-1)
        df.step()
        return sorted_records(q1.result()), sorted_records(q2.result())

    def test_results_identical(self, spark):
        assert self._run(spark, True) == self._run(spark, False)
