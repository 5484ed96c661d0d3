"""Oracle correctness for all 22 TPC-H query dataflows.

Each query is installed before any data arrives, then the TPC-H-lite tables
are fed in two rounds; the second round also *retracts* a sample of lineitem
and orders rows, exercising negative diffs through every operator.  The
accumulated incremental output must equal DuckDB evaluating the reference SQL
over the surviving input — catching wrong deltas, broken retraction, and
wrong join/aggregation logic, not just "it ran".
"""
import numpy as np
import pandas as pd
import pytest

from repro.core.dataflow import Dataflow
from repro.oracle import assert_pandas_equivalent
from repro.tpch.queries import QUERIES
from repro.tpch.schema import declare_inputs, generate

SF = 0.003


@pytest.fixture(scope="module")
def tpch_data():
    tables = generate(sf=SF, seed=42)
    rng = np.random.default_rng(7)
    splits, nets = {}, {}
    for name, pdf in tables.items():
        cut = int(len(pdf) * 0.6)
        r1, r2 = pdf.iloc[:cut], pdf.iloc[cut:]
        if name in ("lineitem", "orders"):
            doomed = r1.sample(frac=0.05, random_state=rng.integers(0, 2**31))
            nets[name] = pd.concat([r1.drop(doomed.index), r2], ignore_index=True)
            splits[name] = (r1, r2, doomed)
        else:
            nets[name] = pdf.reset_index(drop=True)
            splits[name] = (r1, r2, None)
    return splits, nets


def run_query(spark, qname, splits, shared=True):
    flow = Dataflow(spark, shared=shared)
    declare_inputs(flow)
    q = flow.install(qname, QUERIES[qname].build)
    for name, (r1, _, _) in splits.items():
        flow.feed(name, r1)
    flow.step()
    for name, (_, r2, doomed) in splits.items():
        flow.feed(name, r2)
        if doomed is not None and len(doomed):
            flow.feed(name, doomed, diff=-1)
    flow.step()
    return q.result()


@pytest.mark.parametrize("qname", sorted(QUERIES))
def test_query_matches_oracle(spark, qname, tpch_data):
    splits, nets = tpch_data
    result = run_query(spark, qname, splits)
    assert_pandas_equivalent(result, QUERIES[qname].sql, **nets)


@pytest.mark.parametrize("qname", ["q03", "q05", "q11"])
def test_shared_equals_unshared(spark, qname, tpch_data):
    """Sharing is an optimization, never a semantics change."""
    splits, _ = tpch_data
    a = run_query(spark, qname, splits, shared=True)
    b = run_query(spark, qname, splits, shared=False)
    cols = sorted(a.columns)
    pd.testing.assert_frame_equal(
        a[cols].sort_values(cols).reset_index(drop=True),
        b[cols].sort_values(cols).reset_index(drop=True),
        check_dtype=False,
    )


def test_exactly_five_queries_skip_lineitem():
    """The paper's Fig. 1a partition: Q2, Q11, Q13, Q16, Q22 are unwindowed."""
    no_li = {n for n, q in QUERIES.items() if not q.uses_lineitem}
    assert no_li == {"q02", "q11", "q13", "q16", "q22"}
