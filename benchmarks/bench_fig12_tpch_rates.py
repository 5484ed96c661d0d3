"""Fig. 12 — streaming update rates (lineitem tuples/s) for all 22 queries."""
from repro.experiments import save_table
from repro.experiments.fig12_13_tpch import run_rates


def test_fig12_update_rates(benchmark, spark):
    df = benchmark.pedantic(
        lambda: run_rates(spark, sf=0.005, batch_rows=1000, n_batches=2),
        rounds=1,
        iterations=1,
    )
    save_table("fig12_tpch_rates", df)
    assert len(df) == 22
    assert (df["tuples_per_s"] > 0).all()
    # the paper's slow tail: the q21 multi-self-join lags simple scans by an
    # order of magnitude (Fig. 12: q06 33.1M vs q21 1.97M tuples/s at w=1)
    rates = df.set_index("query")["tuples_per_s"]
    assert rates["q06"] > 2 * rates["q21"]
