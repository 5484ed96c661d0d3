"""Fig. 10 — Graspan points-to analysis: plain plan vs optimized (Opt) plan."""
from repro.experiments import save_table
from repro.experiments.fig9_10_graspan import run_pointsto


def test_fig10_pointsto(benchmark, spark):
    df = benchmark.pedantic(lambda: run_pointsto(spark), rounds=1, iterations=1)
    save_table("fig10_graspan_pointsto", df)
    # VA is the dominant relation the Opt plan avoids materializing.
    assert (df["va_pairs"] >= df["ma_pairs"]).all()
    # The optimized plan wins on the largest graph (Fig. 10's DD (Opt) rows).
    big = df.set_index("graph").loc["linux-lite"]
    assert big["opt_s"] < big["plain_s"]
