"""Fig. 1 — streaming TPC-H: install latency, update latency, memory;
shared arrangements vs the unshared baseline."""
from repro.experiments import save_table
from repro.experiments.fig1_tpch_streaming import run


def test_fig1_tpch_streaming(benchmark, spark):
    df = benchmark.pedantic(
        lambda: run(spark, sf=0.005, n_rounds=5, target_live=3),
        rounds=1,
        iterations=1,
    )
    save_table("fig1_tpch_streaming", df)
    shared = df[df["mode"] == "shared"].iloc[0]
    unshared = df[df["mode"] == "not shared"].iloc[0]
    # Fig. 1a: installs are much cheaper with sharing (orders of magnitude
    # in the paper; the shape — a large multiple — must hold here).
    assert shared["install_p50_s"] < unshared["install_p50_s"]
    # Fig. 1c: sharing reduces the arrangement memory footprint.
    assert shared["mem_max_mb"] < unshared["mem_max_mb"]
