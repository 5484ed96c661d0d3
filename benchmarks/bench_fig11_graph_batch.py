"""Fig. 11/14/15/16 — batch graph computation on scaled social graphs."""
from repro.experiments import save_table
from repro.experiments.fig11_graph_batch import run


def test_fig11_graph_batch(benchmark, spark):
    df = benchmark.pedantic(lambda: run(spark), rounds=1, iterations=1)
    save_table("fig11_graph_batch", df)
    # The paper's baseline shape: purpose-written single-threaded array code
    # beats the dataflow engine, and hash maps cost the baseline dearly (the
    # penalty is clearest on the largest graph's traversals; union-find wcc
    # touches too few nodes at lite scale to show it).
    assert (df["st_reach_s"] < df["dd_reach_s"]).all()
    big = df.set_index("graph").loc["twitter-lite"]
    assert big["hm_reach_s"] > big["st_reach_s"]
    assert big["hm_sssp_s"] > big["st_sssp_s"]
    # index build is reported separately and is non-trivial
    assert (df["index_f_s"] > 0).all() and (df["index_r_s"] > 0).all()
