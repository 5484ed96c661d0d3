"""Graph workloads: interactive queries (§6.1.2, Fig. 5/6) and batch
algorithms (§6.3.3, Fig. 11/14/15/16), plus single-threaded baselines."""
