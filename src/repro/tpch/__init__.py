"""Streaming TPC-H workload (§6.1.1, Fig. 1; Appendix B, Fig. 12/13).

``schema``   — TPC-H-lite relations, primary keys, input declaration.
``queries``  — the 22 queries as incremental dataflow builders + oracle SQL.
``workload`` — progressive round-robin loader and the interactive
               deploy/retire harness that drives the Fig. 1 experiment.
"""
