"""Graspan-style static program analyses (§6.3.2, Fig. 9/10).

``gen``      — synthetic program graphs (assignment / dereference edges and
               null-assignment sources) standing in for linux/psql/httpd.
``analyses`` — the ``dataflow`` (null propagation) and ``points-to``
               (mutually recursive value/memory aliasing) analyses as
               CFL-reachability Datalog programs, the optimized points-to
               plan, and incremental null-source removal (Fig. 9c).
"""
