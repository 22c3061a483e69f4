"""Reproduction of "Cut to Fit: Tailoring the Partitioning to the
Computation" (Kolokasis & Pratikakis, PODS/GRADES-NDA 2019) in PySpark.

Package map (see DESIGN.md for the full system index):

- ``repro.graph``      — edge-frame substrate, 8 vertex-cut partitioners,
                         DataFrame Pregel/BSP engine
- ``repro.metrics``    — the paper's 5 partitioning metrics
- ``repro.algos``      — PageRank, Connected Components, Triangle Count,
                         SSSP, diameter (GraphX semantics)
- ``repro.graphgen``   — synthetic stand-ins for the paper's 9 datasets
- ``repro.simcluster`` — BSP cluster cost simulator (the paper's 5-node
                         testbed substitute)
- ``repro.core``       — PARSEL selector + metric/runtime correlation
- ``repro.experiments``— table builders for every evaluation table
"""

__version__ = "0.1.0"
