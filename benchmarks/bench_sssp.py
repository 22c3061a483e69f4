"""Benchmark: Figure 6 data — SSSP runtimes.

Road networks are excluded (the paper's Spark runs OOMed there); the
wall-clock check averages over seeded random landmarks like the paper's
5-source protocol.
"""
import numpy as np

from repro.core.correlate import metric_time_correlations
from repro.experiments.tables import runtime_table
from repro.experiments.wallclock import prepare, run_algo
from repro.graph.builders import vertices
from repro.graphgen.datasets import SSSP_EXCLUDED, load


def test_sssp_simulated_grid(spark, once):
    runs = once(runtime_table, spark, "sssp", tier="bench")
    assert not (set(runs.dataset) & set(SSSP_EXCLUDED))
    corr = metric_time_correlations(runs)
    # paper Fig. 6: CommCost correlates 80/86 % (the paper reports the
    # coefficient without ranking it against other metrics)
    assert 0.70 <= corr["comm_cost"] <= 0.95


def test_sssp_wallclock_pocek(spark, once):
    edges = load(spark, "pocek", "bench").localCheckpoint(eager=True)
    ids = [r["id"] for r in vertices(edges).limit(1000).collect()]
    rng = np.random.default_rng(5)
    landmarks = [int(x) for x in rng.choice(ids, size=5, replace=False)]
    ep = prepare(edges, "1D", 16)
    once(run_algo, ep, "sssp", landmarks=landmarks)
