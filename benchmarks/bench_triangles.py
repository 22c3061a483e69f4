"""Benchmark: Figure 5 data — Triangle Count runtimes.

The paper's headline TR finding: Cut (not CommCost) predicts runtime.
"""
from repro.core.correlate import metric_time_correlations
from repro.experiments.tables import runtime_table
from repro.experiments.wallclock import prepare, run_algo
from repro.graphgen.datasets import load


def test_tr_simulated_grid(spark, once):
    runs = once(runtime_table, spark, "tr", tier="bench")
    corr = metric_time_correlations(runs)
    # paper Fig. 5: Cut beats CommCost (95/97 % vs 43/34 %)
    assert abs(corr["cut"]) > abs(corr["comm_cost"])


def test_tr_wallclock_youtube(spark, once):
    edges = load(spark, "youtube", "bench").localCheckpoint(eager=True)
    ep = prepare(edges, "CRVC", 16)
    once(run_algo, ep, "tr")
