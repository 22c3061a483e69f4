"""Benchmark: Figure 4 data — Connected Components runtimes."""
from repro.core.correlate import metric_time_correlations
from repro.experiments.tables import runtime_table
from repro.experiments.wallclock import prepare, run_algo
from repro.graphgen.datasets import load


def test_cc_simulated_grid(spark, once):
    runs = once(runtime_table, spark, "cc", tier="bench")
    corr = metric_time_correlations(runs)
    # paper Fig. 4: CommCost is the top predictor (92/94 %)
    assert corr.abs().idxmax() == "comm_cost"


def test_cc_wallclock_pocek(spark, once):
    edges = load(spark, "pocek", "bench").localCheckpoint(eager=True)
    ep = prepare(edges, "2D", 16)
    once(run_algo, ep, "cc", n_iter=10)
