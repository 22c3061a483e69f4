"""Benchmark: paper Table 2 — partitioning metrics @ 128 partitions,
bench tier, all nine datasets × the paper's six strategies.

First run populates the shared on-disk profile cache; the printed
table is the reproduction recorded in EXPERIMENTS.md.
"""
from repro.experiments.tables import metrics_table
from repro.graphgen.datasets import DATASET_ORDER


def test_table2_metrics_128(spark, once):
    t = once(metrics_table, spark, 128, tier="bench")
    assert len(t) == len(DATASET_ORDER) * 6
    assert (t.comm_cost > 0).all()
