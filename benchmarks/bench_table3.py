"""Benchmark: paper Table 3 — partitioning metrics @ 256 partitions."""
from repro.experiments.tables import metrics_table
from repro.graphgen.datasets import DATASET_ORDER


def test_table3_metrics_256(spark, once):
    t = once(metrics_table, spark, 256, tier="bench")
    assert len(t) == len(DATASET_ORDER) * 6
    assert (t.comm_cost > 0).all()
