"""Benchmark: §4 infrastructure experiment (configs ii/iii/iv)."""
from repro.experiments.tables import infra_table


def test_infra_sensitivity(spark, once):
    t = once(infra_table, spark, tier="bench")
    t = t.set_index("config")
    assert t.loc["iv (40Gbps, SSD)", "delta_vs_ii_pct"] < t.loc["iii (40Gbps, HDD)", "delta_vs_ii_pct"] < 0
