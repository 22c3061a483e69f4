"""Benchmark: PARSEL selector evaluation over the full bench grid."""
from repro.experiments.tables import parsel_table


def test_parsel_full_grid(spark, once):
    t = once(parsel_table, spark, tier="bench")
    assert (t.regret_pct >= 0).all()
    # the heuristic should pick the simulated winner most of the time
    assert (t.regret_pct == 0).mean() > 0.5
