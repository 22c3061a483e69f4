"""Benchmark: paper Table 1 (dataset characterization).

Runs the full characterization pipeline (symmetry, leaves, triangles,
components, diameter, on-disk size) on representative datasets at test
tier — the heavy columns are superlinear, so the full-grid version
lives in ``jobs/table1_datasets.py``.
"""
import pytest

from repro.experiments.tables import table1


@pytest.mark.parametrize("dataset", ["youtube", "pocek", "roadnet-pa"])
def test_table1_row(spark, once, dataset):
    t = once(table1, spark, tier="test", datasets=(dataset,))
    assert len(t) == 1
    assert t.iloc[0]["vertices"] > 0
