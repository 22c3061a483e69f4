"""Benchmark fixtures: reuse the session Spark fixture from the root
conftest; keep every benchmark single-round (the measured work is
seconds-long Spark jobs, not microseconds)."""
import pytest


@pytest.fixture
def once(benchmark):
    """Run the benched callable exactly once (Spark jobs are slow and
    deterministic enough; pytest-benchmark's calibration would rerun a
    multi-second pipeline dozens of times)."""

    def run(fn, *args, **kwargs):
        return benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)

    return run
