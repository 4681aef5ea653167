"""Benchmark-local configuration.

Evaluation-scale experiments are single-shot (pytest-benchmark's
auto-calibration would re-run multi-minute Spark pipelines dozens of
times); the ``once`` helper standardizes that.
"""
import pytest


@pytest.fixture
def once(benchmark):
    """Run the measured callable exactly once and return its result."""

    def _run(fn, *args, **kwargs):
        return benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)

    return _run
