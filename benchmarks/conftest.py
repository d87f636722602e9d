"""Benchmark fixtures: all benches run one round (Spark jobs are the
measured quantity; repeated rounds would only re-measure JVM caches)."""
import pytest


@pytest.fixture
def bench_once(benchmark):
    """Run the benched callable exactly once and record its time."""

    def run(fn, *args, **kwargs):
        return benchmark.pedantic(fn, args=args, kwargs=kwargs,
                                  rounds=1, iterations=1, warmup_rounds=0)

    return run
