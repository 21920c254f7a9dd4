"""Benchmark for Table 1: dataset generation + segmentation statistics."""
import pytest

from repro.eval.tables import table1


@pytest.mark.benchmark(group="table1")
def test_bench_table1(benchmark, blab):
    """One full Table 1 pass: synthetic builds + Spark preprocessing are
    cached after the first round; the steady-state cost is the stats scan."""
    result = benchmark.pedantic(table1, args=(blab,), rounds=3, iterations=1, warmup_rounds=1)
    assert len(result) == 3
