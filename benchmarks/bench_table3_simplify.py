"""Benchmark for Table 3: imputation + RDP sweep + turn statistics (DAN)."""
import pytest

from repro.eval.tables import table3


@pytest.mark.benchmark(group="table3")
def test_bench_table3(benchmark, blab):
    result = benchmark.pedantic(
        table3, args=(blab,), rounds=2, iterations=1, warmup_rounds=1
    )
    assert len(result) == 11  # 2 resolutions x 5 tolerances + Original
