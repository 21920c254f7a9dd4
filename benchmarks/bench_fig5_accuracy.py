"""Benchmark for the Figure 5 shape check: full accuracy evaluation pass
(imputation + densification + DTW) for HABIT over the KIEL gap set."""
import pytest

from repro.eval.metrics import evaluate_gaps


@pytest.mark.benchmark(group="fig5")
def test_bench_accuracy_eval_habit(benchmark, blab):
    h = blab.habit("KIEL", 9, t=100.0)
    gaps = blab.gaps("KIEL")
    per_gap = benchmark.pedantic(
        evaluate_gaps, args=(h.impute, gaps), rounds=2, iterations=1, warmup_rounds=1
    )
    assert len(per_gap) == len(gaps)
