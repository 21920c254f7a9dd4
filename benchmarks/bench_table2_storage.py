"""Benchmarks for Table 2: model construction and storage accounting."""
import pytest

from repro.ais.datasets import REGION_OF, to_spark
from repro.core.habit import Habit
from repro.core.storage import storage_bytes
from repro.eval.tables import table2


@pytest.mark.benchmark(group="table2-fit")
@pytest.mark.parametrize("res", [8, 9, 10])
def test_bench_habit_fit(benchmark, spark, blab, res):
    """Distributed HABIT graph construction on KIEL training trips."""
    train, _ = blab.train_test("KIEL")
    region = REGION_OF["KIEL"]

    def fit():
        return Habit(res=res).fit(
            to_spark(spark, train), lat0=region.lat0, lon0=region.lon0
        )

    h = benchmark.pedantic(fit, rounds=3, iterations=1, warmup_rounds=1)
    assert h.model.n_nodes > 0


@pytest.mark.benchmark(group="table2-storage")
def test_bench_storage_accounting(benchmark, blab):
    """Parquet serialization cost of the fitted r=9 KIEL model."""
    model = blab.habit("KIEL", 9).model
    size = benchmark(storage_bytes, model)
    assert size > 0


@pytest.mark.benchmark(group="table2")
def test_bench_table2_full(benchmark, blab):
    """Full Table 2 (all HABIT r + GTI rd configs; fits cached after round 1)."""
    result = benchmark.pedantic(table2, args=(blab,), rounds=2, iterations=1, warmup_rounds=1)
    assert len(result) == 8
