"""Benchmark: Table III — lake generation + stats (offline component)."""
import pytest

from repro.experiments.table3 import dataset_stats
from repro.lake.generator import make_lake


@pytest.mark.benchmark(group="table3")
def test_bench_lake_generation(benchmark):
    """Offline pipeline cost: generate + embed a small lake."""
    out = benchmark.pedantic(
        lambda: make_lake(
            name="bench", universe="person", model="glove", dim=50,
            n_query=12, n_columns=80, col_size=16, seed=1,
        ),
        rounds=3,
        iterations=1,
    )
    assert len(out.columns) == 80


@pytest.mark.benchmark(group="table3")
def test_bench_dataset_stats(benchmark):
    """Stats over the cached experiment lakes (Table III rows)."""
    rows = benchmark(dataset_stats)
    assert len(rows) == 3
