"""Benchmark: Table V — enrichment + model fit (fast configuration)."""
import pytest

from repro.experiments.table5 import run_table5
from repro.ml.datasets import airbnb_lite
from repro.ml.enrich import enrich, record_pairs


@pytest.fixture(scope="module")
def air():
    return airbnb_lite(n_listings=150, n_areas=25, rows_per_sales_table=100, seed=3)


@pytest.mark.benchmark(group="table5")
def test_bench_pexeso_enrichment(benchmark, spark, air):
    def run():
        pairs = record_pairs(spark, air, "pexeso", tau=0.5)
        return enrich(spark, air, pairs)

    widened, new_cols, rate = benchmark.pedantic(run, rounds=2, iterations=1)
    assert rate > 0


@pytest.mark.benchmark(group="table5")
def test_bench_table5_fast(benchmark, spark):
    """End-to-end Table V at reduced scale (all methods, 2 folds)."""
    out = benchmark.pedantic(
        lambda: run_table5(spark, fast=True), rounds=1, iterations=1
    )
    assert set(out) == {"airbnb-lite", "company-lite"}
