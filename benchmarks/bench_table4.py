"""Benchmark: Table IV — per-method retrieval cost on one query table.

The full Table IV harness (threshold sweeps × seeds) runs in
``jobs/table4_effectiveness.py``; the benchmark times one retrieval per
method at the default operating point, which is the repeated unit of
work inside that sweep.
"""
import numpy as np
import pytest

from repro.baselines.pq import PQIndex, pq_search
from repro.core.pexeso import PexesoIndex, t_abs
from repro.experiments.common import lake_arrays, tau_abs

TAU = tau_abs(0.06)
T = 0.6


@pytest.fixture(scope="module")
def swdc():
    return lake_arrays("swdc", 0)


@pytest.fixture(scope="module")
def engine(swdc):
    Q, X, col, uniq = swdc
    return PexesoIndex(X, col, len(uniq), n_pivots=5, m=4)


@pytest.mark.benchmark(group="table4")
def test_bench_pexeso_retrieval(benchmark, swdc, engine):
    Q, X, col, uniq = swdc
    res = benchmark(lambda: engine.search(Q, TAU, T))
    assert res.joinable is not None


@pytest.mark.benchmark(group="table4")
def test_bench_pq85_retrieval(benchmark, swdc):
    Q, X, col, uniq = swdc
    pq = PQIndex(X, n_subspaces=5, n_codes=32)
    out = benchmark(
        lambda: pq_search(pq, col, len(uniq), Q, TAU, t_abs(T, len(Q)), scale=1.4)
    )
    assert isinstance(out, set)
