"""Tests for the experiment harnesses (reduced-scale runs).

These exercise the exact code paths behind Tables III–VII at small
scale, so the job scripts cannot rot.
"""
import numpy as np
import pytest

from repro.experiments import table3, table6, table7
from repro.experiments.common import TAU_FACTOR, lake_arrays, tau_abs, timed


# ---------- common ----------
def test_tau_abs_calibration():
    assert tau_abs(0.06) == pytest.approx(0.06 * TAU_FACTOR * 2.0)
    assert tau_abs(0.02) < tau_abs(0.08)


def test_lake_arrays_cached_and_aligned():
    Q, X, col, uniq = lake_arrays("swdc", 0)
    Q2, X2, col2, uniq2 = lake_arrays("swdc", 0)
    assert X is X2  # lru_cache
    assert len(X) == len(col)
    assert len(uniq) == col.max() + 1
    assert np.allclose(np.linalg.norm(Q, axis=1), 1.0)


def test_timed_returns_result_and_elapsed():
    out, dt = timed(sum, [1, 2, 3])
    assert out == 6 and dt >= 0


# ---------- Table III ----------
def test_table3_rows_match_presets():
    rows = table3.dataset_stats()
    assert [r["dataset"] for r in rows] == ["OPEN-lite#0", "SWDC-lite#0", "LWDC-lite#0"]
    assert rows[0]["dim"] == 300 and rows[1]["dim"] == 50
    assert all(r["n_vectors"] == r["n_columns"] * r["avg_vectors_per_col"]
               for r in rows)


def test_table3_format_includes_paper():
    txt = table3.format_table3(table3.PAPER_TABLE3)
    assert "17.2M" in txt and "GloVe" in txt


# ---------- Table VI ----------
def test_table6_small_grid():
    rows = table6.run_table6(datasets=("swdc",))[:4]
    for r in rows:
        assert r.index_s > 0 and r.search_s >= r.block_s >= 0


def test_table6_empirical_optimal():
    rows = table6.run_table6(datasets=("swdc",))
    p, m = table6.empirical_optimal(rows, "SWDC-lite")
    assert p in table6.P_GRID and m in table6.M_GRID


def test_table6_cost_model_m_in_range():
    best, costs = table6.cost_model_optimal_m(kind="swdc", m_max=6)
    assert 1 <= best <= 6
    assert min(costs.values()) == costs[best]


# ---------- Table VII ----------
@pytest.fixture(scope="module")
def eff_rows():
    return table7.run_inmemory(
        datasets=("swdc",), t_grid=[0.2, 0.6], tau_grid=[0.02, 0.06]
    )


def test_table7_exact_methods_agree(eff_rows):
    # run_inmemory itself raises if CTREE/EPT/PEXESO-H/PEXESO disagree;
    # reaching here means all 4 methods returned identical joinable sets.
    assert len(eff_rows) == 2 * 2 * 4


def test_table7_pexeso_fewest_distances(eff_rows):
    by = {}
    for r in eff_rows:
        by.setdefault(r.method, []).append(r.n_distance)
    assert np.mean(by["PEXESO"]) <= np.mean(by["EPT"])
    assert np.mean(by["PEXESO"]) <= np.mean(by["PEXESO-H"])


def test_table7_format(eff_rows):
    txt = table7.format_table7(eff_rows)
    assert "SWDC-lite" in txt and "20%" in txt


def test_table7_outofcore_small():
    rows = table7.run_outofcore(
        methods=["PEXESO"], t_grid=[0.6], tau_grid=[0.06]
    )
    assert len(rows) == 1
    assert rows[0].dataset == "LWDC-lite" and rows[0].seconds > 0
