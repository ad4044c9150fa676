"""Tests for the Catalyst-native pivot-blocking dataflow.

Exactness is checked two independent ways: against the numpy engine's
brute-force counts, and against a DuckDB SQL oracle that computes
joinability with ``list_distance`` over the raw vectors.
"""
import numpy as np
import pandas as pd
import pytest

from repro.baselines import exact_scan
from repro.core.pivots import select_pivots
from repro.lake.generator import lake_to_spark
from repro.oracle import assert_equivalent
from repro.spark.blocking import blocked_joinability, build_blocked_repo

TAU = 0.45


@pytest.fixture(scope="module")
def setup(spark, tiny_lake):
    X, _ = tiny_lake.all_vectors()
    pivots = select_pivots(X, 3, seed=0)
    repo = lake_to_spark(spark, tiny_lake)
    blocked = build_blocked_repo(repo, pivots, block_dims=2, m_block=3)
    blocked.cache().count()
    return pivots, repo, blocked


def test_blocked_repo_schema(setup):
    _, repo, blocked = setup
    assert set(blocked.columns) == set(repo.columns) | {"xp", "cell"}
    row = blocked.first()
    assert len(row["xp"]) == 3
    assert row["cell"].count("_") == 1  # block_dims=2 → "i_j"


def test_cell_key_matches_numpy(setup, tiny_lake):
    """Blocking keys computed in the executor match driver-side math."""
    pivots, _, blocked = setup
    from repro.core.grid import DOMAIN
    from repro.core.pivots import pivot_map

    pdf = blocked.select("col_id", "vec_id", "vec", "cell").toPandas()
    X = np.vstack(pdf["vec"].to_numpy())
    Xp = pivot_map(X, pivots)
    side = DOMAIN / (1 << 3)
    coords = np.clip(np.floor(Xp[:, :2] / side).astype(int), 0, 7)
    want = ["_".join(map(str, c)) for c in coords]
    assert list(pdf["cell"]) == want


def test_blocked_joinability_equals_numpy(spark, setup, tiny_lake):
    pivots, _, blocked = setup
    got = blocked_joinability(
        spark, blocked, tiny_lake.query_vectors, pivots, TAU, block_dims=2, m_block=3
    )
    rows = {r["col_id"]: r["n_matched"] for r in got.collect()}
    X, ids = tiny_lake.all_vectors()
    uniq = sorted(set(ids))
    col_idx = np.array([uniq.index(c) for c in ids])
    counts = exact_scan.match_counts(
        tiny_lake.query_vectors, X, col_idx, len(uniq), TAU
    )
    for i, cid in enumerate(uniq):
        assert rows.get(cid, 0) == counts[i], cid


def test_blocked_joinability_matches_duckdb_oracle(spark, setup, tiny_lake):
    """End-to-end vector-similarity joinability vs DuckDB list_distance."""
    pivots, repo, blocked = setup
    got = blocked_joinability(
        spark, blocked, tiny_lake.query_vectors, pivots, TAU, block_dims=2, m_block=3
    )
    lake_pdf = repo.select("col_id", "vec_id", "vec").toPandas()
    q_pdf = pd.DataFrame(
        {
            "q_id": range(len(tiny_lake.query)),
            "qvec": [v.tolist() for v in tiny_lake.query_vectors],
        }
    )
    n_q = len(tiny_lake.query)
    assert_equivalent(
        got,
        f"""
        SELECT l.col_id,
               count(DISTINCT q.q_id) AS n_matched,
               count(DISTINCT q.q_id) / CAST({n_q} AS DOUBLE) AS joinability
        FROM lake l JOIN q ON list_distance(
            CAST(l.vec AS DOUBLE[]), CAST(q.qvec AS DOUBLE[])) <= {TAU}
        GROUP BY l.col_id
        """,
        lake=lake_pdf,
        q=q_pdf,
    )


@pytest.mark.parametrize("m_block", [2, 4])
def test_blocking_granularity_does_not_change_answer(spark, setup, tiny_lake, m_block):
    pivots, repo, _ = setup
    blocked = build_blocked_repo(repo, pivots, block_dims=2, m_block=m_block)
    got = blocked_joinability(
        spark, blocked, tiny_lake.query_vectors, pivots, TAU,
        block_dims=2, m_block=m_block,
    )
    base = {r["col_id"]: r["n_matched"] for r in got.collect()}
    X, ids = tiny_lake.all_vectors()
    uniq = sorted(set(ids))
    col_idx = np.array([uniq.index(c) for c in ids])
    counts = exact_scan.match_counts(
        tiny_lake.query_vectors, X, col_idx, len(uniq), TAU
    )
    for i, cid in enumerate(uniq):
        assert base.get(cid, 0) == counts[i]
