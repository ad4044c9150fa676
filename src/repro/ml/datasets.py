"""Synthetic datasets for the §VI-C ML tasks (Table V).

Substitutes for the Kaggle/NYC data the paper uses (offline container):

- **Airbnb-lite** (Table Va): a listings *query table* whose
  ``neighborhood`` strings are heterogeneous renderings of latent areas,
  each area carrying a latent price level; the *lake* is five
  house-sales tables whose ``area`` strings use different formats /
  typos and whose sale-price features are correlated with the latent
  level. A method that matches more (correct) records recovers more of
  the latent level → lower RMSE; equi-join matches few records, so its
  sparse join underperforms even no-join (the paper's observation).
- **Company-lite** (Table Vb): a company query table with 13 category
  classes; the lake holds company-name columns (perturbed) paired with
  category-correlated numeric attributes.

All generation is deterministic in ``seed``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.embedding.perturb import perturb
from repro.lake import corpus

__all__ = ["MLTask", "airbnb_lite", "company_lite", "N_CATEGORIES"]

N_CATEGORIES = 13


@dataclass
class MLTask:
    """Query table + lake tables + metadata for one §VI-C task."""

    name: str
    query: pd.DataFrame          # includes key_col, base features, label
    key_col: str
    label_col: str
    base_features: list[str]
    lake_tables: dict[str, pd.DataFrame]  # name -> (key_col 'key', features)
    lake_feature_cols: list[str]
    task_type: str               # 'regression' | 'classification'


def _render(s: str, g: np.random.Generator, style: int) -> str:
    """One of several renderings of the same entity."""
    if style == 0:
        return s
    if style == 1:
        return s.upper()
    if style == 2:
        return perturb(s, g, n_edits=1)
    return perturb(s, g, n_edits=2)


#: Per-row rendering distribution for lake tables: web-table values are
#: rarely verbatim equal to the query's spelling (the paper's equi-join
#: finds only 8% / 0.13% matches), so verbatim gets 3% mass.
_STYLE_P = [0.03, 0.32, 0.33, 0.32]


def _render_row(s: str, g: np.random.Generator) -> str:
    return _render(s, g, int(g.choice(4, p=_STYLE_P)))


def airbnb_lite(
    *,
    n_listings: int = 1000,
    n_areas: int = 60,
    n_sales_tables: int = 5,
    rows_per_sales_table: int = 600,
    seed: int = 21,
) -> MLTask:
    """Airbnb-lite price-prediction task (Table Va substitute)."""
    g = np.random.default_rng(seed)
    areas = corpus.area_names(n_areas, seed=seed)
    level = g.normal(0.0, 1.0, n_areas)  # latent price level per area

    # Query table: listings. Base features are weak predictors; the
    # area level is the strong signal enrichment can recover.
    a_idx = g.integers(0, n_areas, n_listings)
    rooms = g.integers(1, 6, n_listings)
    reviews = g.integers(0, 300, n_listings)
    price = (
        150.0
        + 80.0 * level[a_idx]
        + 25.0 * rooms
        + 0.05 * reviews
        + g.normal(0, 40.0, n_listings)
    )
    query = pd.DataFrame(
        {
            "listing_id": np.arange(n_listings),
            "neighborhood": [areas[i] for i in a_idx],
            "rooms": rooms,
            "reviews": reviews,
            "price": price,
        }
    )

    # Lake: sales tables mix rows about the query's areas (heterogeneous
    # renderings) with rows about unrelated areas (distractors), so the
    # match-rate denominators behave like a real lake's.
    other_areas = corpus.area_names(2 * n_areas, seed=seed)[n_areas:]
    lake: dict[str, pd.DataFrame] = {}
    for t in range(n_sales_tables):
        rows = rows_per_sales_table
        n_rel = rows // 2
        ai = g.integers(0, n_areas, n_rel)
        keys = [_render_row(areas[i], g) for i in ai]
        keys += [other_areas[i] for i in g.integers(0, n_areas, rows - n_rel)]
        lvl = np.concatenate([level[ai], g.normal(0, 1.0, rows - n_rel)])
        lake[f"sales_{t}"] = pd.DataFrame(
            {
                "key": keys,
                "sale_price": 300.0 + 120.0 * lvl + g.normal(0, 30.0, rows),
                "sale_sqft": 900.0 + 150.0 * lvl + g.normal(0, 80.0, rows),
            }
        )
    return MLTask(
        name="airbnb-lite",
        query=query,
        key_col="neighborhood",
        label_col="price",
        base_features=["rooms", "reviews"],
        lake_tables=lake,
        lake_feature_cols=["sale_price", "sale_sqft"],
        task_type="regression",
    )


def company_lite(
    *,
    n_companies: int = 800,
    n_lake_tables: int = 6,
    rows_per_table: int = 400,
    seed: int = 31,
) -> MLTask:
    """Company-lite classification task (Table Vb substitute)."""
    g = np.random.default_rng(seed)
    names = corpus.company_names(n_companies, seed=seed)
    cat = g.integers(0, N_CATEGORIES, n_companies)

    # Base features: class-correlated but noisy (no-join is decent yet
    # improvable, like the paper's 0.825), plus pure noise.
    base1 = cat + g.normal(0, 1.6, n_companies)
    base2 = g.normal(0, 1.0, n_companies)
    query = pd.DataFrame(
        {
            "company_id": np.arange(n_companies),
            "company_name": names,
            "base1": base1,
            "base2": base2,
            "category": cat,
        }
    )

    # Lake tables: half the rows are query companies under heterogeneous
    # renderings, half are unrelated companies (distractors), with
    # category-correlated numeric attributes.
    other = corpus.company_names(2 * n_companies, seed=seed + 1)[n_companies:]
    lake: dict[str, pd.DataFrame] = {}
    for t in range(n_lake_tables):
        n_rel = rows_per_table // 2
        pick = g.choice(n_companies, size=n_rel, replace=False)
        keys = [_render_row(names[i], g) for i in pick]
        keys += [other[i] for i in g.integers(0, n_companies, rows_per_table - n_rel)]
        cats = np.concatenate(
            [cat[pick], g.integers(0, N_CATEGORIES, rows_per_table - n_rel)]
        )
        lake[f"wdc_{t}"] = pd.DataFrame(
            {
                "key": keys,
                "employees": 50.0 * cats + g.normal(0, 40.0, rows_per_table),
                "revenue": 10.0 * cats + g.normal(0, 8.0, rows_per_table),
            }
        )
    return MLTask(
        name="company-lite",
        query=query,
        key_col="company_name",
        label_col="category",
        base_features=["base1", "base2"],
        lake_tables=lake,
        lake_feature_cols=["employees", "revenue"],
        task_type="classification",
    )
