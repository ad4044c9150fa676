"""Data enrichment through discovered joinable tables (§VI-C).

For each discovery method the pipeline is the paper's: find joinable
tables for the query column, left-join the query table with them using
the method's record-level matches, aggregate the joined numeric
attributes per query record (mean), and hand the widened table to the
ML task. ``no-join`` returns the query table untouched.

Record-level matching per method:

- ``equi``    — raw string equality (Catalyst equi-join);
- ``jaccard`` — token-set Jaccard ≥ θ (explode/join/groupBy dataflow);
- ``fuzzy``   — char-3-gram Jaccard ≥ θ (same dataflow);
- ``pexeso``  — embedding distance ≤ τ via the pivot-blocked vector
  join (:mod:`repro.spark.blocking`).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.baselines.fuzzy import char_ngrams
from repro.baselines.jaccard import tokens
from repro.core.pivots import select_pivots
from repro.embedding.hashing import embed_many
from repro.lake.generator import normalize
from repro.ml.datasets import MLTask
from repro.spark.blocking import build_blocked_repo, matching_pairs

__all__ = ["record_pairs", "enrich", "METHODS"]

METHODS = ["no-join", "equi", "jaccard", "fuzzy", "pexeso"]


def _lake_df(spark: SparkSession, task: MLTask) -> DataFrame:
    rows = []
    for name, pdf in task.lake_tables.items():
        for i, v in enumerate(pdf["key"]):
            rows.append((name, i, v))
    return spark.createDataFrame(
        pd.DataFrame(rows, columns=["col_id", "vec_id", "value"])
    )


def _sim_pairs(q_df: DataFrame, s_df: DataFrame, theta: float) -> DataFrame:
    """Generic exploded-join similarity matcher on a ``grams`` column."""
    q_g = q_df.select("q_id", "q_size", F.explode("grams").alias("g"))
    s_g = s_df.select("col_id", "vec_id", "s_size", F.explode("grams").alias("g"))
    inter = (
        q_g.join(s_g, "g")
        .groupBy("col_id", "vec_id", "q_id", "q_size", "s_size")
        .agg(F.count("*").alias("i"))
    )
    return inter.where(
        F.col("i") / (F.col("q_size") + F.col("s_size") - F.col("i"))
        >= F.lit(theta)
    ).select("col_id", "vec_id", "q_id")


def record_pairs(
    spark: SparkSession,
    task: MLTask,
    method: str,
    *,
    theta: float = 0.5,
    tau: float = 0.5,
    dim: int = 50,
) -> DataFrame:
    """(col_id, vec_id, q_id) matches between query records and lake rows."""
    q_pdf = pd.DataFrame(
        {
            "q_id": np.arange(len(task.query)),
            "q_value": task.query[task.key_col].astype(str),
        }
    )
    qdf = spark.createDataFrame(q_pdf)
    lake = _lake_df(spark, task)

    if method == "no-join":
        return spark.createDataFrame(
            [], schema="col_id string, vec_id long, q_id long"
        )
    if method == "equi":
        return lake.join(qdf, lake["value"] == qdf["q_value"]).select(
            "col_id", "vec_id", "q_id"
        )
    if method in ("jaccard", "fuzzy"):
        maker = tokens if method == "jaccard" else char_ngrams
        q = maker(qdf, "q_value", "grams").withColumn("q_size", F.size("grams"))
        s = maker(lake, "value", "grams").withColumn("s_size", F.size("grams"))
        return _sim_pairs(q, s, theta)
    if method == "pexeso":
        lake_pdf = lake.toPandas()
        vecs = embed_many(
            [normalize(v) for v in lake_pdf["value"]], model="glove", dim=dim
        )
        lake_pdf["vec"] = [v.tolist() for v in vecs]
        repo = spark.createDataFrame(lake_pdf)
        pivots = select_pivots(vecs, min(3, dim), seed=0)
        blocked = build_blocked_repo(repo, pivots)
        Q = embed_many(
            [normalize(v) for v in q_pdf["q_value"]], model="glove", dim=dim
        )
        return matching_pairs(spark, blocked, Q, pivots, tau).select(
            "col_id", "vec_id", "q_id"
        )
    raise ValueError(f"unknown method {method!r}")


def enrich(
    spark: SparkSession,
    task: MLTask,
    pairs: DataFrame,
) -> tuple[pd.DataFrame, list[str], float]:
    """Left-join enrichment; returns (widened table, new cols, match rate).

    Match rate is the paper's "# Match": matched lake records over all
    lake records. Numeric attributes of matched rows are averaged per
    query record and per lake table; unmatched records get 0 (the
    sparsity that hurts equi-join in Table V).
    """
    n_lake_rows = sum(len(t) for t in task.lake_tables.values())
    pairs_pdf = pairs.toPandas()
    match_rate = (
        len(pairs_pdf[["col_id", "vec_id"]].drop_duplicates()) / n_lake_rows
        if n_lake_rows
        else 0.0
    )

    out = task.query.copy()
    new_cols: list[str] = []
    for name, table in task.lake_tables.items():
        sub = pairs_pdf[pairs_pdf["col_id"] == name]
        feat_cols = task.lake_feature_cols
        agg = (
            sub.merge(
                table[feat_cols].reset_index(names="vec_id"), on="vec_id"
            )
            .groupby("q_id")[feat_cols]
            .mean()
            if len(sub)
            else pd.DataFrame(columns=feat_cols)
        )
        for fc in feat_cols:
            col = f"{name}__{fc}"
            out[col] = out.index.map(agg[fc]) if len(agg) else np.nan
            out[col] = out[col].fillna(0.0)
            new_cols.append(col)
    return out, new_cols, match_rate
