"""Equi-join joinability baseline (§VI-A, Zhu et al. [34] semantics).

A query record matches a target record iff the raw string values are
exactly equal; column joinability is the fraction of query records with
at least one equal value in the target column — a pure Catalyst
pipeline (join + groupBy), oracle-checked against DuckDB in tests.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

__all__ = ["query_df", "equi_joinability"]


def query_df(spark: SparkSession, query: list[str]) -> DataFrame:
    """Query column as a DataFrame (q_id, q_value)."""
    return spark.createDataFrame(
        pd.DataFrame({"q_id": range(len(query)), "q_value": query})
    )


def equi_joinability(
    spark: SparkSession, query: list[str], lake_df: DataFrame
) -> DataFrame:
    """(col_id, n_matched, joinability) per lake column under equi-join.

    ``lake_df`` columns: col_id, vec_id, value. Columns with zero
    matches are absent from the output (their joinability is 0).
    """
    q = query_df(spark, query)
    n_q = len(query)
    return (
        lake_df.join(q, lake_df["value"] == q["q_value"])
        .groupBy("col_id")
        .agg(F.countDistinct("q_id").alias("n_matched"))
        .withColumn("joinability", F.col("n_matched") / F.lit(n_q))
    )
