"""Jaccard-join joinability baseline (§VI-A).

A query record matches a target record iff the Jaccard similarity of
their lower-cased word-token sets is at least ``theta``. The whole
computation is a Catalyst dataflow: tokenize → explode → equi-join on
token → group to intersection sizes → similarity predicate → group to
per-column joinability. Oracle-checked against an equivalent DuckDB
SQL over the exploded token tables.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.baselines.equi import query_df

__all__ = ["tokens", "jaccard_joinability"]


def tokens(df: DataFrame, value_col: str, out: str) -> DataFrame:
    """Add ``out`` = array of distinct lower-cased word tokens."""
    return df.withColumn(
        out, F.array_distinct(F.split(F.lower(F.trim(F.col(value_col))), r"[\s,]+"))
    )


def jaccard_joinability(
    spark: SparkSession, query: list[str], lake_df: DataFrame, *, theta: float = 0.5
) -> DataFrame:
    """(col_id, n_matched, joinability) under token-Jaccard matching."""
    n_q = len(query)
    q = tokens(query_df(spark, query), "q_value", "q_toks").withColumn(
        "q_size", F.size("q_toks")
    )
    s = tokens(lake_df, "value", "s_toks").withColumn("s_size", F.size("s_toks"))
    q_tok = q.select("q_id", "q_size", F.explode("q_toks").alias("tok"))
    s_tok = s.select("col_id", "vec_id", "s_size", F.explode("s_toks").alias("tok"))
    inter = (
        q_tok.join(s_tok, "tok")
        .groupBy("col_id", "vec_id", "q_id", "q_size", "s_size")
        .agg(F.count("*").alias("inter"))
    )
    matched = inter.where(
        F.col("inter") / (F.col("q_size") + F.col("s_size") - F.col("inter"))
        >= F.lit(theta)
    )
    return (
        matched.groupBy("col_id")
        .agg(F.countDistinct("q_id").alias("n_matched"))
        .withColumn("joinability", F.col("n_matched") / F.lit(n_q))
    )
