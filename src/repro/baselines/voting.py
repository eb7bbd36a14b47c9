"""Quality-agnostic baselines: Majority Voting and Median (§2, §6.2).

Both come as pandas kernels (uniform baseline signature
``fn(answers, schema) -> (row, col, truth)``) and as Spark SQL
aggregations used by the harness; the Spark paths are verified against
DuckDB by the oracle tests (tests/test_voting.py).

Tie-breaking for MV is deterministic: smallest label code among the
modal labels, on both engines and in the DuckDB oracle queries.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from ..crowd.schema import TableSchema, restrict_answers


def majority_vote(answers: pd.DataFrame, schema: TableSchema) -> pd.DataFrame:
    """Per categorical cell: most frequent label, ties to smallest label."""
    cat = restrict_answers(answers, schema, "cat").copy()
    if cat.empty:
        return pd.DataFrame(columns=["row", "col", "truth"])
    cat["value"] = cat["value"].round()
    counts = (
        cat.groupby(["row", "col", "value"]).size().rename("n").reset_index()
    )
    counts = counts.sort_values(
        ["row", "col", "n", "value"], ascending=[True, True, False, True]
    )
    top = counts.drop_duplicates(["row", "col"], keep="first")
    return top.rename(columns={"value": "truth"})[["row", "col", "truth"]].reset_index(
        drop=True
    )


def median_vote(answers: pd.DataFrame, schema: TableSchema) -> pd.DataFrame:
    """Per continuous cell: median of the answers."""
    cont = restrict_answers(answers, schema, "cont")
    if cont.empty:
        return pd.DataFrame(columns=["row", "col", "truth"])
    med = cont.groupby(["row", "col"])["value"].median().rename("truth").reset_index()
    return med[["row", "col", "truth"]]


def mv_median(answers: pd.DataFrame, schema: TableSchema) -> pd.DataFrame:
    """The naive combined baseline: MV on categorical + median on continuous."""
    parts = [
        p
        for p in (majority_vote(answers, schema), median_vote(answers, schema))
        if not p.empty
    ]
    if not parts:
        return pd.DataFrame(columns=["row", "col", "truth"])
    return pd.concat(parts).sort_values(["row", "col"]).reset_index(drop=True)


# ---------------------------------------------------------------------------
# Spark SQL flavour.
# ---------------------------------------------------------------------------

def majority_vote_spark(answers: DataFrame, schema: TableSchema) -> DataFrame:
    cat = schema.categorical_idx
    counts = (
        answers.where(F.col("col").isin(cat))
        .withColumn("label", F.round("value"))
        .groupBy("row", "col", "label")
        .agg(F.count("*").alias("n"))
    )
    w = Window.partitionBy("row", "col").orderBy(F.desc("n"), F.asc("label"))
    return (
        counts.withColumn("rk", F.row_number().over(w))
        .where(F.col("rk") == 1)
        .select("row", "col", F.col("label").cast("double").alias("truth"))
    )


def median_vote_spark(answers: DataFrame, schema: TableSchema) -> DataFrame:
    cont = schema.continuous_idx
    return (
        answers.where(F.col("col").isin(cont))
        .groupBy("row", "col")
        .agg(F.median("value").alias("truth"))
    )


def mv_median_spark(answers: DataFrame, schema: TableSchema) -> DataFrame:
    return majority_vote_spark(answers, schema).unionByName(
        median_vote_spark(answers, schema)
    )
