"""Tabular crowdsourcing data model (paper §3, Definitions 1–2).

A crowdsourced table has ``N`` entity rows and ``M`` typed columns; every
cell ``c_ij`` is a task. We carry three relations through the pipeline,
each with a fixed canonical schema so the Spark and numpy engines, the
baselines, and the DuckDB oracle all agree on shape:

* **answers** ``(worker: long, row: long, col: long, value: double)`` —
  one tuple per collected answer ``a^u_ij``. Categorical answers are label
  *codes* ``0..|L_j|-1`` stored as doubles (the label strings of the real
  datasets carry no information the algorithms use).
* **truth** ``(row: long, col: long, truth: double)`` — ground truth or an
  estimate ``T̂_ij``, one tuple per cell.
* **cells** — implicit: the cross product ``rows × columns``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import types as T

CATEGORICAL = "cat"
CONTINUOUS = "cont"

ANSWER_FIELDS = ["worker", "row", "col", "value"]
TRUTH_FIELDS = ["row", "col", "truth"]

ANSWER_SPARK_SCHEMA = T.StructType(
    [
        T.StructField("worker", T.LongType(), False),
        T.StructField("row", T.LongType(), False),
        T.StructField("col", T.LongType(), False),
        T.StructField("value", T.DoubleType(), False),
    ]
)

TRUTH_SPARK_SCHEMA = T.StructType(
    [
        T.StructField("row", T.LongType(), False),
        T.StructField("col", T.LongType(), False),
        T.StructField("truth", T.DoubleType(), False),
    ]
)


@dataclass(frozen=True)
class ColumnSpec:
    """One attribute of the crowdsourced table.

    ``n_labels`` is required for categorical columns (the label set is
    ``0..n_labels-1``); ``domain`` bounds continuous columns and is used by
    generators and by the z-score normalisation in some baselines.
    """

    name: str
    kind: str  # CATEGORICAL or CONTINUOUS
    n_labels: int | None = None
    domain: tuple[float, float] | None = None
    corr_group: str | None = None  # columns sharing a group get correlated errors

    def __post_init__(self) -> None:
        if self.kind not in (CATEGORICAL, CONTINUOUS):
            raise ValueError(f"unknown column kind {self.kind!r}")
        if self.kind == CATEGORICAL and (self.n_labels is None or self.n_labels < 2):
            raise ValueError(f"categorical column {self.name!r} needs n_labels >= 2")
        if self.kind == CONTINUOUS and self.domain is None:
            object.__setattr__(self, "domain", (0.0, 1000.0))

    @property
    def is_categorical(self) -> bool:
        return self.kind == CATEGORICAL


@dataclass(frozen=True)
class TableSchema:
    """Schema of the crowdsourced table: ordered typed columns."""

    columns: tuple[ColumnSpec, ...]
    name: str = "table"

    def __post_init__(self) -> None:
        if not self.columns:
            raise ValueError("schema needs at least one column")
        names = [c.name for c in self.columns]
        if len(set(names)) != len(names):
            raise ValueError(f"duplicate column names in {names}")

    @property
    def n_cols(self) -> int:
        return len(self.columns)

    @property
    def categorical_idx(self) -> list[int]:
        return [j for j, c in enumerate(self.columns) if c.is_categorical]

    @property
    def continuous_idx(self) -> list[int]:
        return [j for j, c in enumerate(self.columns) if not c.is_categorical]

    def column(self, j: int) -> ColumnSpec:
        return self.columns[j]

    def restrict(self, kind: str) -> "TableSchema":
        """Schema over only the columns of ``kind`` (original indices are NOT
        preserved — use :func:`restrict_answers` which re-filters relations
        by original column index instead, keeping indices stable)."""
        cols = tuple(c for c in self.columns if c.kind == kind)
        return TableSchema(columns=cols, name=f"{self.name}:{kind}")


def restrict_answers(
    answers: pd.DataFrame, schema: TableSchema, kind: str
) -> pd.DataFrame:
    """Answers for only the columns of ``kind``; column indices unchanged."""
    keep = {j for j, c in enumerate(schema.columns) if c.kind == kind}
    return answers[answers["col"].isin(keep)].reset_index(drop=True)


@dataclass
class CrowdDataset:
    """A generated dataset: schema + hidden ground truth + collected answers.

    ``worker_phi`` is the *hidden* per-worker inherent variance used by the
    generator (answer simulator) — evaluation code may compare estimated
    worker quality against it, truth-inference code must not read it.
    """

    schema: TableSchema
    n_rows: int
    truth: pd.DataFrame  # TRUTH_FIELDS
    answers: pd.DataFrame  # ANSWER_FIELDS
    worker_phi: pd.Series = field(repr=False, default=None)  # index: worker id
    row_alpha: pd.Series = field(repr=False, default=None)
    col_beta: pd.Series = field(repr=False, default=None)

    @property
    def n_cells(self) -> int:
        return self.n_rows * self.schema.n_cols

    @property
    def n_workers(self) -> int:
        return int(self.answers["worker"].nunique())

    @property
    def answers_per_task(self) -> float:
        return len(self.answers) / self.n_cells

    def to_spark(self, spark):
        """(answers_df, truth_df) as Spark DataFrames with canonical schemas."""
        a = spark.createDataFrame(
            self.answers[ANSWER_FIELDS].astype(
                {"worker": "int64", "row": "int64", "col": "int64", "value": "float64"}
            ),
            schema=ANSWER_SPARK_SCHEMA,
        )
        t = spark.createDataFrame(
            self.truth[TRUTH_FIELDS].astype(
                {"row": "int64", "col": "int64", "truth": "float64"}
            ),
            schema=TRUTH_SPARK_SCHEMA,
        )
        return a, t
