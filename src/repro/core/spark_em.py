"""T-Crowd truth inference as a Spark DataFrame pipeline.

One EM iteration is a dataflow over the canonical answers DataFrame
``(worker, row, col, value)``:

1. broadcast-join the answers with three *parameter dimension tables*
   (``α`` by row, ``β``+column metadata by col, ``φ`` by worker) and the
   per-column continuous priors — explicitly ``F.broadcast`` because the
   session fixture disables auto-broadcast;
2. **E-step**: ``groupBy("col").applyInPandas`` runs the *same* per-column
   kernels as the numpy engine (`repro.core.em`), emitting one output row
   per answer, denormalised with its cell's posterior (``t_mu``, ``t_phi``,
   estimated truth, entropy) — this relation *is* the M-step's
   sufficient-statistics table;
3. **M-step**: the statistics are brought to the driver (they are
   ``O(|A|)`` — the tiny parameter vectors are optimised with the shared
   log-space gradient ascent, the MLlib "cluster statistics + driver
   optimiser" pattern).

Because both engines share the E-step kernels and the M-step optimiser,
they agree to float tolerance (the only divergence source is summation
order); tests/test_spark_em.py asserts this.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from ..crowd.schema import TableSchema
from ..crowd.stats import erf
from .em import (
    EMState,
    estep_categorical_column,
    estep_continuous_column,
    m_step,
)

_ESTEP_SCHEMA = T.StructType(
    [
        T.StructField("row", T.LongType()),
        T.StructField("col", T.LongType()),
        T.StructField("worker", T.LongType()),
        T.StructField("value", T.DoubleType()),
        T.StructField("is_cat", T.BooleanType()),
        T.StructField("n_labels", T.DoubleType()),
        T.StructField("s", T.DoubleType()),
        T.StructField("w", T.DoubleType()),
        T.StructField("t_hat", T.DoubleType()),
        T.StructField("t_mu", T.DoubleType()),
        T.StructField("t_phi", T.DoubleType()),
        T.StructField("t_entropy", T.DoubleType()),
    ]
)


def _estep_column_kernel(eps: float):
    """Kernel for ``applyInPandas``: E-step over one column's answers.

    The input group carries the joined parameter columns (ln_alpha, ln_beta,
    ln_phi, is_cat, n_labels, mu0, var0). Emits per-answer sufficient stats
    plus cell-level posterior columns (repeated per answer of the cell).
    """

    def kernel(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values(["row", "worker"], kind="stable").reset_index(drop=True)
        rows = pdf["row"].to_numpy(np.int64)
        vals = pdf["value"].to_numpy(np.float64)
        v = np.exp(
            pdf["ln_alpha"].to_numpy() + pdf["ln_beta"].to_numpy() + pdf["ln_phi"].to_numpy()
        )
        out = pdf[["row", "col", "worker", "value"]].copy()
        is_cat = bool(pdf["is_cat"].iloc[0])
        out["is_cat"] = is_cat
        out["n_labels"] = pdf["n_labels"].iloc[0]
        if is_cat:
            n_labels = int(pdf["n_labels"].iloc[0])
            posts, w, _ = estep_categorical_column(rows, vals, v, n_labels, eps)
            out["s"] = 0.0
            out["w"] = w
            t_hat = {r: p.argmax() for r, p in posts.items()}
            ent = {r: p.entropy() for r, p in posts.items()}
            out["t_hat"] = [t_hat[r] for r in rows]
            out["t_mu"] = np.nan
            out["t_phi"] = np.nan
            out["t_entropy"] = [ent[r] for r in rows]
        else:
            mu0 = float(pdf["mu0"].iloc[0])
            var0 = float(pdf["var0"].iloc[0])
            cell_rows, t_mu, t_phi, s = estep_continuous_column(rows, vals, v, mu0, var0)
            pos = np.searchsorted(cell_rows, rows)
            out["s"] = s
            out["w"] = 0.0
            out["t_hat"] = t_mu[pos]
            out["t_mu"] = t_mu[pos]
            out["t_phi"] = t_phi[pos]
            out["t_entropy"] = 0.5 * np.log(2.0 * np.pi * np.e * t_phi[pos])
        return out

    return kernel


def _param_frames(
    spark: SparkSession, state: EMState, schema: TableSchema, priors: dict
):
    alpha_df = spark.createDataFrame(
        pd.DataFrame({"row": np.arange(len(state.ln_alpha), dtype=np.int64),
                      "ln_alpha": state.ln_alpha})
    )
    beta_pdf = pd.DataFrame(
        {
            "col": np.arange(schema.n_cols, dtype=np.int64),
            "ln_beta": state.ln_beta,
            "is_cat": [c.is_categorical for c in schema.columns],
            "n_labels": [float(c.n_labels or 0) for c in schema.columns],
            "mu0": [float(priors.get(j, (0.0, 1.0))[0]) for j in range(schema.n_cols)],
            "var0": [float(priors.get(j, (0.0, 1.0))[1]) for j in range(schema.n_cols)],
        }
    )
    beta_df = spark.createDataFrame(beta_pdf)
    phi_df = spark.createDataFrame(
        pd.DataFrame({"worker": np.arange(len(state.ln_phi), dtype=np.int64),
                      "ln_phi": state.ln_phi})
    )
    return alpha_df, beta_df, phi_df


def spark_estep(
    answers: DataFrame, state: EMState, schema: TableSchema, priors: dict, eps: float
) -> DataFrame:
    """The E-step dataflow: join parameters, fan out per column."""
    spark = answers.sparkSession
    alpha_df, beta_df, phi_df = _param_frames(spark, state, schema, priors)
    joined = (
        answers.join(F.broadcast(alpha_df), "row")
        .join(F.broadcast(beta_df), "col")
        .join(F.broadcast(phi_df), "worker")
    )
    return joined.groupBy("col").applyInPandas(_estep_column_kernel(eps), _ESTEP_SCHEMA)


@dataclass
class SparkEMResult:
    truth: DataFrame  # (row, col, truth) Spark DataFrame
    cells: DataFrame  # full cell-state relation from the last E-step
    state: EMState
    worker_quality: np.ndarray
    n_iters: int
    converged: bool
    q_trace: list


def tcrowd_em_spark(
    answers: DataFrame,
    schema: TableSchema,
    *,
    eps: float = 1.0,
    max_iter: int = 40,
    tol: float = 1e-3,
    grad_iters: int = 25,
) -> SparkEMResult:
    """Full T-Crowd EM with the E-step distributed via Spark (Algorithm 1)."""
    first = answers.agg(
        F.max("row").alias("mr"), F.max("worker").alias("mw")
    ).first()
    n_rows, n_workers = int(first["mr"]) + 1, int(first["mw"]) + 1
    # Priors and the β initialisation need per-column moments — one pass.
    moments = (
        answers.groupBy("col")
        .agg(F.avg("value").alias("mu"), F.var_pop("value").alias("var"))
        .toPandas()
        .set_index("col")
    )
    priors = {
        j: (float(moments.loc[j, "mu"]), max(float(moments.loc[j, "var"]), 1e-6))
        for j in schema.continuous_idx
        if j in moments.index
    }
    state = EMState(
        ln_alpha=np.zeros(n_rows),
        ln_beta=np.array(
            [
                np.log(max(float(moments.loc[j, "var"]), 1e-6))
                if (j in moments.index and not schema.column(j).is_categorical)
                else 0.0
                for j in range(schema.n_cols)
            ]
        ),
        ln_phi=np.zeros(n_workers),
    )

    q_trace: list[float] = []
    converged = False
    it = 0
    estep_df = None
    for it in range(1, max_iter + 1):
        estep_df = spark_estep(answers, state, schema, priors, eps)
        stats_pdf = estep_df.select(
            "row", "col", "worker", "is_cat", "s", "w", "n_labels"
        ).toPandas()
        stats = {
            "row": stats_pdf["row"].to_numpy(np.int64),
            "col": stats_pdf["col"].to_numpy(np.int64),
            "worker": stats_pdf["worker"].to_numpy(np.int64),
            "is_cat": stats_pdf["is_cat"].to_numpy(bool),
            "s": stats_pdf["s"].to_numpy(np.float64),
            "w": stats_pdf["w"].to_numpy(np.float64),
            "n_labels": stats_pdf["n_labels"].to_numpy(np.float64),
        }
        new_state, q_val = m_step(stats, state, eps, grad_iters=grad_iters)
        q_trace.append(q_val)
        moved = max(
            np.abs(new_state.ln_alpha - state.ln_alpha).max(initial=0.0),
            np.abs(new_state.ln_beta - state.ln_beta).max(initial=0.0),
            np.abs(new_state.ln_phi - state.ln_phi).max(initial=0.0),
        )
        state = new_state
        if moved < tol:
            converged = True
            break

    cells = spark_estep(answers, state, schema, priors, eps)
    truth = (
        cells.select("row", "col", F.col("t_hat").alias("truth"))
        .distinct()
        .orderBy("row", "col")
    )
    quality = np.asarray(erf(eps / np.sqrt(2.0 * np.exp(state.ln_phi))), dtype=np.float64)
    return SparkEMResult(
        truth=truth,
        cells=cells,
        state=state,
        worker_quality=quality,
        n_iters=it,
        converged=converged,
        q_trace=q_trace,
    )
