"""T-Crowd truth inference (paper §4) — the numpy kernel.

Implements the unified worker-quality EM:

* worker ``u`` has one inherent variance ``φ_u``; cell difficulty factors as
  ``α_i β_j``; the per-answer variance is ``v = α_i β_j φ_u`` (§4.2);
* continuous answers: ``a ~ N(T̂, v)`` (Eq. 1); categorical accuracy
  ``q = erf(ε/√(2v))`` with the wrong-answer mass uniform over the other
  labels (Eqs. 2–3);
* E-step (Eq. 4): Gaussian posterior ``(T_μ, T_φ)`` per continuous cell with
  per-column empirical prior; label posterior per categorical cell;
* M-step (Eq. 5): gradient ascent on ``Q(α, β, φ)`` in log-parameter space,
  with per-answer gradients scatter-added to their row/column/worker.

The same per-column E-step kernels are reused verbatim by the Spark engine
(`core/spark_em.py`) inside ``applyInPandas``, so the two implementations
agree to float tolerance (tested in tests/test_spark_em.py).

Identifiability: ``α β φ`` is invariant under rescaling, so after each
M-step we renormalise ``mean(ln α) = mean(ln φ) = 0``, folding both scales
into β (DESIGN.md §5).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from ..crowd.schema import TableSchema
from ..crowd.stats import erf

_Q_CLIP = 1e-9
_LN_CLAMP = 14.0


@dataclass
class EMState:
    """Log-parameters of the model (positivity by construction)."""

    ln_alpha: np.ndarray  # (N,)
    ln_beta: np.ndarray  # (M,)
    ln_phi: np.ndarray  # (U,)

    def copy(self) -> "EMState":
        return EMState(self.ln_alpha.copy(), self.ln_beta.copy(), self.ln_phi.copy())

    @property
    def alpha(self) -> np.ndarray:
        return np.exp(self.ln_alpha)

    @property
    def beta(self) -> np.ndarray:
        return np.exp(self.ln_beta)

    @property
    def phi(self) -> np.ndarray:
        return np.exp(self.ln_phi)


@dataclass
class CatPosterior:
    """Label posterior of one categorical cell.

    ``labels``/``probs`` cover the labels that received at least one answer;
    the remaining ``n_unanswered`` labels share probability ``p0`` each.
    """

    labels: np.ndarray
    probs: np.ndarray
    n_unanswered: int
    p0: float

    def entropy(self) -> float:
        p = self.probs[self.probs > 0]
        h = -float(np.sum(p * np.log(p)))
        if self.n_unanswered > 0 and self.p0 > 0:
            h -= self.n_unanswered * self.p0 * np.log(self.p0)
        return h

    def argmax(self) -> float:
        """Most probable *answered* label (fallback documented in DESIGN §5)."""
        return float(self.labels[int(np.argmax(self.probs))])


@dataclass
class TCrowdResult:
    state: EMState
    truth: pd.DataFrame  # (row, col, truth) over answered cells
    cont_cells: pd.DataFrame  # (row, col, t_mu, t_phi)
    cat_cells: dict  # (row, col) -> CatPosterior
    worker_quality: np.ndarray  # q_u = erf(ε/√(2 φ_u))
    n_iters: int
    converged: bool
    q_trace: list = field(default_factory=list)  # Q value after each M-step
    priors: dict = field(default_factory=dict)  # col -> (mu0, var0)


# ---------------------------------------------------------------------------
# E-step kernels (shared with the Spark engine).
# ---------------------------------------------------------------------------

def estep_continuous_column(
    rows: np.ndarray, values: np.ndarray, v: np.ndarray, mu0: float, var0: float
):
    """Gaussian posterior per cell of one continuous column.

    Returns ``(cell_rows, t_mu, t_phi, s_per_answer)`` where ``s`` is the
    M-step sufficient statistic ``(a - T_μ)² + T_φ``.
    """
    cell_rows, inv = np.unique(rows, return_inverse=True)
    prec = 1.0 / v
    sum_prec = np.bincount(inv, weights=prec)
    sum_pv = np.bincount(inv, weights=prec * values)
    t_phi = 1.0 / (sum_prec + 1.0 / var0)
    t_mu = (sum_pv + mu0 / var0) * t_phi
    s = (values - t_mu[inv]) ** 2 + t_phi[inv]
    return cell_rows, t_mu, t_phi, s


def estep_categorical_column(
    rows: np.ndarray, values: np.ndarray, v: np.ndarray, n_labels: int, eps: float
):
    """Label posterior per cell of one categorical column.

    Returns ``(posteriors, w_per_answer, q_per_answer)`` where ``posteriors``
    maps row -> CatPosterior and ``w`` is the posterior probability that the
    answer equals the truth (the M-step sufficient statistic).
    """
    t = eps / np.sqrt(2.0 * v)
    q = np.clip(np.asarray(erf(t), dtype=np.float64), _Q_CLIP, 1.0 - _Q_CLIP)
    delta = np.log(q) - np.log((1.0 - q) / (n_labels - 1))

    labels = values.astype(np.int64)
    key = rows.astype(np.int64) * n_labels + labels
    pair_key, pair_inv = np.unique(key, return_inverse=True)
    pair_delta = np.bincount(pair_inv, weights=delta)
    pair_row = pair_key // n_labels
    pair_label = pair_key % n_labels

    cell_rows, cell_inv = np.unique(pair_row, return_inverse=True)
    n_cells = len(cell_rows)
    mx = np.zeros(n_cells)  # include the unanswered labels' delta of 0
    np.maximum.at(mx, cell_inv, pair_delta)
    ex = np.exp(pair_delta - mx[cell_inv])
    sum_ex = np.bincount(cell_inv, weights=ex, minlength=n_cells)
    n_answered = np.bincount(cell_inv, minlength=n_cells)
    n_un = n_labels - n_answered
    z = sum_ex + n_un * np.exp(-mx)
    pair_p = ex / z[cell_inv]
    p0 = np.exp(-mx) / z

    posteriors: dict[int, CatPosterior] = {}
    order = np.argsort(cell_inv, kind="stable")
    bounds = np.searchsorted(cell_inv[order], np.arange(n_cells + 1))
    for c in range(n_cells):
        sl = order[bounds[c] : bounds[c + 1]]
        posteriors[int(cell_rows[c])] = CatPosterior(
            labels=pair_label[sl].astype(np.float64),
            probs=pair_p[sl],
            n_unanswered=int(n_un[c]),
            p0=float(p0[c]),
        )
    w = pair_p[pair_inv]  # per-answer posterior prob that its label is truth
    return posteriors, w, q


# ---------------------------------------------------------------------------
# M-step (shared by both engines; parameters live on the driver).
# ---------------------------------------------------------------------------

def q_objective(
    stats: dict,
    state: EMState,
    eps: float,
    reg_alpha: float = 0.0,
    reg_phi: float = 0.0,
):
    """Q(α, β, φ) of Eq. 5 (parameter-dependent part) and its gradient
    w.r.t. each answer's ``ln v``; v = α_i β_j φ_u.

    ``reg_alpha`` adds a lognormal ridge ``-reg·Σ (ln α_i)²`` on the row
    difficulties: with few answers per row the per-row difficulty is
    otherwise badly under-determined (it chases the per-(worker,row)
    recognition noise), and a weak prior keeps the MAP well-posed.
    ``reg_phi`` adds the same ridge on worker log-variances: the MLE of a
    worker whose answers happen to match the estimated truth exactly drifts
    to φ → 0 (q → 1) unboundedly; the prior keeps it finite. The
    returned gradient is per-answer only; the α-penalty gradient is applied
    in :func:`m_step`."""
    r, c, u = stats["row"], stats["col"], stats["worker"]
    lnv = state.ln_alpha[r] + state.ln_beta[c] + state.ln_phi[u]
    v = np.exp(lnv)
    is_cat = stats["is_cat"]
    s, w, nl = stats["s"], stats["w"], stats["n_labels"]

    g = np.empty(len(r))
    qv = np.zeros(len(r))

    cont = ~is_cat
    if cont.any():
        vc = v[cont]
        qv[cont] = -0.5 * np.log(2.0 * np.pi * vc) - s[cont] / (2.0 * vc)
        g[cont] = -0.5 + s[cont] / (2.0 * vc)
    if is_cat.any():
        t = eps / np.sqrt(2.0 * v[is_cat])
        q = np.clip(np.asarray(erf(t), dtype=np.float64), _Q_CLIP, 1.0 - _Q_CLIP)
        wc, nlc = w[is_cat], nl[is_cat]
        qv[is_cat] = wc * np.log(q) + (1.0 - wc) * np.log((1.0 - q) / (nlc - 1))
        dq_dlnv = -t * np.exp(-t * t) / np.sqrt(np.pi)
        g[is_cat] = (wc / q - (1.0 - wc) / (1.0 - q)) * dq_dlnv
    total = (
        float(qv.sum())
        - reg_alpha * float(np.sum(state.ln_alpha**2))
        - reg_phi * float(np.sum(state.ln_phi**2))
    )
    return total, g


def m_step(
    stats: dict,
    state: EMState,
    eps: float,
    *,
    grad_iters: int = 25,
    lr0: float = 0.3,
    tol: float = 1e-5,
    reg_alpha: float = 2.0,
    reg_phi: float = 0.5,
) -> tuple[EMState, float]:
    """Gradient ascent on Q in log-parameter space with backtracking.

    Per-answer gradients w.r.t. ``ln v`` scatter-add to ``ln α_i``,
    ``ln β_j`` and ``ln φ_u`` (chain rule: ln v = ln α + ln β + ln φ).
    """
    st = state.copy()
    n, m, u_n = len(st.ln_alpha), len(st.ln_beta), len(st.ln_phi)
    r, c, u = stats["row"], stats["col"], stats["worker"]
    lr = lr0
    q_cur, g = q_objective(stats, st, eps, reg_alpha, reg_phi)
    for _ in range(grad_iters):
        ga = np.bincount(r, weights=g, minlength=n) - 2.0 * reg_alpha * st.ln_alpha
        gb = np.bincount(c, weights=g, minlength=m)
        gp = np.bincount(u, weights=g, minlength=u_n) - 2.0 * reg_phi * st.ln_phi
        # Normalise by answer counts so the step size is scale-free.
        na = np.maximum(np.bincount(r, minlength=n), 1)
        nb = np.maximum(np.bincount(c, minlength=m), 1)
        np_ = np.maximum(np.bincount(u, minlength=u_n), 1)
        step_a, step_b, step_p = ga / na, gb / nb, gp / np_
        accepted = False
        for _try in range(10):
            cand = EMState(
                np.clip(st.ln_alpha + lr * step_a, -_LN_CLAMP, _LN_CLAMP),
                np.clip(st.ln_beta + lr * step_b, -_LN_CLAMP, _LN_CLAMP),
                np.clip(st.ln_phi + lr * step_p, -_LN_CLAMP, _LN_CLAMP),
            )
            q_new, g_new = q_objective(stats, cand, eps, reg_alpha)
            if q_new >= q_cur - 1e-12:
                accepted = True
                break
            lr *= 0.5
        if not accepted:
            break
        moved = max(
            np.abs(cand.ln_alpha - st.ln_alpha).max(initial=0.0),
            np.abs(cand.ln_beta - st.ln_beta).max(initial=0.0),
            np.abs(cand.ln_phi - st.ln_phi).max(initial=0.0),
        )
        st, q_cur, g = cand, q_new, g_new
        lr = min(lr * 1.3, 2.0)
        if moved < tol:
            break
    # Renormalise the two scale freedoms into β.
    ma = st.ln_alpha.mean()
    mp = st.ln_phi.mean()
    st.ln_alpha -= ma
    st.ln_phi -= mp
    st.ln_beta += ma + mp
    return st, q_cur


# ---------------------------------------------------------------------------
# Full EM driver.
# ---------------------------------------------------------------------------

def column_priors(answers: pd.DataFrame, schema: TableSchema) -> dict:
    """Empirical Gaussian prior (μ⁰_j, φ⁰_j) per continuous column (§4.3)."""
    priors = {}
    for j in schema.continuous_idx:
        vals = answers.loc[answers["col"] == j, "value"].to_numpy()
        if len(vals) == 0:
            lo, hi = schema.column(j).domain
            priors[j] = ((lo + hi) / 2.0, max(((hi - lo) / 4.0) ** 2, 1e-6))
        else:
            priors[j] = (float(vals.mean()), max(float(vals.var()), 1e-6))
    return priors


def init_state(
    answers: pd.DataFrame, schema: TableSchema, n_rows: int, n_workers: int
) -> EMState:
    """α = φ = 1; β_j = per-column answer variance for continuous columns
    (so the initial α β φ matches the column's scale), 1 for categorical."""
    ln_beta = np.zeros(schema.n_cols)
    for j in schema.continuous_idx:
        vals = answers.loc[answers["col"] == j, "value"].to_numpy()
        if len(vals) > 1:
            ln_beta[j] = np.log(max(float(vals.var()), 1e-6))
    return EMState(np.zeros(n_rows), ln_beta, np.zeros(n_workers))


def run_estep(
    answers: pd.DataFrame, schema: TableSchema, state: EMState, priors: dict, eps: float
):
    """One full E-step over all columns. Returns (cont_cells, cat_cells,
    stats) where stats is the per-answer sufficient-statistics dict the
    M-step consumes."""
    r_all = answers["row"].to_numpy(dtype=np.int64)
    c_all = answers["col"].to_numpy(dtype=np.int64)
    u_all = answers["worker"].to_numpy(dtype=np.int64)
    val_all = answers["value"].to_numpy(dtype=np.float64)
    v_all = np.exp(state.ln_alpha[r_all] + state.ln_beta[c_all] + state.ln_phi[u_all])

    s = np.zeros(len(answers))
    w = np.zeros(len(answers))
    is_cat = np.zeros(len(answers), dtype=bool)
    n_labels = np.ones(len(answers))
    cont_rows, cat_cells = [], {}

    for j, cspec in enumerate(schema.columns):
        mask = c_all == j
        if not mask.any():
            continue
        rows, vals, v = r_all[mask], val_all[mask], v_all[mask]
        if cspec.is_categorical:
            posts, w_j, _ = estep_categorical_column(rows, vals, v, cspec.n_labels, eps)
            w[mask] = w_j
            is_cat[mask] = True
            n_labels[mask] = cspec.n_labels
            for row, post in posts.items():
                cat_cells[(row, j)] = post
        else:
            mu0, var0 = priors[j]
            cell_rows, t_mu, t_phi, s_j = estep_continuous_column(rows, vals, v, mu0, var0)
            s[mask] = s_j
            cont_rows.append(
                pd.DataFrame({"row": cell_rows, "col": j, "t_mu": t_mu, "t_phi": t_phi})
            )

    cont_cells = (
        pd.concat(cont_rows, ignore_index=True)
        if cont_rows
        else pd.DataFrame(columns=["row", "col", "t_mu", "t_phi"])
    )
    stats = {
        "row": r_all,
        "col": c_all,
        "worker": u_all,
        "is_cat": is_cat,
        "s": s,
        "w": w,
        "n_labels": n_labels,
    }
    return cont_cells, cat_cells, stats


def result_truth(cont_cells: pd.DataFrame, cat_cells: dict) -> pd.DataFrame:
    """Final T̂ (Eq. at end of §4.3): T_μ for continuous, argmax label for
    categorical."""
    parts = []
    if len(cont_cells):
        parts.append(
            cont_cells.rename(columns={"t_mu": "truth"})[["row", "col", "truth"]]
        )
    if cat_cells:
        parts.append(
            pd.DataFrame(
                [
                    {"row": row, "col": col, "truth": post.argmax()}
                    for (row, col), post in cat_cells.items()
                ]
            )
        )
    out = pd.concat(parts, ignore_index=True) if parts else pd.DataFrame(
        columns=["row", "col", "truth"]
    )
    return out.sort_values(["row", "col"]).reset_index(drop=True)


def tcrowd_em(
    answers: pd.DataFrame,
    schema: TableSchema,
    *,
    n_rows: int | None = None,
    n_workers: int | None = None,
    eps: float = 1.0,
    max_iter: int = 40,
    tol: float = 1e-3,
    grad_iters: int = 25,
    reg_alpha: float = 2.0,
    reg_phi: float = 0.5,
    warm_state: EMState | None = None,
) -> TCrowdResult:
    """Full T-Crowd truth inference (Algorithm 1).

    ``warm_state`` lets the online simulator resume from the previous
    parameters after collecting a few more answers.
    """
    if len(answers) == 0:
        raise ValueError("no answers to infer from")
    n_rows = n_rows if n_rows is not None else int(answers["row"].max()) + 1
    n_workers = n_workers if n_workers is not None else int(answers["worker"].max()) + 1
    priors = column_priors(answers, schema)
    state = warm_state.copy() if warm_state is not None else init_state(
        answers, schema, n_rows, n_workers
    )
    if warm_state is not None and (
        len(state.ln_alpha) < n_rows or len(state.ln_phi) < n_workers
    ):
        state = EMState(
            np.pad(state.ln_alpha, (0, n_rows - len(state.ln_alpha))),
            state.ln_beta,
            np.pad(state.ln_phi, (0, n_workers - len(state.ln_phi))),
        )

    q_trace: list[float] = []
    converged = False
    it = 0
    for it in range(1, max_iter + 1):
        cont_cells, cat_cells, stats = run_estep(answers, schema, state, priors, eps)
        new_state, q_val = m_step(
            stats, state, eps, grad_iters=grad_iters, reg_alpha=reg_alpha,
            reg_phi=reg_phi,
        )
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
    # Final E-step with the converged parameters.
    cont_cells, cat_cells, _ = run_estep(answers, schema, state, priors, eps)
    quality = np.asarray(erf(eps / np.sqrt(2.0 * np.exp(state.ln_phi))), dtype=np.float64)
    return TCrowdResult(
        state=state,
        truth=result_truth(cont_cells, cat_cells),
        cont_cells=cont_cells,
        cat_cells=cat_cells,
        worker_quality=quality,
        n_iters=it,
        converged=converged,
        q_trace=q_trace,
        priors=priors,
    )
