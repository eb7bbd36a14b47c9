"""Online task assignment (paper §5): policies that pick cells for an
incoming worker.

All policies implement ``pick(view, worker, k) -> list[(row, col)]`` where
``view`` is an :class:`AssignmentView` of the current answer set and (for
the model-based policies) the latest T-Crowd inference result. Multi-task
batches (§5.3) use the greedy top-K approximation the paper proposes.

Policies:

* :class:`RandomPolicy` — CDAS-style random choice (also used for the CRH /
  CATD assignment rows of Fig. 2);
* :class:`LoopingPolicy` — round-robin over the least-answered cells;
* :class:`EntropyPolicy` — AskIt!-style max-uncertainty using the *uniform
  entropy* H (differential vs Shannon — intentionally not comparable across
  datatypes; the paper shows it biases toward continuous tasks);
* :class:`InherentIGPolicy` — Eq. 6 delta-entropy information gain with the
  paper's local approximation (only ``T_ij`` is updated by the hypothetical
  answer). For continuous cells the Gaussian posterior variance does not
  depend on the observed value, so the expected entropy drop is the closed
  form ``½ ln(T_φ / T_φ')``;
* :class:`StructureAwarePolicy` — Eq. 7: the incoming worker's effective
  quality on a cell is adjusted by the conditional error distribution given
  the worker's observed errors on the same row;
* :class:`CdasPolicy` — CDAS [20]: terminate confident cells, assign
  uniformly among the rest;
* :class:`AskItPolicy` — AskIt! [5]: highest-uncertainty cell under its own
  simple (vote/variance-based) uncertainty model.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from ..crowd.schema import TableSchema
from ..crowd.stats import erf
from .correlation import Bernoulli, ErrorModel, Normal, combined_conditional
from .em import TCrowdResult

_EPS_Q = 1e-6


@dataclass
class AssignmentView:
    """Everything a policy may look at when assigning tasks.

    ``result`` is the latest T-Crowd inference output (None for baseline
    policies that do not use it); ``error_model`` the fitted §5.2 model;
    ``answered`` maps worker -> set of (row, col) already answered (a worker
    never gets the same task twice); ``counts`` is answers-per-cell.
    """

    schema: TableSchema
    n_rows: int
    answers: pd.DataFrame
    result: TCrowdResult | None = None
    error_model: ErrorModel | None = None
    answered: dict = field(default_factory=dict)
    counts: dict = field(default_factory=dict)
    eps: float = 1.0

    def all_cells(self) -> list[tuple[int, int]]:
        return [
            (i, j) for i in range(self.n_rows) for j in range(self.schema.n_cols)
        ]

    def candidates(self, worker: int) -> list[tuple[int, int]]:
        done = self.answered.get(worker, set())
        return [c for c in self.all_cells() if c not in done]


class RandomPolicy:
    """Uniform random assignment among the worker's unanswered cells."""

    def __init__(self, seed: int = 0):
        self.rng = np.random.default_rng(seed)

    def pick(self, view: AssignmentView, worker: int, k: int) -> list[tuple[int, int]]:
        cand = view.candidates(worker)
        if not cand:
            return []
        idx = self.rng.choice(len(cand), size=min(k, len(cand)), replace=False)
        return [cand[i] for i in idx]


class LoopingPolicy:
    """Round-robin: the cells with the fewest answers, in row/col order."""

    def pick(self, view: AssignmentView, worker: int, k: int) -> list[tuple[int, int]]:
        cand = view.candidates(worker)
        cand.sort(key=lambda c: (view.counts.get(c, 0), c))
        return cand[:k]


def _cell_params(view: AssignmentView, worker: int, row: int, col: int):
    st = view.result.state
    ln_a = st.ln_alpha[row] if row < len(st.ln_alpha) else 0.0
    ln_b = st.ln_beta[col]
    ln_p = st.ln_phi[worker] if worker < len(st.ln_phi) else 0.0
    return float(np.exp(ln_a + ln_b + ln_p))


def _cont_entropy(t_phi: float) -> float:
    return 0.5 * float(np.log(2.0 * np.pi * np.e * max(t_phi, 1e-300)))


def uniform_entropy(view: AssignmentView) -> dict:
    """H(T_ij) per cell (§5.1): differential for continuous, Shannon for
    categorical. NOT comparable across types — used by EntropyPolicy to
    reproduce the paper's bias demonstration."""
    ent: dict = {}
    for rec in view.result.cont_cells.itertuples():
        ent[(int(rec.row), int(rec.col))] = _cont_entropy(float(rec.t_phi))
    for cell, post in view.result.cat_cells.items():
        ent[cell] = post.entropy()
    return ent


class EntropyPolicy:
    """Greedy max uniform-entropy (the flawed straw-man of §5.1)."""

    def pick(self, view: AssignmentView, worker: int, k: int) -> list[tuple[int, int]]:
        ent = uniform_entropy(view)
        cand = view.candidates(worker)
        cand.sort(key=lambda c: -ent.get(c, -np.inf))
        return cand[:k]


def _cat_ig(post, q: float, n_labels: int) -> float:
    """Expected Shannon-entropy drop of one categorical cell for a worker of
    per-cell accuracy q (Eq. 6, local update).

    Enumerates the worker's possible answers over answered labels plus one
    representative unanswered label (all unanswered labels are exchangeable).
    """
    q = float(np.clip(q, _EPS_Q, 1.0 - _EPS_Q))
    probs = np.asarray(post.probs, dtype=np.float64)
    n_un = post.n_unanswered
    p0 = post.p0
    wrong = (1.0 - q) / (n_labels - 1)

    def _entropy(ans: np.ndarray, p_un: float, n_unans: int) -> float:
        pos = ans[ans > 0]
        h = -float(np.sum(pos * np.log(pos)))
        if n_unans > 0 and p_un > 0:
            h -= n_unans * p_un * np.log(p_un)
        return h

    h0 = _entropy(probs, p0, n_un)
    exp_h = 0.0
    # The worker answers some answered label idx: posterior ∝ prior ×
    # likelihood; the predictive probability of that answer equals the
    # posterior normaliser, so one pass gives both.
    for idx in range(len(probs)):
        lik = np.full(len(probs), wrong)
        lik[idx] = q
        new_ans = probs * lik
        new_p0 = p0 * wrong
        z = float(new_ans.sum() + n_un * new_p0)  # == P(answer = this label)
        if z <= 0:
            continue
        exp_h += z * _entropy(new_ans / z, new_p0 / z, n_un)
    # Or one of the n_un exchangeable unanswered labels: the chosen label
    # gets likelihood q and leaves the pool, the other n_un−1 stay at
    # ``wrong``; all n_un cases are identical.
    if n_un > 0:
        new_ans = np.append(probs * wrong, p0 * q)
        new_p0 = p0 * wrong
        z = float(new_ans.sum() + (n_un - 1) * new_p0)
        if z > 0:
            exp_h += n_un * z * _entropy(new_ans / z, new_p0 / z, n_un - 1)
    return h0 - exp_h


class InherentIGPolicy:
    """Eq. 6: greedy top-K by inherent information gain."""

    def gains(self, view: AssignmentView, worker: int) -> dict:
        res = view.result
        eps = view.eps
        ig: dict = {}
        for rec in res.cont_cells.itertuples():
            cell = (int(rec.row), int(rec.col))
            v_u = _cell_params(view, worker, *cell)
            t_phi = float(rec.t_phi)
            t_phi_new = 1.0 / (1.0 / t_phi + 1.0 / v_u)
            ig[cell] = 0.5 * float(np.log(t_phi / t_phi_new))
        for cell, post in res.cat_cells.items():
            v_u = _cell_params(view, worker, *cell)
            q = float(erf(eps / np.sqrt(2.0 * v_u)))
            n_labels = view.schema.column(cell[1]).n_labels
            ig[cell] = _cat_ig(post, q, n_labels)
        return ig

    def pick(self, view: AssignmentView, worker: int, k: int) -> list[tuple[int, int]]:
        ig = self.gains(view, worker)
        cand = view.candidates(worker)
        cand.sort(key=lambda c: -ig.get(c, -np.inf))
        return cand[:k]


class StructureAwarePolicy(InherentIGPolicy):
    """Eq. 7: condition the worker's effective quality on their observed
    errors in the same row before computing the information gain."""

    def _observed_errors(self, view: AssignmentView, worker: int) -> dict:
        """row -> {col: error vs current truth} for this worker."""
        sub = view.answers[view.answers["worker"] == worker]
        if sub.empty or view.result is None:
            return {}
        merged = sub.merge(view.result.truth, on=["row", "col"], how="inner")
        cat = set(view.schema.categorical_idx)
        out: dict = {}
        for rec in merged.itertuples():
            j = int(rec.col)
            err = (
                float(round(rec.value) != round(rec.truth))
                if j in cat
                else float(rec.value - rec.truth)
            )
            out.setdefault(int(rec.row), {})[j] = err
        return out

    def gains(self, view: AssignmentView, worker: int) -> dict:
        ig = super().gains(view, worker)
        model = view.error_model
        if model is None:
            return ig
        observed = self._observed_errors(view, worker)
        eps = view.eps
        for row, errs in observed.items():
            for j in range(view.schema.n_cols):
                cell = (row, j)
                if cell not in ig or j in errs:
                    continue
                dist = combined_conditional(model, j, errs)
                if dist is None:
                    continue
                if isinstance(dist, Bernoulli):
                    post = view.result.cat_cells.get(cell)
                    if post is None:
                        continue
                    q_eff = float(np.clip(1.0 - dist.p_wrong, _EPS_Q, 1.0 - _EPS_Q))
                    n_labels = view.schema.column(j).n_labels
                    ig[cell] = _cat_ig(post, q_eff, n_labels)
                else:
                    assert isinstance(dist, Normal)
                    rec = view.result.cont_cells
                    sel = rec[(rec["row"] == row) & (rec["col"] == j)]
                    if sel.empty:
                        continue
                    t_phi = float(sel["t_phi"].iloc[0])
                    # Effective answer variance: conditional spread plus the
                    # predictable offset (a biased answer is less informative).
                    v_eff = max(dist.var + dist.mu**2, 1e-12)
                    t_phi_new = 1.0 / (1.0 / t_phi + 1.0 / v_eff)
                    ig[cell] = 0.5 * float(np.log(t_phi / t_phi_new))
        return ig


class CdasPolicy:
    """CDAS: cells whose estimate is confident are terminated; the rest are
    assigned at random. Confidence comes from the simple vote/CI model CDAS
    uses (not from T-Crowd): majority fraction ≥ ``p_term`` (categorical) or
    mean-CI half-width ≤ ``ci_frac`` × column std (continuous)."""

    def __init__(self, p_term: float = 0.8, ci_frac: float = 0.25, seed: int = 0):
        self.p_term = p_term
        self.ci_frac = ci_frac
        self.rng = np.random.default_rng(seed)

    def _terminated(self, view: AssignmentView) -> set:
        term = set()
        a = view.answers
        cat = set(view.schema.categorical_idx)
        col_sd = {
            j: max(float(a.loc[a["col"] == j, "value"].std() or 1.0), 1e-9)
            for j in view.schema.continuous_idx
        }
        for (row, col), grp in a.groupby(["row", "col"]):
            n = len(grp)
            if n < 2:
                continue
            if col in cat:
                frac = grp["value"].round().value_counts().iloc[0] / n
                if frac >= self.p_term:
                    term.add((int(row), int(col)))
            else:
                half = 1.96 * float(grp["value"].std(ddof=1) or 0.0) / np.sqrt(n)
                if half <= self.ci_frac * col_sd[col]:
                    term.add((int(row), int(col)))
        return term

    def pick(self, view: AssignmentView, worker: int, k: int) -> list[tuple[int, int]]:
        term = self._terminated(view)
        cand = [c for c in view.candidates(worker) if c not in term]
        if not cand:
            cand = view.candidates(worker)
        if not cand:
            return []
        idx = self.rng.choice(len(cand), size=min(k, len(cand)), replace=False)
        return [cand[i] for i in idx]


class AskItPolicy:
    """AskIt!: greedy max-uncertainty with a simple entropy-like measure —
    vote entropy for categorical cells, ln(spread) for continuous cells.

    The two are deliberately NOT calibrated against each other: the
    differential-entropy-like continuous measure on raw column scales
    dwarfs the Shannon vote entropy, so AskIt! keeps selecting continuous
    tasks first (its MNAD drops fast while the error rate stays high) —
    exactly the behaviour §6.3 reports for it. Under-sampled continuous
    cells (< 2 answers) fall back to the column-level spread.
    """

    def pick(self, view: AssignmentView, worker: int, k: int) -> list[tuple[int, int]]:
        a = view.answers
        cat = set(view.schema.categorical_idx)
        col_sd = {
            j: max(float(a.loc[a["col"] == j, "value"].std(ddof=0) or 1.0), 1e-6)
            for j in view.schema.continuous_idx
        }
        unc: dict = {}
        for (row, col), grp in a.groupby(["row", "col"]):
            if col in cat:
                p = grp["value"].round().value_counts(normalize=True).to_numpy()
                unc[(int(row), int(col))] = -float(np.sum(p * np.log(p)))
            else:
                if len(grp) >= 2:
                    sd = float(grp["value"].std(ddof=0) or 0.0)
                    sd = max(sd, 0.05 * col_sd[col])  # agreement ≠ certainty
                else:
                    sd = col_sd[col]
                unc[(int(row), int(col))] = float(np.log(max(sd, 1e-6)))
        cand = view.candidates(worker)
        cand.sort(key=lambda c: -unc.get(c, np.inf))
        return cand[:k]
