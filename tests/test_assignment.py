"""Tests for the §5 assignment policies and information-gain math."""
import math

import numpy as np
import pandas as pd
import pytest

from repro.core.assignment import (
    AskItPolicy,
    AssignmentView,
    CdasPolicy,
    EntropyPolicy,
    InherentIGPolicy,
    LoopingPolicy,
    RandomPolicy,
    StructureAwarePolicy,
    _cat_ig,
    uniform_entropy,
)
from repro.core.correlation import fit_error_model
from repro.core.em import CatPosterior, tcrowd_em


@pytest.fixture(scope="module")
def view(tiny_ds, tiny_em):
    answered = {
        int(w): set(map(tuple, grp[["row", "col"]].itertuples(index=False)))
        for w, grp in tiny_ds.answers.groupby("worker")
    }
    counts = tiny_ds.answers.groupby(["row", "col"]).size().to_dict()
    model = fit_error_model(tiny_ds.answers, tiny_em.truth, tiny_ds.schema)
    return AssignmentView(
        schema=tiny_ds.schema,
        n_rows=30,
        answers=tiny_ds.answers,
        result=tiny_em,
        error_model=model,
        answered=answered,
        counts=counts,
    )


class TestCatIG:
    def _post(self, probs, n_un=0, p0=0.0):
        return CatPosterior(
            labels=np.arange(len(probs), dtype=float),
            probs=np.asarray(probs, dtype=float),
            n_unanswered=n_un,
            p0=p0,
        )

    def test_nonnegative_for_uncertain_cell(self):
        post = self._post([0.5, 0.5])
        assert _cat_ig(post, q=0.8, n_labels=2) > 0

    def test_zero_for_certain_cell(self):
        post = self._post([1.0, 0.0])
        assert _cat_ig(post, q=0.8, n_labels=2) == pytest.approx(0.0, abs=1e-9)

    def test_useless_worker_gains_nothing(self):
        # q = 1/L: the worker's answer is uniformly random → no information.
        post = self._post([0.5, 0.5])
        assert _cat_ig(post, q=0.5, n_labels=2) == pytest.approx(0.0, abs=1e-9)

    def test_better_worker_more_gain(self):
        post = self._post([0.6, 0.4])
        g_weak = _cat_ig(post, q=0.6, n_labels=2)
        g_strong = _cat_ig(post, q=0.95, n_labels=2)
        assert g_strong > g_weak

    def test_binary_hand_computed(self):
        # Uniform prior, q=0.9, L=2: H0 = ln 2; after one answer posterior is
        # (0.9, 0.1) either way → expected H = H(0.9).
        post = self._post([0.5, 0.5])
        h_bern = -(0.9 * math.log(0.9) + 0.1 * math.log(0.1))
        want = math.log(2) - h_bern
        assert _cat_ig(post, q=0.9, n_labels=2) == pytest.approx(want, rel=1e-9)

    def test_unanswered_labels_participate(self):
        # All mass on unanswered labels: still a proper distribution.
        post = self._post([0.4], n_un=3, p0=0.2)
        ig = _cat_ig(post, q=0.9, n_labels=4)
        assert np.isfinite(ig)
        assert ig > 0


class TestUniformEntropy:
    def test_covers_all_cells(self, view, tiny_ds):
        ent = uniform_entropy(view)
        assert len(ent) == tiny_ds.n_cells

    def test_categorical_entropy_nonnegative(self, view, tiny_ds):
        ent = uniform_entropy(view)
        for (r, c), h in ent.items():
            if c in tiny_ds.schema.categorical_idx:
                assert h >= -1e-12


class TestPolicies:
    @pytest.mark.parametrize(
        "policy",
        [
            RandomPolicy(0),
            LoopingPolicy(),
            EntropyPolicy(),
            InherentIGPolicy(),
            StructureAwarePolicy(),
            CdasPolicy(seed=0),
            AskItPolicy(),
        ],
        ids=["random", "looping", "entropy", "inherent", "struct", "cdas", "askit"],
    )
    def test_picks_k_unanswered_cells(self, policy, view):
        worker = 0
        cells = policy.pick(view, worker, 5)
        assert len(cells) == 5
        assert len(set(cells)) == 5
        assert all(c not in view.answered[worker] for c in cells)

    def test_random_respects_k_larger_than_candidates(self, view):
        # Worker who answered everything gets an empty assignment.
        view2 = AssignmentView(
            schema=view.schema,
            n_rows=view.n_rows,
            answers=view.answers,
            result=view.result,
            answered={0: set(view.all_cells())},
            counts=view.counts,
        )
        assert RandomPolicy(0).pick(view2, 0, 3) == []

    def test_looping_prefers_least_answered(self, view):
        picks = LoopingPolicy().pick(view, 0, 3)
        counts = [view.counts.get(c, 0) for c in picks]
        all_counts = [view.counts.get(c, 0) for c in view.candidates(0)]
        assert max(counts) <= min(all_counts) + 1

    def test_inherent_ig_all_finite(self, view):
        ig = InherentIGPolicy().gains(view, 0)
        assert all(np.isfinite(v) for v in ig.values())
        assert len(ig) == 30 * 4

    def test_inherent_ig_picks_positive_gain(self, view):
        ig = InherentIGPolicy().gains(view, 0)
        picks = InherentIGPolicy().pick(view, 0, 5)
        pick_gain = min(ig[c] for c in picks)
        rest = [ig[c] for c in view.candidates(0) if c not in picks]
        assert pick_gain >= max(rest) - 1e-12

    def test_good_worker_gets_more_expected_gain(self, view, tiny_ds):
        ig_policy = InherentIGPolicy()
        phi = view.result.state.ln_phi
        best_w = int(np.argmin(phi))
        worst_w = int(np.argmax(phi))
        g_best = sum(ig_policy.gains(view, best_w).values())
        g_worst = sum(ig_policy.gains(view, worst_w).values())
        assert g_best > g_worst

    def test_structure_aware_differs_from_inherent(self, view, tiny_ds, tiny_em):
        # Conditioning only applies to the *unanswered* cells of rows the
        # worker partially answered (in the HIT-batch data every touched row
        # is complete, so build a partial history: drop the worker's answers
        # on column 3).
        w = int(view.answers["worker"].mode()[0])
        a = view.answers
        partial = a[~((a["worker"] == w) & (a["col"] == 3))].reset_index(drop=True)
        answered = {
            int(u): set(map(tuple, grp[["row", "col"]].itertuples(index=False)))
            for u, grp in partial.groupby("worker")
        }
        view2 = AssignmentView(
            schema=view.schema,
            n_rows=view.n_rows,
            answers=partial,
            result=view.result,
            error_model=view.error_model,
            answered=answered,
            counts=partial.groupby(["row", "col"]).size().to_dict(),
        )
        base = InherentIGPolicy().gains(view2, w)
        sa = StructureAwarePolicy().gains(view2, w)
        diffs = [abs(base[c] - sa[c]) for c in base]
        assert max(diffs) > 0
        # And only cells in rows with partial history changed.
        touched_rows = {r for (r, c) in view2.answered[w]}
        for cell, d in zip(base, diffs):
            if d > 0:
                assert cell[0] in touched_rows

    def test_structure_aware_without_model_equals_inherent(self, view):
        view2 = AssignmentView(
            schema=view.schema,
            n_rows=view.n_rows,
            answers=view.answers,
            result=view.result,
            error_model=None,
            answered=view.answered,
            counts=view.counts,
        )
        w = 0
        assert StructureAwarePolicy().gains(view2, w) == InherentIGPolicy().gains(
            view2, w
        )

    def test_cdas_terminates_confident_cells(self, view):
        pol = CdasPolicy(p_term=0.5, seed=0)
        term = pol._terminated(view)
        # With 3 answers/cell, plenty of categorical cells have a ≥ 2/3
        # majority → terminated.
        assert len(term) > 0
        picks = pol.pick(view, 0, 5)
        assert all(c not in term for c in picks)

    def test_entropy_policy_prefers_continuous(self, view, tiny_ds):
        # §5.1/§6.4.2: raw differential entropy of wide-domain continuous
        # cells dominates Shannon entropy of categorical cells.
        picks = EntropyPolicy().pick(view, 0, 10)
        cont = sum(1 for _, c in picks if c in tiny_ds.schema.continuous_idx)
        assert cont >= 8


class TestContinuousIGClosedForm:
    def test_matches_formula(self, view):
        rec = view.result.cont_cells.iloc[0]
        cell = (int(rec["row"]), int(rec["col"]))
        st = view.result.state
        v_u = float(
            np.exp(st.ln_alpha[cell[0]] + st.ln_beta[cell[1]] + st.ln_phi[0])
        )
        t_phi = float(rec["t_phi"])
        want = 0.5 * math.log(t_phi / (1.0 / (1.0 / t_phi + 1.0 / v_u)))
        ig = InherentIGPolicy().gains(view, 0)[cell]
        assert ig == pytest.approx(want, rel=1e-9)

    def test_gain_decreases_with_more_answers(self):
        # Adding answers shrinks t_phi; the next answer's IG must shrink.
        igs = []
        for t_phi in [4.0, 2.0, 1.0, 0.5]:
            igs.append(0.5 * math.log(t_phi / (1 / (1 / t_phi + 1 / 1.0))))
        assert all(a > b for a, b in zip(igs, igs[1:]))
