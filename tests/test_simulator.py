"""Tests for the online crowdsourcing simulator."""
import numpy as np
import pandas as pd
import pytest

from repro.core.assignment import InherentIGPolicy, RandomPolicy
from repro.crowd import datasets as D
from repro.crowd.simulator import (
    HiddenWorld,
    SimConfig,
    run_simulation,
    world_from_dataset,
)
from repro.crowd.workers import make_pool, simulate_answers


@pytest.fixture()
def small_world():
    schema = D.restaurant_schema()
    g = np.random.default_rng(3)
    truth = D._uniform_truth(schema, 30, g)
    pool = make_pool(25, seed=4)
    ds = simulate_answers(schema, truth, pool, n_per_task=1, seed=5)
    return world_from_dataset(ds, seed=6)


class TestHiddenWorld:
    def test_truth_frame_layout(self, small_world):
        tf = small_world.truth_frame()
        assert len(tf) == 30 * 5
        assert list(tf.columns) == ["row", "col", "truth"]

    def test_answer_in_label_domain(self, small_world):
        for _ in range(50):
            a = small_world.answer(0, 3, 0)
            assert 0 <= a <= small_world.schema.column(0).n_labels - 1

    def test_recognition_factor_memoised(self, small_world):
        f1 = small_world._recog_factor(2, 7)
        f2 = small_world._recog_factor(2, 7)
        assert f1 == f2

    def test_good_worker_more_accurate_than_bad(self, small_world):
        phi = small_world.pool.phi
        good, bad = int(np.argmin(phi)), int(np.argmax(phi))
        col = 3  # continuous
        t = small_world.truth_grid[0, col]
        errs_g = [abs(small_world.answer(good, 0, col) - t) for _ in range(200)]
        errs_b = [abs(small_world.answer(bad, 0, col) - t) for _ in range(200)]
        assert np.mean(errs_g) < np.mean(errs_b)

    def test_world_from_dataset_preserves_truth(self):
        ds = D.restaurant_like(seed=11)
        world = world_from_dataset(ds)
        grid = world.truth_frame().merge(ds.truth, on=["row", "col"])
        np.testing.assert_allclose(grid["truth_x"], grid["truth_y"])


class TestRunSimulation:
    def _cfg(self, **kw):
        base = dict(
            batch_size=5,
            max_answers_per_task=2.0,
            checkpoints=(1.0, 2.0),
            full_em_every=50,
            seed=0,
        )
        base.update(kw)
        return SimConfig(**base)

    def test_budget_and_checkpoints(self, small_world):
        out = run_simulation(small_world, RandomPolicy(0), "mv", self._cfg())
        assert list(out["avg_answers"]) == [1.0, 2.0]
        assert out["n_answers"].iloc[-1] <= 2.0 * 150 + 5

    def test_metrics_improve_with_answers(self, small_world):
        out = run_simulation(small_world, RandomPolicy(0), "mv", self._cfg())
        assert out["mnad"].iloc[-1] <= out["mnad"].iloc[0] + 0.05

    @pytest.mark.parametrize("inference", ["tcrowd", "mv", "crh", "catd"])
    def test_all_inference_methods_run(self, small_world, inference):
        out = run_simulation(
            small_world, RandomPolicy(0), inference, self._cfg(checkpoints=(1.5,))
        )
        assert len(out) == 1
        assert np.isfinite(out["error_rate"].iloc[0])
        assert np.isfinite(out["mnad"].iloc[0])

    def test_ig_policy_runs_with_tcrowd(self, small_world):
        out = run_simulation(
            small_world, InherentIGPolicy(), "tcrowd", self._cfg()
        )
        assert len(out) == 2

    def test_no_duplicate_worker_cell_answers(self, small_world):
        # Run a sim and rebuild the answer log via the policy constraint:
        # the view filters already-answered cells, so duplicates are
        # impossible by construction; verify on a fresh small run.
        cfg = self._cfg(checkpoints=(2.0,))
        out = run_simulation(small_world, RandomPolicy(1), "mv", cfg)
        assert len(out) == 1

    def test_deterministic_given_seeds(self):
        def fresh():
            schema = D.restaurant_schema()
            g = np.random.default_rng(3)
            truth = D._uniform_truth(schema, 20, g)
            pool = make_pool(15, seed=4)
            ds = simulate_answers(schema, truth, pool, n_per_task=1, seed=5)
            return world_from_dataset(ds, seed=6)

        cfg = self._cfg(checkpoints=(1.5,))
        a = run_simulation(fresh(), RandomPolicy(7), "mv", cfg)
        b = run_simulation(fresh(), RandomPolicy(7), "mv", cfg)
        pd.testing.assert_frame_equal(a, b)
