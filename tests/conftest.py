"""Shared fixtures: small generated datasets reused across test modules."""
import numpy as np
import pytest

from repro.crowd import datasets as D
from repro.crowd.workers import make_pool, simulate_answers


@pytest.fixture(scope="session")
def tiny_ds():
    """A small mixed-type dataset: 30 rows, 2 cat + 2 cont, 3 answers/task."""
    from repro.crowd.schema import CATEGORICAL, CONTINUOUS, ColumnSpec, TableSchema

    schema = TableSchema(
        name="tiny",
        columns=(
            ColumnSpec("c0", CATEGORICAL, n_labels=4),
            ColumnSpec("c1", CATEGORICAL, n_labels=6),
            ColumnSpec("x0", CONTINUOUS, domain=(0.0, 100.0)),
            ColumnSpec("x1", CONTINUOUS, domain=(-50.0, 50.0), corr_group="g"),
        ),
    )
    g = np.random.default_rng(0)
    truth = D._uniform_truth(schema, 30, g)
    pool = make_pool(20, seed=1)
    return simulate_answers(schema, truth, pool, n_per_task=3, seed=2)


@pytest.fixture(scope="session")
def restaurant_ds():
    return D.restaurant_like(seed=11)


@pytest.fixture(scope="session")
def tiny_em(tiny_ds):
    """T-Crowd inference result on the tiny dataset (computed once)."""
    from repro.core.em import tcrowd_em

    return tcrowd_em(tiny_ds.answers, tiny_ds.schema)
