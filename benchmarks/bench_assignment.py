"""Benchmarks for task assignment — the Fig. 11 efficiency experiment:
time to score all candidate tasks for one incoming worker."""
import pytest

from repro.core.assignment import AssignmentView, InherentIGPolicy, StructureAwarePolicy
from repro.core.correlation import fit_error_model
from repro.core.em import tcrowd_em


@pytest.fixture(scope="module")
def assignment_view(restaurant_ds):
    res = tcrowd_em(restaurant_ds.answers, restaurant_ds.schema)
    model = fit_error_model(restaurant_ds.answers, res.truth, restaurant_ds.schema)
    answered = {
        int(w): set(map(tuple, grp[["row", "col"]].itertuples(index=False)))
        for w, grp in restaurant_ds.answers.groupby("worker")
    }
    return AssignmentView(
        schema=restaurant_ds.schema,
        n_rows=restaurant_ds.n_rows,
        answers=restaurant_ds.answers,
        result=res,
        error_model=model,
        answered=answered,
        counts=restaurant_ds.answers.groupby(["row", "col"]).size().to_dict(),
    )


@pytest.mark.benchmark(group="fig11-assignment")
def test_inherent_ig_all_tasks(benchmark, assignment_view):
    gains = benchmark(lambda: InherentIGPolicy().gains(assignment_view, 0))
    assert len(gains) == assignment_view.n_rows * assignment_view.schema.n_cols


@pytest.mark.benchmark(group="fig11-assignment")
def test_structure_aware_ig_all_tasks(benchmark, assignment_view):
    gains = benchmark(lambda: StructureAwarePolicy().gains(assignment_view, 0))
    assert len(gains) == assignment_view.n_rows * assignment_view.schema.n_cols


@pytest.mark.benchmark(group="fig11-assignment")
def test_fit_error_model(benchmark, restaurant_ds, assignment_view):
    benchmark(
        lambda: fit_error_model(
            restaurant_ds.answers,
            assignment_view.result.truth,
            restaurant_ds.schema,
        )
    )
