"""Unit tests for the tabular crowdsourcing data model."""
import numpy as np
import pandas as pd
import pytest

from repro.crowd.schema import (
    ANSWER_FIELDS,
    CATEGORICAL,
    CONTINUOUS,
    ColumnSpec,
    TableSchema,
    restrict_answers,
)


class TestColumnSpec:
    def test_categorical_ok(self):
        c = ColumnSpec("a", CATEGORICAL, n_labels=5)
        assert c.is_categorical and c.n_labels == 5

    def test_categorical_needs_labels(self):
        with pytest.raises(ValueError):
            ColumnSpec("a", CATEGORICAL)

    def test_categorical_needs_two_labels(self):
        with pytest.raises(ValueError):
            ColumnSpec("a", CATEGORICAL, n_labels=1)

    def test_unknown_kind(self):
        with pytest.raises(ValueError):
            ColumnSpec("a", "weird")

    def test_continuous_default_domain(self):
        c = ColumnSpec("x", CONTINUOUS)
        assert c.domain == (0.0, 1000.0)
        assert not c.is_categorical

    def test_corr_group_default_none(self):
        assert ColumnSpec("x", CONTINUOUS).corr_group is None


class TestTableSchema:
    def _schema(self):
        return TableSchema(
            columns=(
                ColumnSpec("a", CATEGORICAL, n_labels=3),
                ColumnSpec("x", CONTINUOUS),
                ColumnSpec("b", CATEGORICAL, n_labels=4),
            )
        )

    def test_counts_and_indices(self):
        s = self._schema()
        assert s.n_cols == 3
        assert s.categorical_idx == [0, 2]
        assert s.continuous_idx == [1]

    def test_column_accessor(self):
        assert self._schema().column(1).name == "x"

    def test_empty_rejected(self):
        with pytest.raises(ValueError):
            TableSchema(columns=())

    def test_duplicate_names_rejected(self):
        with pytest.raises(ValueError):
            TableSchema(
                columns=(
                    ColumnSpec("a", CONTINUOUS),
                    ColumnSpec("a", CONTINUOUS),
                )
            )

    def test_restrict(self):
        s = self._schema().restrict(CATEGORICAL)
        assert [c.name for c in s.columns] == ["a", "b"]


class TestRestrictAnswers:
    def test_keeps_original_indices(self):
        s = TableSchema(
            columns=(
                ColumnSpec("a", CATEGORICAL, n_labels=3),
                ColumnSpec("x", CONTINUOUS),
            )
        )
        a = pd.DataFrame(
            {"worker": [0, 0], "row": [0, 0], "col": [0, 1], "value": [1.0, 9.9]}
        )
        cat = restrict_answers(a, s, CATEGORICAL)
        cont = restrict_answers(a, s, CONTINUOUS)
        assert cat["col"].tolist() == [0]
        assert cont["col"].tolist() == [1]


class TestCrowdDataset:
    def test_shape_properties(self, tiny_ds):
        assert tiny_ds.n_cells == 30 * 4
        assert tiny_ds.answers_per_task == pytest.approx(3.0)
        assert tiny_ds.n_workers <= 20

    def test_answer_fields(self, tiny_ds):
        assert list(tiny_ds.answers.columns) == ANSWER_FIELDS

    def test_truth_covers_all_cells(self, tiny_ds):
        assert len(tiny_ds.truth) == tiny_ds.n_cells
        assert not tiny_ds.truth.duplicated(["row", "col"]).any()

    def test_to_spark_schemas(self, spark, tiny_ds):
        a, t = tiny_ds.to_spark(spark)
        assert [f.name for f in a.schema.fields] == ["worker", "row", "col", "value"]
        assert [f.name for f in t.schema.fields] == ["row", "col", "truth"]
        assert a.count() == len(tiny_ds.answers)
        assert t.count() == len(tiny_ds.truth)

    def test_categorical_answers_are_valid_labels(self, tiny_ds):
        for j in tiny_ds.schema.categorical_idx:
            vals = tiny_ds.answers.loc[tiny_ds.answers["col"] == j, "value"]
            n = tiny_ds.schema.column(j).n_labels
            assert vals.round().between(0, n - 1).all()
            np.testing.assert_allclose(vals, vals.round())
