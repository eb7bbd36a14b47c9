"""Benchmark for Table 6: dataset generation + Spark statistics."""
import pytest

from repro.crowd import datasets as D
from repro.harness.table6 import dataset_stats_spark


@pytest.mark.benchmark(group="table6")
def test_generate_celebrity(benchmark):
    ds = benchmark(lambda: D.celebrity_like(seed=7))
    assert ds.n_cells == 1218


@pytest.mark.benchmark(group="table6")
def test_generate_restaurant(benchmark):
    ds = benchmark(lambda: D.restaurant_like(seed=11))
    assert ds.n_cells == 1015


@pytest.mark.benchmark(group="table6")
def test_stats_spark(benchmark, spark, celebrity_ds):
    a_df, _ = celebrity_ds.to_spark(spark)
    a_df.cache().count()
    row = benchmark.pedantic(
        lambda: dataset_stats_spark(a_df).first(), rounds=3, iterations=1
    )
    assert row["cells"] == 1218
