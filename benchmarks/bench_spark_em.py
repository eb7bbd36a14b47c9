"""Benchmark for the Spark EM dataflow engine (per-iteration cost)."""
import pytest

from repro.core.spark_em import tcrowd_em_spark


@pytest.mark.benchmark(group="spark-em")
def test_spark_em_restaurant(benchmark, spark, restaurant_ds):
    a_df, _ = restaurant_ds.to_spark(spark)
    a_df = a_df.cache()
    a_df.count()

    res = benchmark.pedantic(
        lambda: tcrowd_em_spark(a_df, restaurant_ds.schema, max_iter=5),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["em_iters"] = res.n_iters
    assert res.truth.count() == restaurant_ds.n_cells
