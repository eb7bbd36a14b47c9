"""Benchmarks for Table 7 (truth inference) — also the Fig. 12 efficiency
experiment: EM convergence cost and answers/second throughput."""
import pytest

from repro.baselines.catd import catd
from repro.baselines.crh import crh
from repro.baselines.voting import mv_median
from repro.core.em import tcrowd_em
from repro.crowd import datasets as D


@pytest.mark.benchmark(group="table7-inference")
def test_tcrowd_celebrity(benchmark, celebrity_ds):
    res = benchmark.pedantic(
        lambda: tcrowd_em(celebrity_ds.answers, celebrity_ds.schema),
        rounds=3,
        iterations=1,
    )
    assert res.truth.shape[0] == celebrity_ds.n_cells


@pytest.mark.benchmark(group="table7-inference")
def test_tcrowd_restaurant(benchmark, restaurant_ds):
    res = benchmark.pedantic(
        lambda: tcrowd_em(restaurant_ds.answers, restaurant_ds.schema),
        rounds=3,
        iterations=1,
    )
    assert res.truth.shape[0] == restaurant_ds.n_cells


@pytest.mark.benchmark(group="table7-inference")
def test_crh_celebrity(benchmark, celebrity_ds):
    benchmark(lambda: crh(celebrity_ds.answers, celebrity_ds.schema))


@pytest.mark.benchmark(group="table7-inference")
def test_catd_celebrity(benchmark, celebrity_ds):
    benchmark(lambda: catd(celebrity_ds.answers, celebrity_ds.schema))


@pytest.mark.benchmark(group="table7-inference")
def test_mv_median_celebrity(benchmark, celebrity_ds):
    benchmark(lambda: mv_median(celebrity_ds.answers, celebrity_ds.schema))


@pytest.mark.benchmark(group="fig12-throughput")
@pytest.mark.parametrize("n_rows", [100, 200, 400])
def test_tcrowd_throughput_scaling(benchmark, n_rows):
    """Fig. 12(b): runtime ≈ linear in |A|; answers/sec derivable from the
    reported time and the answer count (extra_info)."""
    ds = D.synthetic_table(n_rows=n_rows, m=10, n_workers=60, n_per_task=5, seed=3)
    res = benchmark.pedantic(
        lambda: tcrowd_em(ds.answers, ds.schema), rounds=2, iterations=1
    )
    benchmark.extra_info["n_answers"] = len(ds.answers)
    benchmark.extra_info["em_iters"] = res.n_iters
