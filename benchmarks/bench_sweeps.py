"""Benchmark for the §6.5 synthetic sweep harness (one grid cell)."""
import pytest

from repro.core.em import tcrowd_em
from repro.crowd import datasets as D


@pytest.mark.benchmark(group="sweeps")
def test_sweep_cell_generate_and_infer(benchmark):
    def cell():
        ds = D.synthetic_table(seed=42)
        return tcrowd_em(ds.answers, ds.schema)

    res = benchmark.pedantic(cell, rounds=2, iterations=1)
    assert res.converged or res.n_iters == 40


@pytest.mark.benchmark(group="sweeps")
def test_noise_injection(benchmark, celebrity_ds):
    noisy = benchmark(lambda: D.add_noise(celebrity_ds, gamma=0.3, seed=1))
    assert len(noisy.answers) == len(celebrity_ds.answers)
