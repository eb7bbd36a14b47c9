"""Benchmark fixtures: pre-generated datasets shared across benchmarks."""
import pytest

from repro.crowd import datasets as D


@pytest.fixture(scope="session")
def celebrity_ds():
    return D.celebrity_like(seed=7)


@pytest.fixture(scope="session")
def restaurant_ds():
    return D.restaurant_like(seed=11)


@pytest.fixture(scope="session")
def emotion_ds():
    return D.emotion_like(seed=13)
