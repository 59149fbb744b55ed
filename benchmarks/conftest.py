"""Benchmark fixtures: pre-generated fields so data synthesis stays out
of the timed region."""
import pytest

from repro.datasets import generate


@pytest.fixture(scope="session")
def miranda_bench():
    return generate("Miranda", "bench")


@pytest.fixture(scope="session")
def cesm_bench():
    return generate("CESM-ATM", "bench")


@pytest.fixture(scope="session")
def jhtdb_bench():
    return generate("JHTDB", "bench")
