"""Shared fixtures for the per-figure benchmarks.

Benchmarks run at reduced scale (SF~=0.1-equivalent: thousands of keys,
dictionaries <= 4K entries except the fixed Double-Char) so the whole
suite stays in minutes; the jobs/ entrypoints run the full sweeps that
EXPERIMENTS.md records.
"""
import pytest

from repro.workloads.datasets import dataset_keys


@pytest.fixture(scope="session")
def email_bench_keys():
    return dataset_keys("email", 6000, seed=100)


@pytest.fixture(scope="session")
def email_sample(email_bench_keys):
    return email_bench_keys[:600]
