"""Shared fixtures for the test suite.

Session-scoped: dataset tasks at small scale and one fitted BClean
model per dataset actually exercised end-to-end, so the many tests that
inspect the same model don't refit it.
"""
import pytest

from repro.datasets.registry import load_task


@pytest.fixture(scope="session")
def hospital_task():
    return load_task("hospital", scale=0.25, seed=1)


@pytest.fixture(scope="session")
def flights_task():
    return load_task("flights", scale=0.25, seed=1)


@pytest.fixture(scope="session")
def beers_task():
    return load_task("beers", scale=0.25, seed=1)


@pytest.fixture(scope="session")
def fitted_hospital(spark, hospital_task):
    from repro.core.cleaner import BClean
    t = hospital_task
    return BClean("PI").fit(
        spark, t.dirty, ucs=t.ucs, numeric_attrs=t.numeric_attrs,
        bn_edits=t.bn_edits)
