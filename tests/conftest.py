"""Shared fixtures: cached corpora and discovery indexes.

The ``spark`` session fixture comes from the repo-root conftest.
"""
import pytest

from repro import workloads


@pytest.fixture(scope="session")
def wdc():
    return workloads.corpus("wdc")


@pytest.fixture(scope="session")
def chembl():
    return workloads.corpus("chembl")


@pytest.fixture(scope="session")
def opendata():
    return workloads.corpus("opendata")


@pytest.fixture(scope="session")
def wdc_index(spark, wdc):
    return workloads.index(spark, "wdc")


@pytest.fixture(scope="session")
def chembl_index(spark, chembl):
    return workloads.index(spark, "chembl")
