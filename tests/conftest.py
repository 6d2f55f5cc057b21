"""Shared test fixtures: tiny prepared datasets, reused session-wide.

Pre-processing (Word2Vec) and rule mining are the expensive parts, so
each surrogate is prepared once per pytest session at SF-test scale
(1–2K rows) and shared by all test modules.
"""
import pytest

from repro.experiments.common import Prepared, prepare


@pytest.fixture(scope="session")
def prep_sp(spark) -> Prepared:
    return prepare(spark, "SP", n_rows=1500, seed=0)


@pytest.fixture(scope="session")
def prep_fl(spark) -> Prepared:
    return prepare(spark, "FL", n_rows=2000, seed=0)


@pytest.fixture(scope="session")
def prep_cy(spark) -> Prepared:
    return prepare(spark, "CY", n_rows=1500, seed=0)
