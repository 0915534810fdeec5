"""Shared dataset fixtures for the test suite.

Session-scoped so the (deterministic) synthetic corpora and their
Spark views are built once; individual tests must not mutate them.
"""
import pytest

from repro.core import histories
from repro.mobility import generator


@pytest.fixture(scope="session")
def cab_pair():
    """Tiny Cab-like linkage instance (24 taxis, 6 h)."""
    return generator.cab_pair(scale="test", seed=0)


@pytest.fixture(scope="session")
def cab_records(spark, cab_pair):
    rec_e, rec_i = cab_pair.to_spark(spark)
    return rec_e.cache(), rec_i.cache()


@pytest.fixture(scope="session")
def cab_bins(cab_records):
    """Default-parameter history bins (level 12, 15-minute windows)."""
    rec_e, rec_i = cab_records
    be = histories.build_bins(rec_e, level=12, window_sec=900).cache()
    bi = histories.build_bins(rec_i, level=12, window_sec=900).cache()
    return be, bi


@pytest.fixture(scope="session")
def sm_pair():
    """Tiny SM-like linkage instance (300 users, 26 days)."""
    return generator.sm_pair(scale="test", seed=0)


@pytest.fixture(scope="session")
def sm_records(spark, sm_pair):
    rec_e, rec_i = sm_pair.to_spark(spark)
    return rec_e.cache(), rec_i.cache()
