"""Shared fixtures: one simulated-S3 store with a prepared LINEITEM layout.

The sorted-Parquet dataset (SF 0.01, 16 files, 2 row groups each) is built
once per session; engine runs of Q1/Q6 over it are also session-scoped since
many tests only inspect their metrics.
"""
import pytest

from repro.s3.store import S3Store
from repro.sim import experiments as X

SF = 0.01
N_FILES = 16


@pytest.fixture(scope="session")
def store_root(tmp_path_factory) -> str:
    return str(tmp_path_factory.mktemp("s3root"))


@pytest.fixture(scope="session")
def store(store_root) -> S3Store:
    return S3Store(store_root)


@pytest.fixture(scope="session")
def lineitem_ds(spark, store_root):
    """(DatasetInfo, sorted pandas frame) of the prepared LINEITEM layout."""
    return X.prepare(spark, store_root, sf=SF, n_files=N_FILES, row_groups_per_file=2)


@pytest.fixture(scope="session")
def mq1(spark, store_root, lineitem_ds):
    info, _ = lineitem_ds
    return X.measure_query(spark, store_root, info, "q1")


@pytest.fixture(scope="session")
def mq6(spark, store_root, lineitem_ds):
    info, _ = lineitem_ds
    return X.measure_query(spark, store_root, info, "q6")
