"""Shared fixtures for the test suite.

The session-scoped ``spark`` fixture comes from the repo-root
conftest.py. Here we add a session-scoped object store and small
(SF=0.01-ish) tables reused across operator tests -- regenerating them
per test would dominate runtime. The store's usage log is shared, which
is safe because Runner attributes usage by log-position diffs and
pytest runs tests sequentially.
"""
import pytest

from repro.core.tables import get_or_create, load_tpch
from repro.s3sim import ObjectStore

TEST_SF = 0.01
TEST_PARTITIONS = 4


def new_runner_for(store: ObjectStore):
    """A fresh Runner over the shared store (usage attributed by log diff)."""
    from repro.core.runner import Runner

    return Runner(store)


@pytest.fixture(scope="session")
def store(tmp_path_factory) -> ObjectStore:
    return ObjectStore(tmp_path_factory.mktemp("s3store"))


@pytest.fixture()
def fresh_store(tmp_path) -> ObjectStore:
    """An isolated store for tests that assert on global usage totals."""
    return ObjectStore(tmp_path / "store")


@pytest.fixture(scope="session")
def tpch(spark, store) -> dict:
    """TPC-H-lite at SF=0.01 (lineitem 60k rows), 4 objects per table."""
    return load_tpch(spark, store, sf=TEST_SF, n_partitions=TEST_PARTITIONS)


@pytest.fixture(scope="session")
def tpch_tables(tpch) -> dict:
    """Alias for tests that import ``repro.core.tpch`` under that name."""
    return tpch


@pytest.fixture(scope="session")
def filter_table(spark, store):
    from repro import synth_data

    # 16 partitions (the benchmark default): projected scan parallelism
    # matters for the Fig 1 shape assertions.
    return get_or_create(
        store,
        "test_filter_table",
        lambda: synth_data.filter_table(spark, n=20_000).toPandas(),
        n_partitions=16,
        index_columns=("u",),
    )


@pytest.fixture(scope="session")
def groups_zipf(spark, store):
    from repro import synth_data

    return get_or_create(
        store,
        "test_groups_zipf",
        lambda: synth_data.groups_table(
            spark, n=20_000, kind="zipf", theta=1.1
        ).toPandas(),
        n_partitions=TEST_PARTITIONS,
    )


@pytest.fixture(scope="session")
def groups_uniform(spark, store):
    from repro import synth_data

    return get_or_create(
        store,
        "test_groups_uniform",
        lambda: synth_data.groups_table(spark, n=20_000, kind="uniform").toPandas(),
        n_partitions=TEST_PARTITIONS,
    )
