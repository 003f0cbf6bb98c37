"""Tests for the s3select PySpark DataSource (Catalyst integration)."""
import pytest

from repro.core.tables import write_table
from repro.datasource.s3select import read_table
from repro.s3sim import ObjectStore


@pytest.fixture(scope="module")
def ds_store(spark, tmp_path_factory):
    import pandas as pd

    store = ObjectStore(tmp_path_factory.mktemp("ds"))
    pdf = pd.DataFrame(
        {
            "k": range(1000),
            "v": [i / 8 for i in range(1000)],
            "s": [f"cat{i % 5}" for i in range(1000)],
        }
    )
    write_table(store, "t", pdf, n_partitions=4, parquet=True)
    return store


def test_full_scan_all_rows(spark, ds_store):
    df = read_table(spark, ds_store.root, "t")
    assert df.count() == 1000


def test_schema_from_store(spark, ds_store):
    df = read_table(spark, ds_store.root, "t")
    assert [f.name for f in df.schema.fields] == ["k", "v", "s"]
    assert df.schema["k"].dataType.typeName() == "long"
    assert df.schema["v"].dataType.typeName() == "double"


def test_projection_option(spark, ds_store):
    df = read_table(spark, ds_store.root, "t", columns=["s", "k"])
    assert [f.name for f in df.schema.fields] == ["s", "k"]
    assert df.count() == 1000


def test_unknown_projection_column(spark, ds_store):
    with pytest.raises(Exception, match="columns not in"):
        read_table(spark, ds_store.root, "t", columns=["nope"]).count()


def test_filter_pushdown_reduces_returned_bytes(spark, ds_store):
    pos = ds_store.log.position()
    n = read_table(spark, ds_store.root, "t").filter("k < 10").count()
    pushed = ds_store.log.read_since(pos)
    pos = ds_store.log.position()
    n2 = read_table(spark, ds_store.root, "t", pushdown=False).filter("k < 10").count()
    baseline = ds_store.log.read_since(pos)
    assert n == n2 == 10
    assert pushed.bytes_returned < baseline.bytes_transferred / 10


def test_pushdown_and_baseline_agree(spark, ds_store):
    pred = "v >= 2.5 and s in ('cat1', 'cat3')"
    a = read_table(spark, ds_store.root, "t").filter(pred).toPandas()
    b = read_table(spark, ds_store.root, "t", pushdown=False).filter(pred).toPandas()
    a = a.sort_values("k").reset_index(drop=True)
    b = b.sort_values("k").reset_index(drop=True)
    assert a.equals(b)


def test_baseline_path_uses_plain_gets(spark, ds_store):
    pos = ds_store.log.position()
    read_table(spark, ds_store.root, "t", pushdown=False).count()
    u = ds_store.log.read_since(pos)
    assert u.select_requests == 0
    assert u.get_requests == 4  # one whole-object GET per partition
    assert u.bytes_scanned == 0


def test_pushdown_path_uses_select(spark, ds_store):
    pos = ds_store.log.position()
    read_table(spark, ds_store.root, "t").filter("k < 5").count()
    u = ds_store.log.read_since(pos)
    assert u.select_requests == 4
    assert u.get_requests == 0
    assert u.bytes_scanned > 0


def test_unsupported_filter_still_correct(spark, ds_store):
    # k % 2 is not expressible as a Catalyst Filter -> Spark evaluates it.
    df = read_table(spark, ds_store.root, "t").filter("k % 2 = 0 and k < 10")
    assert sorted(r.k for r in df.collect()) == [0, 2, 4, 6, 8]


def test_where_option_composes_with_filters(spark, ds_store):
    df = read_table(
        spark, ds_store.root, "t", where="s = 'cat1'"
    ).filter("k < 100")
    out = df.toPandas()
    assert (out["s"] == "cat1").all()
    assert (out["k"] < 100).all()
    assert len(out) == 20


def test_one_spark_partition_per_object(spark, ds_store):
    df = read_table(spark, ds_store.root, "t")
    assert df.rdd.getNumPartitions() == 4


def test_parquet_format(spark, ds_store):
    df = read_table(spark, ds_store.root, "t", columns=["k"], fmt="parquet")
    assert df.count() == 1000


def test_parquet_filter_pushdown(spark, ds_store):
    out = (
        read_table(spark, ds_store.root, "t", fmt="parquet")
        .filter("k >= 990")
        .toPandas()
    )
    assert sorted(out["k"]) == list(range(990, 1000))


def test_missing_table(spark, ds_store):
    with pytest.raises(Exception):
        read_table(spark, ds_store.root, "missing").count()
