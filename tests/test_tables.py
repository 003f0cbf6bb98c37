"""Tests for table materialization into the object store."""
import pandas as pd
import pytest

from repro.core import tables as T
from repro.s3sim import csvio


@pytest.fixture()
def pdf():
    return pd.DataFrame(
        {
            "k": range(10),
            "v": [i / 4 for i in range(10)],
            "d": pd.to_datetime(["1995-01-02"] * 10),
            "s": list("abcdefghij"),
        }
    )


def test_normalize_dates_to_iso(pdf):
    out = T.normalize(pdf)
    assert out["d"].tolist() == ["1995-01-02"] * 10


def test_schema_ddl_types(pdf):
    ddl = T.schema_ddl(T.normalize(pdf))
    assert ddl == "k BIGINT, v DOUBLE, d STRING, s STRING"


def test_apply_schema_roundtrip(pdf):
    norm = T.normalize(pdf)
    ddl = T.schema_ddl(norm)
    stringly = csvio.from_csv_bytes(csvio.to_csv_bytes(norm))
    typed = T.apply_schema(stringly, ddl)
    assert typed["k"].dtype == "int64"
    assert typed["v"].dtype == "float64"
    assert (typed["v"] == norm["v"]).all()


def test_write_table_partitions(fresh_store, pdf):
    t = T.write_table(fresh_store, "t", pdf, n_partitions=3)
    assert len(t.keys) == 3
    assert t.n_rows == 10
    assert all(fresh_store.exists(k) for k in t.keys)


def test_write_table_total_bytes(fresh_store, pdf):
    t = T.write_table(fresh_store, "t", pdf, n_partitions=2)
    assert t.total_bytes == sum(fresh_store.size(k) for k in t.keys)


def test_write_table_index_objects(fresh_store, pdf):
    t = T.write_table(fresh_store, "t", pdf, n_partitions=2, index_columns=("k",))
    for i in range(2):
        idx = csvio.from_csv_bytes(fresh_store.storage_read(t.index_key("k", i)))
        assert list(idx.columns) == ["k", "_offset", "_length"]


def test_index_offsets_fetch_rows(fresh_store, pdf):
    t = T.write_table(fresh_store, "t", pdf, n_partitions=1, index_columns=("k",))
    idx = csvio.from_csv_bytes(fresh_store.storage_read(t.index_key("k", 0)))
    off, ln = int(idx["_offset"][3]), int(idx["_length"][3])
    row = fresh_store.get(t.keys[0], (off, ln))
    assert row.decode().startswith("3,")


def test_write_table_parquet_twins(fresh_store, pdf):
    t = T.write_table(fresh_store, "t", pdf, n_partitions=2, parquet=True)
    assert len(t.parquet_keys) == 2
    assert t.parquet_bytes > 0


def test_read_stored_table_roundtrip(fresh_store, pdf):
    t = T.write_table(fresh_store, "t", pdf, n_partitions=3, index_columns=("k",))
    back = T.read_stored_table(fresh_store, "t")
    assert back.keys == t.keys
    assert back.n_rows == t.n_rows
    assert back.index_columns == ["k"]
    pd.testing.assert_frame_equal(back.pdf, t.pdf)


def test_get_or_create_reuses(fresh_store, pdf):
    calls = []

    def build():
        calls.append(1)
        return pdf

    T.get_or_create(fresh_store, "t", build, n_partitions=2)
    T.get_or_create(fresh_store, "t", build, n_partitions=2)
    assert len(calls) == 1


def test_get_or_create_rebuilds_for_missing_index(fresh_store, pdf):
    T.get_or_create(fresh_store, "t", lambda: pdf, n_partitions=2)
    t = T.get_or_create(
        fresh_store, "t", lambda: pdf, n_partitions=2, index_columns=("k",)
    )
    assert t.index_columns == ["k"]


def test_avg_row_bytes(fresh_store, pdf):
    t = T.write_table(fresh_store, "t", pdf, n_partitions=1)
    assert 10 < t.avg_row_bytes < 60
