"""Unit tests for the S3 Select request engine (usage + limits)."""
import pandas as pd
import pytest

from repro.s3sim import ObjectStore, csvio, parquetio, s3_select
from repro.s3sim.select_engine import MAX_SQL_BYTES, S3SelectError


@pytest.fixture()
def st(tmp_path):
    store = ObjectStore(tmp_path / "s")
    df = pd.DataFrame(
        {"a": range(100), "b": [f"s{i % 7}" for i in range(100)],
         "v": [i / 10 for i in range(100)]}
    )
    store.put("t.csv", csvio.to_csv_bytes(df))
    store.put("t.parquet", parquetio.to_parquet_bytes(df))
    return store


def test_select_returns_rows(st):
    out = s3_select(st, "t.csv", "SELECT a FROM S3Object WHERE a < 3")
    assert out["a"].tolist() == ["0", "1", "2"]


def test_select_records_one_request(st):
    pos = st.log.position()
    s3_select(st, "t.csv", "SELECT a FROM S3Object")
    assert st.log.read_since(pos).select_requests == 1


def test_scan_bytes_whole_object_for_filter(st):
    pos = st.log.position()
    s3_select(st, "t.csv", "SELECT a FROM S3Object WHERE a < 0")
    u = st.log.read_since(pos)
    assert u.bytes_scanned == st.size("t.csv")


def test_returned_bytes_track_result_size(st):
    pos = st.log.position()
    s3_select(st, "t.csv", "SELECT a FROM S3Object WHERE a < 0")
    empty = st.log.read_since(pos).bytes_returned
    pos = st.log.position()
    s3_select(st, "t.csv", "SELECT * FROM S3Object")
    full = st.log.read_since(pos).bytes_returned
    assert empty == 0
    assert full >= st.size("t.csv") - 100  # roughly the object minus header


def test_limit_without_where_scans_prefix(st):
    pos = st.log.position()
    s3_select(st, "t.csv", "SELECT a FROM S3Object LIMIT 10")
    u = st.log.read_since(pos)
    assert 0 < u.bytes_scanned < st.size("t.csv") / 2


def test_limit_with_where_scans_everything(st):
    pos = st.log.position()
    s3_select(st, "t.csv", "SELECT a FROM S3Object WHERE a >= 0 LIMIT 1")
    assert st.log.read_since(pos).bytes_scanned == st.size("t.csv")


def test_aggregate_query(st):
    out = s3_select(st, "t.csv", "SELECT SUM(a) AS s, COUNT(*) AS c FROM S3Object")
    assert out["s"].iloc[0] == sum(range(100))
    assert out["c"].iloc[0] == 100


def test_sql_size_limit_enforced(st):
    bits = "1" * (MAX_SQL_BYTES + 10)
    sql = f"SELECT a FROM S3Object WHERE SUBSTRING('{bits}', 1, 1) = '1'"
    with pytest.raises(S3SelectError, match="256"):
        s3_select(st, "t.csv", sql)


def test_missing_object(st):
    with pytest.raises(KeyError):
        s3_select(st, "nope.csv", "SELECT a FROM S3Object")


def test_bad_format(st):
    with pytest.raises(S3SelectError, match="format"):
        s3_select(st, "t.csv", "SELECT a FROM S3Object", input_format="orc")


def test_parquet_matches_csv_result(st):
    sql = "SELECT a, b FROM S3Object WHERE b = 's3' AND a < 50"
    csv_out = s3_select(st, "t.csv", sql)
    pq_out = s3_select(st, "t.parquet", sql, input_format="parquet")
    assert pq_out["a"].astype(int).tolist() == csv_out["a"].astype(int).tolist()


def test_parquet_scans_only_referenced_columns(st):
    pos = st.log.position()
    s3_select(st, "t.parquet", "SELECT a FROM S3Object", input_format="parquet")
    narrow = st.log.read_since(pos).bytes_scanned
    pos = st.log.position()
    s3_select(st, "t.parquet", "SELECT * FROM S3Object", input_format="parquet")
    wide = st.log.read_since(pos).bytes_scanned
    assert narrow < wide


def test_parquet_returns_csv_sized_payload(st):
    """Responses are CSV even for Parquet input (paper SIX)."""
    pos = st.log.position()
    out = s3_select(st, "t.parquet", "SELECT v FROM S3Object", input_format="parquet")
    u = st.log.read_since(pos)
    assert u.bytes_returned == len(csvio.to_csv_bytes(out, header=False))
