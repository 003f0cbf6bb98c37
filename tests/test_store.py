"""Unit tests for repro.s3sim.store (the S3 request surface)."""
import pytest

from repro.s3sim.store import ObjectStore


@pytest.fixture()
def st(tmp_path):
    return ObjectStore(tmp_path / "s")


def test_put_get_roundtrip(st):
    st.put("a/b.csv", b"hello")
    assert st.get("a/b.csv") == b"hello"


def test_put_records_usage(st):
    st.put("k", b"x")
    assert st.log.total().put_requests == 1


def test_get_records_transfer_bytes(st):
    st.put("k", b"abcdef")
    pos = st.log.position()
    st.get("k")
    u = st.log.read_since(pos)
    assert u.get_requests == 1
    assert u.bytes_transferred == 6


def test_ranged_get(st):
    st.put("k", b"0123456789")
    assert st.get("k", (2, 3)) == b"234"


def test_ranged_get_bills_only_range(st):
    st.put("k", b"0123456789")
    pos = st.log.position()
    st.get("k", (0, 4))
    assert st.log.read_since(pos).bytes_transferred == 4


def test_ranged_get_past_end_truncates(st):
    st.put("k", b"01234")
    assert st.get("k", (3, 100)) == b"34"


def test_ranged_get_negative_rejected(st):
    st.put("k", b"0123")
    with pytest.raises(ValueError):
        st.get("k", (-1, 2))


def test_get_missing_raises(st):
    with pytest.raises(KeyError):
        st.get("nope")


def test_size(st):
    st.put("k", b"abc")
    assert st.size("k") == 3


def test_size_missing_raises(st):
    with pytest.raises(KeyError):
        st.size("nope")


def test_exists_and_delete(st):
    st.put("k", b"x")
    assert st.exists("k")
    st.delete("k")
    assert not st.exists("k")


def test_list_keys_prefix(st):
    st.put("t/part0.csv", b"a")
    st.put("t/part1.csv", b"b")
    st.put("other/x.csv", b"c")
    assert st.list_keys("t/") == ["t/part0.csv", "t/part1.csv"]


def test_storage_read_not_billed(st):
    st.put("k", b"abc")
    pos = st.log.position()
    assert st.storage_read("k") == b"abc"
    u = st.log.read_since(pos)
    assert u.get_requests == 0
    assert u.bytes_transferred == 0


def test_invalid_keys_rejected(st):
    for bad in ("", "/abs", "a/../b"):
        with pytest.raises(KeyError):
            st.get(bad)


def test_meta_roundtrip(st):
    st.put_meta("t/schema.ddl", "a BIGINT")
    assert st.get_meta("t/schema.ddl") == "a BIGINT"


def test_meta_not_billed(st):
    pos = st.log.position()
    st.put_meta("m", "x")
    st.get_meta("m")
    assert st.log.read_since(pos).total_requests == 0
