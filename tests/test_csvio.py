"""Unit tests for repro.s3sim.csvio (wire format + byte offsets)."""
import pandas as pd
import pytest

from repro.s3sim import csvio


@pytest.fixture()
def frame():
    return pd.DataFrame({"a": [1, 2, 3], "b": ["x", "y", "z"]})


def test_roundtrip_is_stringly(frame):
    out = csvio.from_csv_bytes(csvio.to_csv_bytes(frame))
    assert list(out.columns) == ["a", "b"]
    assert out["a"].tolist() == ["1", "2", "3"]  # untyped, like S3 Select CSV


def test_empty_cells_become_empty_strings():
    df = pd.DataFrame({"a": ["1", "", "3"]})
    out = csvio.from_csv_bytes(csvio.to_csv_bytes(df))
    assert out["a"].tolist() == ["1", "", "3"]


def test_headerless_roundtrip(frame):
    data = csvio.to_csv_bytes(frame, header=False)
    out = csvio.from_csv_bytes(data, header=False, columns=["a", "b"])
    assert out["b"].tolist() == ["x", "y", "z"]


def test_row_byte_offsets_cover_all_rows(frame):
    data = csvio.to_csv_bytes(frame)
    offs = csvio.row_byte_offsets(data)
    assert len(offs) == 3


def test_row_byte_offsets_slice_to_rows(frame):
    data = csvio.to_csv_bytes(frame)
    for i, (off, ln) in enumerate(csvio.row_byte_offsets(data)):
        row = data[off:off + ln]
        assert row.decode().strip() == f"{frame.a[i]},{frame.b[i]}"


def test_row_byte_offsets_no_trailing_newline():
    data = b"h\n1,a\n2,b"  # last row unterminated
    offs = csvio.row_byte_offsets(data)
    assert len(offs) == 2
    off, ln = offs[1]
    assert data[off:off + ln] == b"2,b"


def test_offsets_are_contiguous(frame):
    data = csvio.to_csv_bytes(frame)
    offs = csvio.row_byte_offsets(data)
    header_end = data.index(b"\n") + 1
    assert offs[0][0] == header_end
    for (o1, l1), (o2, _) in zip(offs, offs[1:]):
        assert o1 + l1 == o2


def test_parse_rows_concatenated(frame):
    data = csvio.to_csv_bytes(frame)
    offs = csvio.row_byte_offsets(data)
    chunk = data[offs[0][0]:offs[0][0] + offs[0][1]] + data[offs[2][0]:offs[2][0] + offs[2][1]]
    out = csvio.parse_rows(chunk, ["a", "b"])
    assert out["a"].tolist() == ["1", "3"]


def test_parse_rows_empty():
    out = csvio.parse_rows(b"", ["a", "b"])
    assert len(out) == 0
    assert list(out.columns) == ["a", "b"]


def test_values_with_commas_quoted():
    df = pd.DataFrame({"a": ["x,y", "z"]})
    out = csvio.from_csv_bytes(csvio.to_csv_bytes(df))
    assert out["a"].tolist() == ["x,y", "z"]


def test_float_rendering_stable():
    df = pd.DataFrame({"v": [0.5, 1.25]})
    out = csvio.from_csv_bytes(csvio.to_csv_bytes(df))
    assert out["v"].tolist() == ["0.5", "1.25"]
