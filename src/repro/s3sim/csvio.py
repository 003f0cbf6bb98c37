"""CSV serialization for simulated S3 objects.

S3 Select operates on CSV (or Parquet) objects and *always returns CSV*
regardless of input format (paper SIX). We therefore make CSV the wire
format everywhere: objects are CSV with a header row, values are
strings, and typing happens via ``CAST`` inside S3 Select queries or via
the table schema on the compute side -- the same contract real S3 Select
has.

This module also computes per-row byte offsets at write time, which the
paper's index tables (SIV-A) store so that individual rows can later be
fetched with single-byte-range GETs.
"""
from __future__ import annotations

import io

import pandas as pd


def to_csv_bytes(df: pd.DataFrame, header: bool = True) -> bytes:
    """Serialize a frame to CSV bytes (header row included by default)."""
    buf = io.StringIO()
    df.to_csv(buf, index=False, header=header)
    return buf.getvalue().encode()


def from_csv_bytes(data: bytes, header: bool = True, columns: list[str] | None = None) -> pd.DataFrame:
    """Parse CSV bytes into an all-string frame.

    Every column is ``str`` dtype and missing cells become empty strings
    -- mirroring S3 Select, where CSV fields are untyped until CAST.
    """
    kwargs: dict = {"dtype": str, "keep_default_na": False}
    if header:
        df = pd.read_csv(io.BytesIO(data), **kwargs)
    else:
        df = pd.read_csv(io.BytesIO(data), header=None, names=columns, **kwargs)
    return df


def row_byte_offsets(data: bytes) -> list[tuple[int, int]]:
    """``(offset, length)`` of every data row in a header-ful CSV object.

    Length includes the trailing newline so a ranged GET returns exactly
    one parseable CSV line. Offsets are what the index table stores.
    """
    out: list[tuple[int, int]] = []
    # Skip the header line.
    start = data.index(b"\n") + 1
    n = len(data)
    while start < n:
        try:
            end = data.index(b"\n", start) + 1
        except ValueError:  # final row without trailing newline
            end = n
        out.append((start, end - start))
        start = end
    return out


def parse_rows(data: bytes, columns: list[str]) -> pd.DataFrame:
    """Parse header-less CSV row bytes (e.g. concatenated ranged GETs)."""
    if not data.strip():
        return pd.DataFrame({c: pd.Series(dtype=str) for c in columns})
    return from_csv_bytes(data, header=False, columns=columns)
