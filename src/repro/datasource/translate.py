"""Translate Catalyst-pushed filters into S3 Select WHERE text.

Spark hands the reader ``pyspark.sql.datasource.Filter`` instances.
We translate the subset S3 Select can evaluate; anything else is
returned to Spark for post-scan evaluation (the contract of
``DataSourceReader.pushFilters``).

Typing rule: our CSV objects are untyped strings, so predicates against
numeric table columns are wrapped in ``CAST(col AS FLOAT)`` -- exactly
how PushdownDB emits S3 Select SQL -- while string columns (including
ISO dates) compare lexicographically.
"""
from __future__ import annotations

import datetime as _dt

from pyspark.sql.datasource import (
    EqualTo, Filter, GreaterThan, GreaterThanOrEqual, In, IsNotNull, IsNull,
    LessThan, LessThanOrEqual, Not, StringContains, StringEndsWith,
    StringStartsWith,
)

_OPS = {
    EqualTo: "=",
    GreaterThan: ">",
    GreaterThanOrEqual: ">=",
    LessThan: "<",
    LessThanOrEqual: "<=",
}


class Untranslatable(Exception):
    """This filter cannot run inside S3 Select; Spark must evaluate it."""


def _quote(s: str) -> str:
    return "'" + s.replace("'", "''") + "'"


def _column(attr: tuple, numeric_cols: set) -> tuple[str, bool]:
    """Render a column reference; returns (sql, is_numeric)."""
    if len(attr) != 1:
        raise Untranslatable(f"nested column {attr!r}")
    name = attr[0]
    if name.lower() in numeric_cols:
        return f"CAST({name} AS FLOAT)", True
    return name, False


def _value(v, numeric: bool) -> str:
    if v is None:
        raise Untranslatable("NULL literal in comparison")
    if isinstance(v, bool):
        raise Untranslatable("boolean literal")
    if isinstance(v, (int, float)):
        return repr(v)
    if isinstance(v, (_dt.date, _dt.datetime)):
        return _quote(v.strftime("%Y-%m-%d"))
    if isinstance(v, str):
        if numeric:
            return repr(float(v))
        return _quote(v)
    raise Untranslatable(f"unsupported literal {v!r}")


def filter_to_sql(f: Filter, numeric_cols: set) -> str:
    """One Catalyst filter -> S3 Select boolean expression text.

    Raises :class:`Untranslatable` for anything outside the dialect.
    """
    for cls, op in _OPS.items():
        if isinstance(f, cls):
            col, numeric = _column(f.attribute, numeric_cols)
            return f"{col} {op} {_value(f.value, numeric)}"
    if isinstance(f, In):
        col, numeric = _column(f.attribute, numeric_cols)
        items = ", ".join(_value(v, numeric) for v in f.value)
        return f"{col} IN ({items})"
    if isinstance(f, IsNull):
        col, _ = _column(f.attribute, numeric_cols)
        return f"{col} IS NULL"
    if isinstance(f, IsNotNull):
        col, _ = _column(f.attribute, numeric_cols)
        return f"{col} IS NOT NULL"
    if isinstance(f, Not):
        return f"NOT ({filter_to_sql(f.child, numeric_cols)})"
    if isinstance(f, StringStartsWith):
        col, _ = _column(f.attribute, numeric_cols)
        return f"{col} LIKE {_quote(f.value + '%')}"
    if isinstance(f, StringEndsWith):
        col, _ = _column(f.attribute, numeric_cols)
        return f"{col} LIKE {_quote('%' + f.value)}"
    if isinstance(f, StringContains):
        col, _ = _column(f.attribute, numeric_cols)
        return f"{col} LIKE {_quote('%' + f.value + '%')}"
    raise Untranslatable(f"unsupported filter {type(f).__name__}")


def split_filters(
    filters: list, numeric_cols: set
) -> tuple[list[str], list[Filter]]:
    """Partition filters into (pushed SQL fragments, unsupported)."""
    pushed: list[str] = []
    rejected: list[Filter] = []
    for f in filters:
        try:
            pushed.append(filter_to_sql(f, numeric_cols))
        except Untranslatable:
            rejected.append(f)
    return pushed, rejected
