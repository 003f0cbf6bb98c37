"""Unit tests for Catalyst Filter -> S3 Select WHERE translation."""
import datetime

import pytest
from pyspark.sql.datasource import (
    EqualTo, GreaterThan, GreaterThanOrEqual, In, IsNotNull, IsNull,
    LessThan, LessThanOrEqual, Not, StringContains, StringEndsWith,
    StringStartsWith,
)

from repro.datasource.translate import Untranslatable, filter_to_sql, split_filters

NUM = {"a", "n"}


def test_equal_string():
    assert filter_to_sql(EqualTo(("b",), "x"), NUM) == "b = 'x'"


def test_equal_numeric_column_casts():
    assert filter_to_sql(EqualTo(("a",), 3), NUM) == "CAST(a AS FLOAT) = 3"


def test_comparisons():
    assert filter_to_sql(GreaterThan(("a",), 1.5), NUM) == "CAST(a AS FLOAT) > 1.5"
    assert filter_to_sql(LessThan(("b",), "m"), NUM) == "b < 'm'"
    assert filter_to_sql(GreaterThanOrEqual(("a",), 0), NUM) == "CAST(a AS FLOAT) >= 0"
    assert filter_to_sql(LessThanOrEqual(("a",), 9), NUM) == "CAST(a AS FLOAT) <= 9"


def test_in_list():
    assert filter_to_sql(In(("b",), ("x", "y")), NUM) == "b IN ('x', 'y')"


def test_in_list_numeric():
    assert filter_to_sql(In(("a",), (1, 2)), NUM) == "CAST(a AS FLOAT) IN (1, 2)"


def test_null_checks():
    assert filter_to_sql(IsNull(("b",)), NUM) == "b IS NULL"
    assert filter_to_sql(IsNotNull(("b",)), NUM) == "b IS NOT NULL"


def test_not_wraps_child():
    assert filter_to_sql(Not(EqualTo(("b",), "x")), NUM) == "NOT (b = 'x')"


def test_string_matchers_become_like():
    assert filter_to_sql(StringStartsWith(("b",), "PRO"), NUM) == "b LIKE 'PRO%'"
    assert filter_to_sql(StringEndsWith(("b",), "X"), NUM) == "b LIKE '%X'"
    assert filter_to_sql(StringContains(("b",), "mid"), NUM) == "b LIKE '%mid%'"


def test_quote_escaping():
    assert filter_to_sql(EqualTo(("b",), "o'brien"), NUM) == "b = 'o''brien'"


def test_date_literal():
    out = filter_to_sql(LessThan(("b",), datetime.date(1995, 3, 15)), NUM)
    assert out == "b < '1995-03-15'"


def test_numeric_string_value_against_numeric_column():
    assert filter_to_sql(EqualTo(("a",), "2"), NUM) == "CAST(a AS FLOAT) = 2.0"


def test_nested_column_untranslatable():
    with pytest.raises(Untranslatable):
        filter_to_sql(EqualTo(("a", "b"), 1), NUM)


def test_null_literal_untranslatable():
    with pytest.raises(Untranslatable):
        filter_to_sql(EqualTo(("b",), None), NUM)


def test_boolean_untranslatable():
    with pytest.raises(Untranslatable):
        filter_to_sql(EqualTo(("b",), True), NUM)


def test_split_filters_partitions():
    fs = [EqualTo(("b",), "x"), EqualTo(("a", "b"), 1), LessThan(("a",), 2)]
    pushed, rejected = split_filters(fs, NUM)
    assert pushed == ["b = 'x'", "CAST(a AS FLOAT) < 2"]
    assert rejected == [fs[1]]


def test_pushed_fragments_parse_in_dialect():
    from repro.s3sim.sql_parser import parse

    fs = [
        EqualTo(("b",), "x"), In(("a",), (1, 2)), Not(IsNull(("b",))),
        StringStartsWith(("b",), "PRO"),
    ]
    pushed, rejected = split_filters(fs, NUM)
    assert not rejected
    parse("SELECT b FROM S3Object WHERE " + " AND ".join(f"({p})" for p in pushed))
