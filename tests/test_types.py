"""Unit tests for the tuple/collection type system and RowVector."""
import pandas as pd
import pytest

from repro.core.types import (
    BOOL,
    FLOAT64,
    INT64,
    STR,
    Atom,
    RowVector,
    RowVectorType,
    TupleType,
)


def tt(**fields):
    return TupleType(list(fields.items()))


class TestAtoms:
    def test_equality(self):
        assert INT64 == Atom("int64")
        assert INT64 != FLOAT64

    def test_hashable(self):
        assert len({INT64, Atom("int64"), FLOAT64}) == 2

    def test_repr(self):
        assert repr(STR) == "str"


class TestTupleType:
    def test_names_in_order(self):
        t = tt(a=INT64, b=STR)
        assert t.names == ("a", "b")

    def test_field_type(self):
        t = tt(a=INT64, b=STR)
        assert t.field_type("b") == STR

    def test_field_type_missing(self):
        with pytest.raises(KeyError):
            tt(a=INT64).field_type("z")

    def test_duplicate_names_rejected(self):
        with pytest.raises(TypeError):
            TupleType([("a", INT64), ("a", STR)])

    def test_project_preserves_requested_order(self):
        t = tt(a=INT64, b=STR, c=BOOL)
        assert t.project(["c", "a"]).names == ("c", "a")

    def test_concat(self):
        t = tt(a=INT64).concat(tt(b=STR))
        assert t.names == ("a", "b")

    def test_concat_overlap_rejected(self):
        with pytest.raises(TypeError):
            tt(a=INT64).concat(tt(a=STR))

    def test_equality_and_hash(self):
        assert tt(a=INT64) == tt(a=INT64)
        assert tt(a=INT64) != tt(a=FLOAT64)
        assert hash(tt(a=INT64)) == hash(tt(a=INT64))

    def test_nested_collection_type(self):
        inner = tt(k=INT64, v=FLOAT64)
        outer = tt(pid=INT64, data=RowVectorType(inner))
        assert outer.field_type("data").tuple_type == inner
        assert "RowVector" in repr(outer)


class TestRowVector:
    def test_wraps_dataframe(self):
        rv = RowVector(pd.DataFrame({"a": [1, 2]}))
        assert len(rv) == 2
        assert rv.columns == ("a",)

    def test_rejects_non_dataframe(self):
        with pytest.raises(TypeError):
            RowVector([{"a": 1}])

    def test_iter_rows_plain_python(self):
        rv = RowVector(pd.DataFrame({"a": [1, 2], "b": [0.5, 1.5]}))
        rows = list(rv.iter_rows())
        assert rows == [{"a": 1, "b": 0.5}, {"a": 2, "b": 1.5}]
        assert all(type(r["a"]) is int for r in rows)

    def test_from_rows_roundtrip(self):
        rows = [{"a": 1}, {"a": 2}]
        assert list(RowVector.from_rows(rows).iter_rows()) == rows

    def test_from_rows_empty_with_columns(self):
        rv = RowVector.from_rows([], columns=["x", "y"])
        assert len(rv) == 0
        assert rv.columns == ("x", "y")

    def test_equality(self):
        a = RowVector(pd.DataFrame({"a": [1]}))
        b = RowVector(pd.DataFrame({"a": [1]}))
        assert a == b

    def test_nested_rowvector_cells(self):
        inner = RowVector(pd.DataFrame({"k": [1]}))
        outer = RowVector(pd.DataFrame({"pid": [0], "data": pd.Series([inner], dtype=object)}))
        (row,) = outer.iter_rows()
        assert row["data"] == inner
