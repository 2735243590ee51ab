"""Catalog metadata tests (schemas, uniqueness, pivot values, layouts)."""
import pandas as pd
import pytest

from repro.core.catalog import (
    Catalog, TableSchema, coo_matrix_schema, dense_matrix_schema,
    schema_from_pandas,
)


class TestTableSchema:
    def test_is_unique_subset(self):
        s = TableSchema("t", ("a", "b", "c"), (frozenset({"a"}),))
        assert s.is_unique({"a"})
        assert s.is_unique({"a", "b"})
        assert not s.is_unique({"b"})

    def test_composite_key(self):
        s = TableSchema("t", ("a", "b", "c"), (frozenset({"a", "b"}),))
        assert s.is_unique({"a", "b", "c"})
        assert not s.is_unique({"a"})


class TestCatalog:
    def test_add_and_lookup(self):
        cat = Catalog().add(TableSchema("t", ("a",)))
        assert cat.table("t").cols == ("a",)

    def test_unknown_table(self):
        with pytest.raises(KeyError, match="unknown relation"):
            Catalog().table("nope")

    def test_pivot_values_star(self):
        cat = Catalog()
        cat.pivot_values[("*", "sex")] = ["F", "M"]
        assert cat.distinct_values("births", "sex") == ["F", "M"]

    def test_pivot_values_missing(self):
        with pytest.raises(KeyError, match="pivot_table"):
            Catalog().distinct_values("t", "c")


class TestBuilders:
    def test_schema_from_pandas(self):
        pdf = pd.DataFrame({"x": [1], "y": [2.0]})
        s = schema_from_pandas("t", pdf, unique=[["x"]])
        assert s.cols == ("x", "y")
        assert s.is_unique({"x"})

    def test_dense_schema(self):
        s = dense_matrix_schema("m", 3)
        assert s.cols == ("id", "c0", "c1", "c2")
        assert s.layout == "dense" and s.id_col == "id"
        assert s.is_unique({"id"})

    def test_coo_schema(self):
        s = coo_matrix_schema("m")
        assert s.cols == ("row", "col", "val")
        assert s.layout == "coo"
        assert s.is_unique({"row", "col"})
