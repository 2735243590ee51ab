"""Catalog of base relations: schema, uniqueness and layout metadata.

The paper collects this "contextual information" from the DBMS catalog and
from ``@pytond`` decorator arguments (Section III-A); here the catalog is an
explicit Python object shared by the frontend (type inference), the
optimizer (group/aggregate + self-join elimination need uniqueness) and the
SQL generator (schemas of base relations).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Optional

import pandas as pd


@dataclass
class TableSchema:
    """Schema of a base relation.

    ``layout`` is ``relation`` (ordinary table), ``dense`` (matrix stored as
    ``id, c0..cn-1``) or ``coo`` (sparse matrix stored as ``row, col, val``).
    ``unique`` lists column sets known to be unique (primary keys etc.);
    ``id_col`` names the dense-layout row-id column.
    """

    name: str
    cols: tuple[str, ...]
    unique: tuple[frozenset, ...] = ()
    layout: str = "relation"
    id_col: Optional[str] = None

    def is_unique(self, colset: Iterable[str]) -> bool:
        cs = set(colset)
        return any(u <= cs for u in self.unique)


@dataclass
class Catalog:
    """All base relations plus decorator-style annotations.

    ``pivot_values`` maps ``(table-or-*, column)`` to the list of distinct
    values needed to translate ``pivot_table`` (paper Section III-C).
    """

    tables: dict[str, TableSchema] = field(default_factory=dict)
    pivot_values: dict[tuple[str, str], list] = field(default_factory=dict)

    def add(self, schema: TableSchema) -> "Catalog":
        self.tables[schema.name] = schema
        return self

    def table(self, name: str) -> TableSchema:
        if name not in self.tables:
            raise KeyError(f"unknown relation {name!r}; known: {sorted(self.tables)}")
        return self.tables[name]

    def distinct_values(self, table: str, col: str) -> list:
        for key in ((table, col), ("*", col)):
            if key in self.pivot_values:
                return self.pivot_values[key]
        raise KeyError(
            f"pivot_table over {table}.{col} needs distinct values passed via "
            "the @pytond decorator (pivot_values=...)"
        )


def schema_from_pandas(
    name: str,
    pdf: pd.DataFrame,
    *,
    unique: Iterable[Iterable[str]] = (),
    layout: str = "relation",
    id_col: Optional[str] = None,
) -> TableSchema:
    """Build a :class:`TableSchema` from a pandas frame (column names only;
    TondIR is positional so dtypes stay with the data)."""
    return TableSchema(
        name,
        tuple(map(str, pdf.columns)),
        tuple(frozenset(u) for u in unique),
        layout,
        id_col,
    )


def dense_matrix_schema(name: str, n_cols: int) -> TableSchema:
    """Dense matrix relation ``name(id, c0..c{n-1})`` with unique id."""
    cols = ("id",) + tuple(f"c{i}" for i in range(n_cols))
    return TableSchema(name, cols, (frozenset({"id"}),), "dense", "id")


def coo_matrix_schema(name: str) -> TableSchema:
    """Sparse COO matrix relation ``name(row, col, val)``."""
    return TableSchema(
        name, ("row", "col", "val"), (frozenset({"row", "col"}),), "coo", None
    )
