"""Public PyTond API: the ``@pytond`` decorator and the compile pipeline.

A decorated function remains a plain Python function — calling it with real
pandas/NumPy inputs runs the Pandas baseline. ``compile_pytond`` turns it
into SQL via TondIR: translate -> optimize(level) -> codegen(dialect).
"""
from __future__ import annotations

import functools
from typing import Optional

from .catalog import Catalog
from .evaluator import translate
from .ir import Program
from .optimizer import optimize
from .sqlgen import program_to_sql


def pytond(pivot_values: Optional[dict] = None):
    """Decorator marking a function for in-database execution.

    ``pivot_values`` maps column name -> list of distinct values, required
    to translate ``pivot_table`` (paper Section III-C). The wrapped function
    is unchanged at call time (that *is* the Pandas baseline); compilation
    happens through :func:`compile_pytond`.
    """

    def deco(fn):
        fn.__pytond__ = {"pivot_values": pivot_values or {}}
        return fn

    return deco


class CompiledQuery:
    """A function compiled to TondIR and SQL at a given optimization level."""

    def __init__(self, func, catalog: Catalog, opt_level: int = 4):
        self.func = func
        meta = getattr(func, "__pytond__", {"pivot_values": {}})
        for col, vals in meta["pivot_values"].items():
            catalog.pivot_values[("*", col)] = vals
        self.catalog = catalog
        self.opt_level = opt_level
        self.program_raw: Program = translate(func, catalog)
        self.program: Program = optimize(self.program_raw, catalog, opt_level)
        self._sql: dict[str, str] = {}

    def sql(self, dialect: str = "spark") -> str:
        if dialect not in self._sql:
            self._sql[dialect] = program_to_sql(self.program, self.catalog, dialect)
        return self._sql[dialect]

    def run_spark(self, spark, tables: dict):
        """Execute on Spark: register inputs as temp views, run the SQL
        through Catalyst. ``tables``: base-relation name -> Spark DataFrame."""
        for name, df in tables.items():
            df.createOrReplaceTempView(name)
        return spark.sql(self.sql("spark"))

    def run_duckdb(self, tables: dict, threads: Optional[int] = None):
        """Execute on DuckDB. ``tables``: name -> pandas DataFrame."""
        import duckdb

        con = duckdb.connect()
        try:
            if threads is not None:
                con.execute(f"PRAGMA threads={threads}")
            for name, pdf in tables.items():
                con.register(name, pdf)
            return con.execute(self.sql("duckdb")).fetchdf()
        finally:
            con.close()


def compile_pytond(func, catalog: Catalog, opt_level: int = 4) -> CompiledQuery:
    """Compile a ``@pytond`` function against a catalog of base relations."""
    return CompiledQuery(func, catalog, opt_level)
