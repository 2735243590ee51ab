"""Execution backends: Spark SQL (Catalyst), DuckDB, and the Pandas baseline."""
from .pandas_backend import run_pandas  # noqa: F401
