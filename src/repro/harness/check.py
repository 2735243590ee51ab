"""Cross-backend correctness checks used by tests.

``check_duckdb``: PyTond-on-DuckDB at several optimization levels vs the
Pandas baseline. ``check_spark``: PyTond-on-Spark vs the baseline, plus the
DuckDB *oracle* (``repro.oracle.assert_equivalent``) running the very SQL
Spark executed — catching dialect or engine divergence, not just "it ran".
"""
from __future__ import annotations

from repro.backends.pandas_backend import run_pandas
from repro.core.api import compile_pytond
from repro.harness.compare import assert_frames_close, normalize_result


def check_duckdb(fn, catalog_builder, tables, levels=(0, 1, 2, 3, 4),
                 rtol=1e-6) -> None:
    expected = run_pandas(fn, tables)
    for lvl in levels:
        cq = compile_pytond(fn, catalog_builder(), opt_level=lvl)
        got = cq.run_duckdb(tables)
        assert_frames_close(got, expected, rtol=rtol,
                            context=f"{fn.__name__}/duckdb/O{lvl}")


def check_spark(spark, fn, catalog_builder, tables, level=4, rtol=1e-6,
                oracle=True) -> None:
    expected = run_pandas(fn, tables)
    cq = compile_pytond(fn, catalog_builder(), opt_level=level)
    sdf = {k: spark.createDataFrame(v) for k, v in tables.items()}
    got_df = cq.run_spark(spark, sdf)
    assert_frames_close(got_df.toPandas(), expected, rtol=rtol,
                        context=f"{fn.__name__}/spark/O{level}")
    if oracle:
        from repro.oracle import assert_equivalent

        assert_equivalent(got_df, cq.sql("duckdb"), **tables)
