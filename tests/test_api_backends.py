"""Tests for the @pytond decorator, CompiledQuery, and backends."""
import numpy as np
import pandas as pd
import pytest

from repro.backends.pandas_backend import run_pandas
from repro.core.api import CompiledQuery, compile_pytond, pytond
from repro.core.catalog import Catalog, TableSchema


def _cat():
    return Catalog().add(TableSchema("df", ("a", "b"), (frozenset({"a"}),)))


@pytond()
def wl(df):
    d = df[df.a > 2]
    return d.groupby(["b"], as_index=False).agg(s=("a", "sum"))


@pytond(pivot_values={"b": ["x", "y"]})
def wl_pivot(df):
    return df.pivot_table(index="a", columns="b", values="a",
                          aggfunc="sum", fill_value=0).reset_index()


@pytest.fixture(scope="module")
def df():
    return pd.DataFrame({"a": np.arange(10), "b": ["x", "y"] * 5})


class TestDecorator:
    def test_function_still_callable(self, df):
        out = wl(df)
        assert isinstance(out, pd.DataFrame)

    def test_metadata_attached(self):
        assert wl.__pytond__ == {"pivot_values": {}}
        assert wl_pivot.__pytond__["pivot_values"]["b"] == ["x", "y"]

    def test_pivot_values_flow_to_catalog(self, df):
        cq = compile_pytond(wl_pivot, _cat())
        assert cq.catalog.distinct_values("df", "b") == ["x", "y"]


class TestCompiledQuery:
    def test_programs_exposed(self):
        cq = compile_pytond(wl, _cat(), opt_level=4)
        assert len(cq.program_raw.rules) >= len(cq.program.rules)

    def test_sql_cached_per_dialect(self):
        cq = compile_pytond(wl, _cat())
        a, b = cq.sql("duckdb"), cq.sql("duckdb")
        assert a is b
        assert cq.sql("spark") != a

    def test_opt_level_zero_keeps_raw(self):
        cq = compile_pytond(wl, _cat(), opt_level=0)
        assert cq.program.pretty() == cq.program_raw.pretty()

    def test_duckdb_threads_param(self, df):
        cq = compile_pytond(wl, _cat())
        out1 = cq.run_duckdb({"df": df}, threads=1)
        out2 = cq.run_duckdb({"df": df}, threads=2)
        assert out1.sort_values("b").reset_index(drop=True).equals(
            out2.sort_values("b").reset_index(drop=True))


class TestPandasBackend:
    def test_param_order(self, df):
        @pytond()
        def two(df, df2):
            return df

        out = run_pandas(two, {"df2": df.head(1), "df": df})
        assert len(out) == 10

    def test_series_wrapped(self, df):
        @pytond()
        def ser(df):
            return df.a

        out = run_pandas(ser, {"df": df})
        assert isinstance(out, pd.DataFrame)


class TestCompare:
    def test_scalar_vs_frame(self):
        from repro.harness.compare import assert_frames_close

        assert_frames_close(pd.DataFrame({"v0": [3.0]}), 3.0000000001)

    def test_mismatch_raises(self):
        from repro.harness.compare import assert_frames_close

        with pytest.raises(AssertionError):
            assert_frames_close(pd.DataFrame({"v0": [3.0]}), 4.0)

    def test_row_count_mismatch(self):
        from repro.harness.compare import assert_frames_close

        with pytest.raises(AssertionError, match="row count"):
            assert_frames_close(pd.DataFrame({"a": [1, 2]}), pd.DataFrame({"a": [1]}))

    def test_string_columns(self):
        from repro.harness.compare import assert_frames_close

        a = pd.DataFrame({"s": ["x", "y"], "v": [1.0, 2.0]})
        b = pd.DataFrame({"s": ["y", "x"], "v": [2.0, 1.0]})
        assert_frames_close(a, b)
