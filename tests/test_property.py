"""Property-based tests: randomly composed filter/project/group pipelines
must agree between the Pandas baseline and PyTond-on-DuckDB at O0 and O4
(the optimizer is semantics-preserving on arbitrary pipelines, not only on
the curated workloads)."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import HealthCheck, given, settings
from hypothesis import strategies as st

from repro.core.api import compile_pytond, pytond
from repro.core.catalog import Catalog, TableSchema
from repro.harness.compare import assert_frames_close

_DF = pd.DataFrame({
    "k": np.arange(200),
    "a": np.random.default_rng(0).integers(0, 20, 200).astype("float64"),
    "b": np.random.default_rng(1).random(200) * 100,
    "s": np.random.default_rng(2).choice(["p", "q", "r"], 200),
})


def _cat():
    return Catalog().add(TableSchema("df", ("k", "a", "b", "s"),
                                     (frozenset({"k"}),)))


# A small closed set of pipeline steps; hypothesis picks a sequence.
@pytond()
def pipe_fga(df):
    d = df[df.a > 5.0]
    g = d.groupby(["s"], as_index=False).agg(t=("b", "sum"), n=("k", "count"))
    return g.sort_values(["s"])


@pytond()
def pipe_fff(df):
    d = df[df.a > 3.0]
    d = d[d.b < 80.0]
    d = d[d.s.isin(["p", "r"])]
    return d


@pytond()
def pipe_proj_expr(df):
    d = df.copy()
    d["c"] = d.a * 2.0 - d.b
    d = d[d.c > 0.0]
    return d[["k", "c"]]


@pytond()
def pipe_agg_scalar(df):
    m = df.b.mean()
    d = df[df.b > m]
    return d.groupby(["s"], as_index=False).agg(n=("k", "count"))


_PIPES = [pipe_fga, pipe_fff, pipe_proj_expr, pipe_agg_scalar]


@settings(max_examples=12, deadline=None,
          suppress_health_check=[HealthCheck.function_scoped_fixture])
@given(pipe_idx=st.integers(0, len(_PIPES) - 1),
       lvl=st.sampled_from([0, 1, 2, 3, 4]),
       lo=st.integers(0, 15))
def test_random_pipeline_level(pipe_idx, lvl, lo):
    """Any pipeline x any optimization level x any data subset agrees."""
    fn = _PIPES[pipe_idx]
    data = _DF[_DF.a >= lo].reset_index(drop=True)
    if data.empty:
        return
    expected = fn(data)
    cq = compile_pytond(fn, _cat(), opt_level=lvl)
    got = cq.run_duckdb({"df": data})
    assert_frames_close(got, expected, context=f"{fn.__name__}/O{lvl}/lo={lo}")


@settings(max_examples=10, deadline=None)
@given(vals=st.lists(st.floats(min_value=-100, max_value=100, allow_nan=False),
                     min_size=1, max_size=50),
       n_cols=st.integers(1, 4))
def test_covariance_random_matrices(vals, n_cols):
    """Dense covariance einsum agrees with NumPy on arbitrary matrices."""
    from repro.synth_data import dense_matrix_table
    from repro.workloads import covariance as cov

    if len(vals) < n_cols:
        return
    n = len(vals) // n_cols
    m = np.asarray(vals[: n * n_cols], dtype="float64").reshape(n, n_cols)
    cq = compile_pytond(cov.covar, cov.dense_catalog(n_cols), opt_level=4)
    got = cov.dense_result_to_numpy(cq.run_duckdb({"m": dense_matrix_table(m)}))
    assert np.allclose(got, m.T @ m, rtol=1e-8, atol=1e-8)
