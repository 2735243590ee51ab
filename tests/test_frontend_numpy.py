"""NumPy API translations of Table V: all / nonzero / round / compress /
axis sums, plus dense<->frame bridging (to_numpy / pd.DataFrame)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.api import compile_pytond, pytond
from repro.core.catalog import Catalog, TableSchema, dense_matrix_schema
from repro.synth_data import dense_matrix, dense_matrix_table


def _cat(n_cols=3, vec=False):
    cat = Catalog()
    cat.add(dense_matrix_schema("m", n_cols))
    cat.add(dense_matrix_schema("v", 1))
    return cat


@pytest.fixture(scope="module")
def m():
    return dense_matrix(50, 3, seed=10)


@pytest.fixture(scope="module")
def v():
    g = np.random.default_rng(11)
    vals = g.random(40)
    vals[vals < 0.3] = 0.0
    return vals


def _run(fn, tables):
    cq = compile_pytond(fn, _cat(), opt_level=4)
    return cq.run_duckdb(tables)


@pytond()
def a_all(v):
    return v.all()


@pytond()
def a_nonzero(v):
    return v.nonzero()


@pytond()
def a_round(v):
    return v.round()


@pytond()
def a_compress(m):
    return m.compress([True, False, True], axis=1)


@pytond()
def a_sum_axis0(m):
    return m.sum(axis=0)


@pytond()
def a_sum_axis1(m):
    return m.sum(axis=1)


@pytond()
def a_sum_all(m):
    return m.sum()


@pytond()
def a_roundtrip(m):
    df = pd.DataFrame(m, columns=["p", "q", "r"])
    d = df[df.p > 0.5]
    return d


class TestArrayAPIs:
    def test_all_nonzero_vector(self, v):
        t = {"v": pd.DataFrame({"id": np.arange(len(v)), "c0": v})}
        got = _run(a_all, t)["v0"].iloc[0]
        # paper implements all() as min over the values
        assert (got != 0) == bool(v.all())

    def test_all_true_vector(self):
        vv = np.ones(10)
        t = {"v": pd.DataFrame({"id": np.arange(10), "c0": vv})}
        assert _run(a_all, t)["v0"].iloc[0] != 0

    def test_nonzero(self, v):
        t = {"v": pd.DataFrame({"id": np.arange(len(v)), "c0": v})}
        got = sorted(_run(a_nonzero, t)["id"])
        assert got == sorted(np.nonzero(v)[0].tolist())

    def test_round(self, v):
        t = {"v": pd.DataFrame({"id": np.arange(len(v)), "c0": v})}
        got = _run(a_round, t).sort_values("id")["c0"].to_numpy()
        # SQL round() uses half-away-from-zero, NumPy half-even: compare on
        # values where they agree
        mask = np.abs(v - np.floor(v) - 0.5) > 1e-9
        assert np.allclose(got[mask], v.round()[mask])

    def test_compress(self, m):
        got = _run(a_compress, {"m": dense_matrix_table(m)}).sort_values("id")
        assert np.allclose(got[["c0", "c1"]].to_numpy(), m[:, [0, 2]])

    def test_sum_axis0(self, m):
        got = _run(a_sum_axis0, {"m": dense_matrix_table(m)}).sort_values("id")
        assert np.allclose(got["c0"].to_numpy(), m.sum(axis=0))

    def test_sum_axis1(self, m):
        got = _run(a_sum_axis1, {"m": dense_matrix_table(m)}).sort_values("id")
        assert np.allclose(got["c0"].to_numpy(), m.sum(axis=1))

    def test_sum_all(self, m):
        got = _run(a_sum_all, {"m": dense_matrix_table(m)})
        assert np.allclose(got["v0"].iloc[0], m.sum())

    def test_array_to_frame_roundtrip(self, m):
        got = _run(a_roundtrip, {"m": dense_matrix_table(m)})
        exp = pd.DataFrame(m, columns=["p", "q", "r"])
        exp = exp[exp.p > 0.5]
        got = got.sort_values(["p", "q"]).reset_index(drop=True)
        exp = exp.sort_values(["p", "q"]).reset_index(drop=True)
        assert np.allclose(got.to_numpy(), exp.to_numpy())


class TestDenseParams:
    def test_dense_param_becomes_array(self):
        from repro.core.evaluator import translate

        prog = translate(a_sum_all, _cat())
        assert prog.sink.head.cols == ("v0",)

    def test_transpose_requires_known_rows(self):
        @pytond()
        def tbad(m):
            return np.einsum("ij->ji", m)

        with pytest.raises(NotImplementedError, match="row count"):
            compile_pytond(tbad, _cat())
