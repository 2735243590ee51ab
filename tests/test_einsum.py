"""Einsum planner/kernels (Table VI, Section III-D): dense and sparse
translations checked against NumPy's einsum on random inputs."""
import numpy as np
import pandas as pd
import pytest

from repro.core.api import compile_pytond, pytond
from repro.core.catalog import Catalog, coo_matrix_schema, dense_matrix_schema
from repro.synth_data import coo_matrix_table, dense_matrix, dense_matrix_table


def _run_dense(spec_fn, n_cols, tables, opt_level=4):
    cat = Catalog()
    for name, pdf in tables.items():
        cat.add(dense_matrix_schema(name, len(pdf.columns) - 1))
    cq = compile_pytond(spec_fn, cat, opt_level=opt_level)
    return cq.run_duckdb(tables)


def _to_matrix(pdf: pd.DataFrame) -> np.ndarray:
    pdf = pdf.sort_values("id")
    return pdf[[c for c in pdf.columns if c != "id"]].to_numpy(dtype="float64")


def _to_vector(pdf: pd.DataFrame) -> np.ndarray:
    return _to_matrix(pdf).ravel()


@pytest.fixture(scope="module")
def m():
    return dense_matrix(300, 4, seed=1)


@pytest.fixture(scope="module")
def m2():
    return dense_matrix(300, 4, seed=2)


@pytest.fixture(scope="module")
def v():
    return dense_matrix(300, 1, seed=3).ravel()


# ---- dense kernels ---------------------------------------------------------

@pytond()
def e_rowsum(m):
    return np.einsum("ij->i", m)


@pytond()
def e_colsum(m):
    return np.einsum("ij->j", m)


@pytond()
def e_total(m):
    return np.einsum("ij->", m)


@pytond()
def e_hadamard(m, m2):
    return np.einsum("ij,ij->ij", m, m2)


@pytond()
def e_gram(m, m2):
    return np.einsum("ij,ik->jk", m, m2)


@pytond()
def e_covar_self(m):
    return np.einsum("ij,ik->jk", m, m)


@pytond()
def e_matvec_const(m):
    w = np.array([1.0, -2.0, 0.5, 3.0])
    return np.einsum("ij,j->i", m, w)


@pytond()
def e_es9(m, m2):
    return np.einsum("ij,ik->ij", m, m2)


@pytond()
def e_inner(m, m2):
    a = np.einsum("ij->i", m)
    b = np.einsum("ij->i", m2)
    return np.einsum("i,i->", a, b)


@pytond()
def e_reduce_private_label(m, m2):
    # 'ij,kj->j' : i and k are private -> pre-summed, then hadamard-vec
    return np.einsum("ij,kj->j", m, m2)


class TestDense:
    def test_rowsum(self, m):
        got = _to_vector(_run_dense(e_rowsum, 4, {"m": dense_matrix_table(m)}))
        assert np.allclose(got, m.sum(axis=1))

    def test_colsum(self, m):
        got = _to_vector(_run_dense(e_colsum, 4, {"m": dense_matrix_table(m)}))
        assert np.allclose(got, m.sum(axis=0))

    def test_total(self, m):
        got = _run_dense(e_total, 4, {"m": dense_matrix_table(m)})
        assert np.allclose(got["v0"].iloc[0], m.sum())

    def test_hadamard(self, m, m2):
        got = _to_matrix(_run_dense(
            e_hadamard, 4, {"m": dense_matrix_table(m), "m2": dense_matrix_table(m2)}))
        assert np.allclose(got, m * m2)

    def test_gram(self, m, m2):
        got = _to_matrix(_run_dense(
            e_gram, 4, {"m": dense_matrix_table(m), "m2": dense_matrix_table(m2)}))
        assert np.allclose(got, np.einsum("ij,ik->jk", m, m2))

    def test_covar_self(self, m):
        got = _to_matrix(_run_dense(e_covar_self, 4, {"m": dense_matrix_table(m)}))
        assert np.allclose(got, m.T @ m)

    def test_matvec_const(self, m):
        w = np.array([1.0, -2.0, 0.5, 3.0])
        got = _to_vector(_run_dense(e_matvec_const, 4, {"m": dense_matrix_table(m)}))
        assert np.allclose(got, m @ w)

    def test_es9(self, m, m2):
        got = _to_matrix(_run_dense(
            e_es9, 4, {"m": dense_matrix_table(m), "m2": dense_matrix_table(m2)}))
        assert np.allclose(got, np.einsum("ij,ik->ij", m, m2))

    def test_inner_of_rowsums(self, m, m2):
        got = _run_dense(e_inner, 4,
                         {"m": dense_matrix_table(m), "m2": dense_matrix_table(m2)})
        assert np.allclose(got["v0"].iloc[0],
                           np.inner(m.sum(axis=1), m2.sum(axis=1)))

    def test_reduce_private_label(self, m, m2):
        got = _to_vector(_run_dense(
            e_reduce_private_label, 4,
            {"m": dense_matrix_table(m), "m2": dense_matrix_table(m2)}))
        assert np.allclose(got, np.einsum("ij,kj->j", m, m2))

    @pytest.mark.parametrize("lvl", [0, 2, 4])
    def test_covar_all_levels(self, m, lvl):
        got = _to_matrix(_run_dense(e_covar_self, 4, {"m": dense_matrix_table(m)},
                                    opt_level=lvl))
        assert np.allclose(got, m.T @ m)


# ---- sparse (COO) ----------------------------------------------------------

def _run_sparse(fn, tables):
    cat = Catalog()
    for name in tables:
        cat.add(coo_matrix_schema(name))
    cq = compile_pytond(fn, cat, opt_level=4)
    return cq.run_duckdb(tables)


def _coo_to_dense(pdf, shape):
    out = np.zeros(shape)
    out[pdf["row"].astype(int), pdf["col"].astype(int)] = pdf["val"]
    return out


@pytest.fixture(scope="module")
def sp():
    return dense_matrix(100, 6, sparsity_pct=20, seed=4)


@pytest.fixture(scope="module")
def sp2():
    return dense_matrix(100, 6, sparsity_pct=20, seed=5)


@pytond()
def s_covar(m):
    return np.einsum("ij,ik->jk", m, m)


@pytond()
def s_hadamard(m, m2):
    return np.einsum("ij,ij->ij", m, m2)


@pytond()
def s_matmul(m, m2):
    return np.einsum("ij,jk->ik", m, m2)


@pytond()
def s_total(m):
    return np.einsum("ij->", m)


@pytond()
def s_trace_like(m):
    return np.einsum("ii->", m)


class TestSparse:
    def test_covar(self, sp):
        got = _run_sparse(s_covar, {"m": coo_matrix_table(sp)})
        assert np.allclose(_coo_to_dense(got, (6, 6)), sp.T @ sp)

    def test_hadamard(self, sp, sp2):
        got = _run_sparse(s_hadamard,
                          {"m": coo_matrix_table(sp), "m2": coo_matrix_table(sp2)})
        assert np.allclose(_coo_to_dense(got, sp.shape), sp * sp2)

    def test_matmul(self, sp):
        m2 = dense_matrix(6, 5, sparsity_pct=50, seed=6)
        got = _run_sparse(s_matmul,
                          {"m": coo_matrix_table(sp), "m2": coo_matrix_table(m2)})
        assert np.allclose(_coo_to_dense(got, (100, 5)), sp @ m2)

    def test_total(self, sp):
        got = _run_sparse(s_total, {"m": coo_matrix_table(sp)})
        assert np.allclose(got["v0"].iloc[0], sp.sum())

    def test_trace(self, sp):
        got = _run_sparse(s_trace_like, {"m": coo_matrix_table(sp)})
        assert np.allclose(got["v0"].iloc[0], np.trace(sp))


# ---- planner errors --------------------------------------------------------

class TestPlanner:
    def test_requires_explicit_output(self):
        from repro.core.einsum import translate_einsum
        from repro.core.frontend import Translator

        with pytest.raises(NotImplementedError, match="explicit"):
            translate_einsum(Translator(Catalog()), "ij,jk", [None, None])

    def test_operand_count_mismatch(self):
        from repro.core.einsum import translate_einsum
        from repro.core.frontend import Translator

        with pytest.raises(ValueError, match="operand count"):
            translate_einsum(Translator(Catalog()), "ij,jk->ik", [None])
