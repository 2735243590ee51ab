"""Covariance-matrix micro-benchmark (paper Fig. 9).

``np.einsum('ij,ik->jk', m, m)`` over a single input matrix, in both the
dense layout (``id, c0..c{n-1}``) and the sparse COO layout
(``row, col, val``), compared against NumPy. The sweep varies rows,
columns and sparsity with the other two dimensions fixed.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.api import pytond
from repro.core.catalog import Catalog, coo_matrix_schema, dense_matrix_schema


@pytond()
def covar(m):
    """Covariance (Gram) matrix of the input matrix."""
    return np.einsum("ij,ik->jk", m, m)


def dense_catalog(n_cols: int) -> Catalog:
    return Catalog().add(dense_matrix_schema("m", n_cols))


def sparse_catalog() -> Catalog:
    return Catalog().add(coo_matrix_schema("m"))


def numpy_covar(m: np.ndarray) -> np.ndarray:
    return np.einsum("ij,ik->jk", m, m)


def dense_result_to_numpy(pdf: pd.DataFrame) -> np.ndarray:
    """Backend result (id, c0..c{n-1}) rows -> 2-D array ordered by id."""
    pdf = pdf.sort_values("id")
    cols = [c for c in pdf.columns if c != "id"]
    return pdf[cols].to_numpy(dtype="float64")


def coo_result_to_numpy(pdf: pd.DataFrame, shape: tuple[int, int]) -> np.ndarray:
    out = np.zeros(shape)
    out[pdf["row"].to_numpy(dtype="int64"), pdf["col"].to_numpy(dtype="int64")] = (
        pdf["val"].to_numpy(dtype="float64"))
    return out
