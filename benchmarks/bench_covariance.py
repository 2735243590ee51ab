"""Benchmark behind Fig. 9: covariance matrix, NumPy vs PyTond dense/sparse
layouts on DuckDB and Spark, varying rows / cols / sparsity."""
import pytest

from repro import synth_data
from repro.core.api import compile_pytond
from repro.workloads import covariance as cov

# (rows, cols, sparsity%) — one axis varied at a time around the fixed point
CONFIGS = [
    (10_000, 8, 100), (50_000, 8, 100), (200_000, 8, 100),   # rows axis
    (50_000, 4, 100), (50_000, 16, 100),                     # cols axis
    (50_000, 8, 1), (50_000, 8, 10),                         # sparsity axis
]
_IDS = [f"r{r//1000}k_c{c}_s{s}" for r, c, s in CONFIGS]


@pytest.fixture(scope="module")
def matrices():
    out = {}
    for cfg in CONFIGS:
        m = synth_data.dense_matrix(*cfg)
        out[cfg] = (m, synth_data.dense_matrix_table(m), synth_data.coo_matrix_table(m))
    return out


@pytest.mark.parametrize("cfg", CONFIGS, ids=_IDS)
def bench_numpy(benchmark, matrices, cfg):
    m = matrices[cfg][0]
    benchmark.pedantic(lambda: cov.numpy_covar(m), rounds=3, warmup_rounds=1)


@pytest.mark.parametrize("cfg", CONFIGS, ids=_IDS)
def bench_pytond_duckdb_dense(benchmark, matrices, cfg):
    _, dense_t, _ = matrices[cfg]
    cq = compile_pytond(cov.covar, cov.dense_catalog(cfg[1]), opt_level=4)
    benchmark.pedantic(lambda: cq.run_duckdb({"m": dense_t}),
                       rounds=2, warmup_rounds=1)


@pytest.mark.parametrize("cfg", CONFIGS, ids=_IDS)
def bench_pytond_duckdb_sparse(benchmark, matrices, cfg):
    _, _, coo_t = matrices[cfg]
    cq = compile_pytond(cov.covar, cov.sparse_catalog(), opt_level=4)
    benchmark.pedantic(lambda: cq.run_duckdb({"m": coo_t}),
                       rounds=2, warmup_rounds=1)


@pytest.mark.parametrize("cfg", [(50_000, 8, 100), (50_000, 8, 1)],
                         ids=["dense_point", "sparse_point"])
def bench_pytond_spark(benchmark, spark, matrices, cfg):
    m, dense_t, coo_t = matrices[cfg]
    if cfg[2] == 100:
        cq = compile_pytond(cov.covar, cov.dense_catalog(cfg[1]), opt_level=4)
        sdf = {"m": spark.createDataFrame(dense_t)}
    else:
        cq = compile_pytond(cov.covar, cov.sparse_catalog(), opt_level=4)
        sdf = {"m": spark.createDataFrame(coo_t)}
    benchmark.pedantic(lambda: cq.run_spark(spark, sdf).toPandas(),
                       rounds=2, warmup_rounds=1)
