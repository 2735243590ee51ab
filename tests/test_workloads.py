"""Integration: the hybrid data-science workloads (Crime Index, Birth
Analysis, N3, N9, Hybrid MatMul/Covar) on DuckDB at every optimization
level and on Spark at O0/O4."""
import numpy as np
import pytest

from repro import synth_data
from repro.core.api import compile_pytond
from repro.harness.check import check_duckdb, check_spark
from repro.workloads import covariance as cov
from repro.workloads.datascience import WORKLOADS


@pytest.mark.parametrize("name", sorted(WORKLOADS), ids=lambda n: n)
def test_duckdb_all_levels(name):
    fn, cat_b, inp_b = WORKLOADS[name]
    check_duckdb(fn, cat_b, inp_b(0.05), levels=(0, 1, 2, 3, 4))


@pytest.mark.parametrize("name", sorted(WORKLOADS), ids=lambda n: n)
def test_spark_o4(spark, name):
    fn, cat_b, inp_b = WORKLOADS[name]
    # hybrid pipelines produce single-float-column results; the oracle's
    # exact sort cannot align those, the tolerant comparator can.
    check_spark(spark, fn, cat_b, inp_b(0.02), level=4, oracle=False)


@pytest.mark.parametrize("name", ["crime_index", "hybrid_covar"], ids=lambda n: n)
def test_spark_o0(spark, name):
    fn, cat_b, inp_b = WORKLOADS[name]
    check_spark(spark, fn, cat_b, inp_b(0.02), level=0, oracle=False)


class TestCovarianceMicro:
    @pytest.mark.parametrize("rows,cols,sparsity", [
        (500, 4, 100), (500, 4, 10), (2000, 8, 50), (200, 16, 100),
    ])
    def test_dense_duckdb(self, rows, cols, sparsity):
        m = synth_data.dense_matrix(rows, cols, sparsity)
        cq = compile_pytond(cov.covar, cov.dense_catalog(cols), opt_level=4)
        got = cov.dense_result_to_numpy(
            cq.run_duckdb({"m": synth_data.dense_matrix_table(m)}))
        assert np.allclose(got, cov.numpy_covar(m), rtol=1e-8)

    @pytest.mark.parametrize("rows,cols,sparsity", [
        (500, 4, 10), (2000, 8, 1), (200, 16, 30),
    ])
    def test_sparse_duckdb(self, rows, cols, sparsity):
        m = synth_data.dense_matrix(rows, cols, sparsity)
        cq = compile_pytond(cov.covar, cov.sparse_catalog(), opt_level=4)
        got = cov.coo_result_to_numpy(
            cq.run_duckdb({"m": synth_data.coo_matrix_table(m)}), (cols, cols))
        assert np.allclose(got, cov.numpy_covar(m), rtol=1e-8)

    def test_dense_spark(self, spark):
        m = synth_data.dense_matrix(1000, 4, 100)
        cq = compile_pytond(cov.covar, cov.dense_catalog(4), opt_level=4)
        sdf = spark.createDataFrame(synth_data.dense_matrix_table(m))
        got = cov.dense_result_to_numpy(cq.run_spark(spark, {"m": sdf}).toPandas())
        assert np.allclose(got, cov.numpy_covar(m), rtol=1e-8)

    def test_sparse_spark(self, spark):
        m = synth_data.dense_matrix(1000, 4, 5)
        cq = compile_pytond(cov.covar, cov.sparse_catalog(), opt_level=4)
        sdf = spark.createDataFrame(synth_data.coo_matrix_table(m))
        got = cov.coo_result_to_numpy(cq.run_spark(spark, {"m": sdf}).toPandas(), (4, 4))
        assert np.allclose(got, cov.numpy_covar(m), rtol=1e-8)

    def test_self_join_eliminated_at_o3(self):
        """Hybrid Covar is the paper's O3 showcase: the einsum self-join on
        the generated UID disappears."""
        from repro.core.ir import RelAtom
        from repro.workloads.datascience import hybrid_catalog, hybrid_covar

        o2 = compile_pytond(hybrid_covar, hybrid_catalog(), opt_level=2)
        o3 = compile_pytond(hybrid_covar, hybrid_catalog(), opt_level=3)

        def max_same_rel_atoms(prog):
            best = 0
            for r in prog.rules:
                rels = [a.rel for a in r.body if isinstance(a, RelAtom)]
                best = max(best, max((rels.count(x) for x in set(rels)), default=0))
            return best

        assert max_same_rel_atoms(o2.program) >= 2
        assert max_same_rel_atoms(o3.program) == 1
