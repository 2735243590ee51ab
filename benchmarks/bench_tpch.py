"""Benchmark behind Fig. 3/4: all 22 TPC-H queries on Pandas,
Grizzly-simulated (O0) DuckDB, PyTond (O4) DuckDB, and PyTond (O4) Spark.

Scale is kept at SF=0.02 so the full 22x4 matrix stays tractable inside
pytest-benchmark; jobs/run_tpch.py runs the larger sweep.
"""
import pytest

from repro import synth_data
from repro.backends.pandas_backend import run_pandas
from repro.core.api import compile_pytond
from repro.workloads import tpch

SF = 0.02
QUERIES = sorted(tpch.QUERIES)


@pytest.fixture(scope="module")
def data():
    return synth_data.tpch_tables(sf=SF)


@pytest.fixture(scope="module")
def spark_data(spark, data):
    sdf = {k: spark.createDataFrame(v) for k, v in data.items()}
    for v in sdf.values():
        v.cache().count()
    return sdf


def _tables(data, name):
    fn = tpch.QUERIES[name]
    return fn, {t: data[t] for t in tpch.query_tables(fn)}


@pytest.mark.parametrize("name", QUERIES, ids=lambda n: n)
def bench_pandas(benchmark, data, name):
    fn, tables = _tables(data, name)
    benchmark.pedantic(lambda: run_pandas(fn, tables), rounds=2, warmup_rounds=1)


@pytest.mark.parametrize("name", QUERIES, ids=lambda n: n)
def bench_grizzly_duckdb(benchmark, data, name):
    fn, tables = _tables(data, name)
    cq = compile_pytond(fn, tpch.tpch_catalog(), opt_level=0)
    benchmark.pedantic(lambda: cq.run_duckdb(tables), rounds=2, warmup_rounds=1)


@pytest.mark.parametrize("name", QUERIES, ids=lambda n: n)
def bench_pytond_duckdb(benchmark, data, name):
    fn, tables = _tables(data, name)
    cq = compile_pytond(fn, tpch.tpch_catalog(), opt_level=4)
    benchmark.pedantic(lambda: cq.run_duckdb(tables), rounds=2, warmup_rounds=1)


@pytest.mark.parametrize("name", QUERIES, ids=lambda n: n)
def bench_pytond_spark(benchmark, spark, data, spark_data, name):
    fn, _ = _tables(data, name)
    cq = compile_pytond(fn, tpch.tpch_catalog(), opt_level=4)
    needed = {t: spark_data[t] for t in tpch.query_tables(fn)}
    benchmark.pedantic(lambda: cq.run_spark(spark, needed).toPandas(),
                       rounds=2, warmup_rounds=1)
