"""Benchmark behind Fig. 5/6: the hybrid data-science workloads on Pandas,
Grizzly-simulated DuckDB, PyTond DuckDB and PyTond Spark."""
import pytest

from repro.backends.pandas_backend import run_pandas
from repro.core.api import compile_pytond
from repro.workloads.datascience import WORKLOADS

SCALE = 0.2
NAMES = sorted(WORKLOADS)


@pytest.fixture(scope="module")
def inputs():
    return {n: WORKLOADS[n][2](SCALE) for n in NAMES}


@pytest.mark.parametrize("name", NAMES, ids=lambda n: n)
def bench_pandas(benchmark, inputs, name):
    fn = WORKLOADS[name][0]
    benchmark.pedantic(lambda: run_pandas(fn, inputs[name]),
                       rounds=2, warmup_rounds=1)


@pytest.mark.parametrize("name", NAMES, ids=lambda n: n)
def bench_grizzly_duckdb(benchmark, inputs, name):
    fn, cat_b, _ = WORKLOADS[name]
    cq = compile_pytond(fn, cat_b(), opt_level=0)
    benchmark.pedantic(lambda: cq.run_duckdb(inputs[name]),
                       rounds=2, warmup_rounds=1)


@pytest.mark.parametrize("name", NAMES, ids=lambda n: n)
def bench_pytond_duckdb(benchmark, inputs, name):
    fn, cat_b, _ = WORKLOADS[name]
    cq = compile_pytond(fn, cat_b(), opt_level=4)
    benchmark.pedantic(lambda: cq.run_duckdb(inputs[name]),
                       rounds=2, warmup_rounds=1)


@pytest.mark.parametrize("name", NAMES, ids=lambda n: n)
def bench_pytond_spark(benchmark, spark, inputs, name):
    fn, cat_b, _ = WORKLOADS[name]
    cq = compile_pytond(fn, cat_b(), opt_level=4)
    sdf = {k: spark.createDataFrame(v) for k, v in inputs[name].items()}
    benchmark.pedantic(lambda: cq.run_spark(spark, sdf).toPandas(),
                       rounds=2, warmup_rounds=1)
