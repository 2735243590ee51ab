"""Benchmark behind Fig. 7/8: thread scalability of representative
workloads. DuckDB threads are set via PRAGMA (faithful); Spark parallelism
is proxied by shuffle partitions (see DESIGN.md substitution #2)."""
import pytest

from repro import synth_data
from repro.core.api import compile_pytond
from repro.workloads import tpch

SF = 0.02
REPRESENTATIVE = ["q01", "q04", "q06", "q13"]
THREADS = [1, 2, 4]


@pytest.fixture(scope="module")
def data():
    return synth_data.tpch_tables(sf=SF)


@pytest.mark.parametrize("threads", THREADS, ids=lambda t: f"t{t}")
@pytest.mark.parametrize("name", REPRESENTATIVE, ids=lambda n: n)
def bench_duckdb_threads(benchmark, data, name, threads):
    fn = tpch.QUERIES[name]
    tables = {t: data[t] for t in tpch.query_tables(fn)}
    cq = compile_pytond(fn, tpch.tpch_catalog(), opt_level=4)
    benchmark.pedantic(lambda: cq.run_duckdb(tables, threads=threads),
                       rounds=2, warmup_rounds=1)


@pytest.mark.parametrize("threads", THREADS, ids=lambda t: f"p{t}")
@pytest.mark.parametrize("name", ["q01", "q13"], ids=lambda n: n)
def bench_spark_partitions(benchmark, spark, data, name, threads):
    fn = tpch.QUERIES[name]
    sdf = {t: spark.createDataFrame(data[t]) for t in tpch.query_tables(fn)}
    for v in sdf.values():
        v.cache().count()
    cq = compile_pytond(fn, tpch.tpch_catalog(), opt_level=4)
    old = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", str(threads))
    try:
        benchmark.pedantic(lambda: cq.run_spark(spark, sdf).toPandas(),
                           rounds=2, warmup_rounds=1)
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", old)
