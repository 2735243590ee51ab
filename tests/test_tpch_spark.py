"""Integration: TPC-H on the Spark SQL (Catalyst) backend.

Every query's generated SQL is executed via ``spark.sql`` and compared to
the Pandas baseline; ``repro.oracle.assert_equivalent`` additionally runs
the same generated SQL on DuckDB and diffs it against the Spark result, so
a dialect bug or Catalyst mis-plan is caught, not just "it ran".
"""
import pytest

from repro import synth_data
from repro.harness.check import check_spark
from repro.workloads import tpch

# Queries whose sink contains float-valued aggregate columns prone to
# engine-order summation noise in the oracle's exact row sort; the
# tolerant comparator still validates them against Pandas.
_NO_ORACLE = {"q02", "q15", "q18"}


@pytest.fixture(scope="module")
def tables():
    return synth_data.tpch_tables(sf=0.005)


@pytest.mark.parametrize("name", sorted(tpch.QUERIES), ids=lambda n: n)
def test_query_spark_o4(spark, name, tables):
    fn = tpch.QUERIES[name]
    needed = {t: tables[t] for t in tpch.query_tables(fn)}
    check_spark(spark, fn, tpch.tpch_catalog, needed, level=4,
                oracle=name not in _NO_ORACLE)


@pytest.mark.parametrize("name", ["q01", "q06", "q13"], ids=lambda n: n)
def test_query_spark_o0(spark, name, tables):
    """The unoptimized (Grizzly-simulated) SQL also runs correctly on Spark."""
    fn = tpch.QUERIES[name]
    needed = {t: tables[t] for t in tpch.query_tables(fn)}
    check_spark(spark, fn, tpch.tpch_catalog, needed, level=0, oracle=False)
