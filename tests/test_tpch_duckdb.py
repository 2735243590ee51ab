"""Integration: all 22 TPC-H queries, PyTond-on-DuckDB at O0 (the
Grizzly-simulated baseline SQL) and O4 (full optimization) vs the Pandas
baseline. This proves translation coverage of the whole benchmark — the
paper's headline expressiveness claim — and that every optimization level
is semantics-preserving."""
import pytest

from repro import synth_data
from repro.harness.check import check_duckdb
from repro.workloads import tpch


@pytest.fixture(scope="module")
def tables():
    return synth_data.tpch_tables(sf=0.01)


@pytest.mark.parametrize("name", sorted(tpch.QUERIES), ids=lambda n: n)
def test_query_o0_o4(name, tables):
    fn = tpch.QUERIES[name]
    needed = {t: tables[t] for t in tpch.query_tables(fn)}
    check_duckdb(fn, tpch.tpch_catalog, needed, levels=(0, 4))


@pytest.mark.parametrize("name", ["q01", "q03", "q06", "q09", "q13", "q17", "q21"],
                         ids=lambda n: n)
def test_query_intermediate_levels(name, tables):
    """Representative queries also at O1/O2/O3 (Fig. 10 breakdown levels)."""
    fn = tpch.QUERIES[name]
    needed = {t: tables[t] for t in tpch.query_tables(fn)}
    check_duckdb(fn, tpch.tpch_catalog, needed, levels=(1, 2, 3))


def test_o4_produces_fewer_ctes(tables):
    """Rule inlining measurably compresses the generated SQL."""
    from repro.core.api import compile_pytond

    for name in ("q01", "q03", "q05", "q10"):
        fn = tpch.QUERIES[name]
        o0 = compile_pytond(fn, tpch.tpch_catalog(), opt_level=0)
        o4 = compile_pytond(fn, tpch.tpch_catalog(), opt_level=4)
        assert len(o4.program.rules) < len(o0.program.rules)
