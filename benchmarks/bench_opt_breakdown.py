"""Benchmark behind Fig. 10: cumulative optimization levels O0..O4 on
representative workloads (DuckDB backend; O0 = Grizzly-simulated)."""
import pytest

from repro import synth_data
from repro.core.api import compile_pytond
from repro.workloads import tpch
from repro.workloads.datascience import WORKLOADS

LEVELS = [0, 1, 2, 3, 4]
SF = 0.02


@pytest.fixture(scope="module")
def cases():
    data = synth_data.tpch_tables(sf=SF)
    out = {}
    for name in ("q03", "q09"):
        fn = tpch.QUERIES[name]
        out[name] = (fn, tpch.tpch_catalog,
                     {t: data[t] for t in tpch.query_tables(fn)})
    for name in ("crime_index", "hybrid_covar", "hybrid_matmul"):
        fn, cat_b, inp_b = WORKLOADS[name]
        out[name] = (fn, cat_b, inp_b(0.2))
    return out


@pytest.mark.parametrize("level", LEVELS, ids=lambda l: f"O{l}")
@pytest.mark.parametrize("name",
                         ["q03", "q09", "crime_index", "hybrid_covar", "hybrid_matmul"],
                         ids=lambda n: n)
def bench_level(benchmark, cases, name, level):
    fn, cat_b, tables = cases[name]
    cq = compile_pytond(fn, cat_b(), opt_level=level)
    benchmark.pedantic(lambda: cq.run_duckdb(tables), rounds=2, warmup_rounds=1)
