"""Reproduce Fig. 3/4 numbers: all 22 TPC-H queries across systems.

Usage: spark-submit jobs/run_tpch.py [SF] [q01 q02 ...]
Prints a markdown table (seconds + speedups over Pandas) and the paper's
geometric-mean comparison.
"""
import sys

from common import get_spark


def main():
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05
    only = sys.argv[2:] or None

    from repro import synth_data
    from repro.harness import experiments as ex
    from repro.workloads import tpch

    spark = get_spark("pytond-tpch")
    tables = synth_data.tpch_tables(sf=sf)
    names = only or sorted(tpch.QUERIES)
    workloads = {}
    for name in names:
        fn = tpch.QUERIES[name]
        workloads[name] = (fn, tpch.tpch_catalog,
                           {t: tables[t] for t in tpch.query_tables(fn)})
    df = ex.run_matrix(workloads, spark=spark, repeat=3)
    wide = ex.speedup_table(df)
    print(f"\n## TPC-H (SF={sf}) — seconds and speedup over Pandas\n")
    print(ex.to_markdown(wide))
    for sysname in ("pytond_spark", "pytond_duckdb", "grizzly_spark", "grizzly_duckdb"):
        col = f"speedup_{sysname}"
        if col in wide:
            print(f"geomean speedup {sysname}: {ex.geomean(wide[col]):.2f}x")
    spark.stop()


if __name__ == "__main__":
    main()
