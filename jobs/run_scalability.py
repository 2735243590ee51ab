"""Reproduce Fig. 7/8 numbers: thread scalability of representative
workloads (DuckDB PRAGMA threads; Spark shuffle-partition proxy).

Usage: spark-submit jobs/run_scalability.py [SF]
"""
import sys

from common import get_spark


def main():
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05

    from repro import synth_data
    from repro.harness import experiments as ex
    from repro.workloads import tpch
    from repro.workloads.datascience import WORKLOADS

    spark = get_spark("pytond-scalability")
    tables = synth_data.tpch_tables(sf=sf)
    workloads = {}
    for name in ("q01", "q04", "q06", "q12", "q13", "q14", "q19"):
        fn = tpch.QUERIES[name]
        workloads[name] = (fn, tpch.tpch_catalog,
                           {t: tables[t] for t in tpch.query_tables(fn)})
    for name in ("crime_index", "n3", "n9", "birth_analysis"):
        fn, cat_b, inp_b = WORKLOADS[name]
        workloads[name] = (fn, cat_b, inp_b(0.5))
    df = ex.run_scalability(workloads, spark=spark, threads=(1, 2, 4))
    sp = ex.scalability_speedups(df)
    print(f"\n## Scalability (SF={sf}) — speedup over own 1-thread time\n")
    print(ex.to_markdown(sp))
    spark.stop()


if __name__ == "__main__":
    main()
