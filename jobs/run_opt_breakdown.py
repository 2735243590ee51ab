"""Reproduce Fig. 10 numbers: cumulative effect of O1..O4 vs the O0
(Grizzly-simulated) baseline on representative workloads.

Usage: spark-submit jobs/run_opt_breakdown.py [SF]
"""
import sys

from common import get_spark


def main():
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05

    from repro import synth_data
    from repro.harness import experiments as ex
    from repro.workloads import tpch
    from repro.workloads.datascience import WORKLOADS

    spark = get_spark("pytond-opt-breakdown")
    tables = synth_data.tpch_tables(sf=sf)
    workloads = {}
    for name in ("q03", "q09"):
        fn = tpch.QUERIES[name]
        workloads[name] = (fn, tpch.tpch_catalog,
                           {t: tables[t] for t in tpch.query_tables(fn)})
    for name in ("crime_index", "hybrid_covar", "hybrid_matmul"):
        fn, cat_b, inp_b = WORKLOADS[name]
        workloads[name] = (fn, cat_b, inp_b(0.5))
    df = ex.run_opt_breakdown(workloads, spark=spark)
    print(f"\n## Optimization breakdown (SF={sf})\n")
    print(ex.to_markdown(df))
    spark.stop()


if __name__ == "__main__":
    main()
