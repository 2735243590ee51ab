"""Reproduce Fig. 5/6 numbers: the hybrid data-science workloads.

Usage: spark-submit jobs/run_datascience.py [scale]
"""
import sys

from common import get_spark


def main():
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 0.5

    from repro.harness import experiments as ex
    from repro.workloads.datascience import WORKLOADS

    spark = get_spark("pytond-datascience")
    workloads = {name: (fn, cat_b, inp_b(scale))
                 for name, (fn, cat_b, inp_b) in WORKLOADS.items()}
    df = ex.run_matrix(workloads, spark=spark, repeat=3)
    wide = ex.speedup_table(df)
    print(f"\n## Data-science workloads (scale={scale})\n")
    print(ex.to_markdown(wide))
    spark.stop()


if __name__ == "__main__":
    main()
