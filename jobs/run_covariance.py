"""Reproduce Fig. 9 numbers: covariance-matrix sweep (rows/cols/sparsity),
NumPy vs PyTond dense/sparse on DuckDB and Spark.

Usage: spark-submit jobs/run_covariance.py
"""
from common import get_spark


def main():
    from repro.harness import experiments as ex

    spark = get_spark("pytond-covariance")
    df = ex.run_covariance_sweep(spark=spark)
    print("\n## Covariance sweep (Fig. 9)\n")
    print(ex.to_markdown(df))
    spark.stop()


if __name__ == "__main__":
    main()
