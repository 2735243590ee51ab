"""Experiment runners reproducing the numbers behind the paper's evaluation
figures (3-10). Each runner returns a tidy pandas frame of timings and a
markdown printer so EXPERIMENTS.md can diff paper vs measured.

Systems:
* ``pandas``          — the Python baseline (unmodified Pandas/NumPy).
* ``grizzly_spark``   — O0 SQL (Grizzly-simulated, Section V-A) on Spark.
* ``grizzly_duckdb``  — O0 SQL on DuckDB.
* ``pytond_spark``    — O4 SQL on Spark SQL / Catalyst (the paper's
                        compiled-engine slot, held by Hyper there).
* ``pytond_duckdb``   — O4 SQL on DuckDB.
"""
from __future__ import annotations

import time
from statistics import median
from typing import Callable, Iterable, Optional

import numpy as np
import pandas as pd

from repro.backends.pandas_backend import run_pandas
from repro.core.api import CompiledQuery, compile_pytond


def time_call(f: Callable[[], object], repeat: int = 3, warmup: int = 1) -> float:
    """Median wall-clock seconds of ``f`` after warm-up (paper: 5+5 rounds;
    scaled down to keep the benchmark suite tractable)."""
    for _ in range(warmup):
        f()
    times = []
    for _ in range(repeat):
        t0 = time.perf_counter()
        f()
        times.append(time.perf_counter() - t0)
    return median(times)


def _spark_runner(cq: CompiledQuery, spark, sdf: dict) -> Callable[[], object]:
    def run():
        out = cq.run_spark(spark, sdf)
        out.toPandas()  # force execution + result materialization
        return out

    return run


def _duckdb_runner(cq: CompiledQuery, tables: dict,
                   threads: Optional[int] = None) -> Callable[[], object]:
    return lambda: cq.run_duckdb(tables, threads=threads)


def systems_for(fn, catalog_builder, tables, spark=None, duck_threads=None):
    """Build the callable per system for one workload."""
    out: dict[str, Callable[[], object]] = {
        "pandas": lambda: run_pandas(fn, tables),
    }
    o0 = compile_pytond(fn, catalog_builder(), opt_level=0)
    o4 = compile_pytond(fn, catalog_builder(), opt_level=4)
    out["grizzly_duckdb"] = _duckdb_runner(o0, tables, duck_threads)
    out["pytond_duckdb"] = _duckdb_runner(o4, tables, duck_threads)
    if spark is not None:
        sdf = {k: spark.createDataFrame(v) for k, v in tables.items()}
        for k, v in sdf.items():
            v.cache().count()  # paper excludes load time: pre-materialize
        out["grizzly_spark"] = _spark_runner(o0, spark, sdf)
        out["pytond_spark"] = _spark_runner(o4, spark, sdf)
    return out


def run_matrix(workloads: dict, *, spark=None, repeat=3, warmup=1,
               systems: Optional[Iterable[str]] = None,
               duck_threads=None) -> pd.DataFrame:
    """workloads: name -> (fn, catalog_builder, tables). Returns tidy frame
    (workload, system, seconds)."""
    rows = []
    for name, (fn, cat_b, tables) in workloads.items():
        sys_map = systems_for(fn, cat_b, tables, spark=spark,
                              duck_threads=duck_threads)
        for sname, runner in sys_map.items():
            if systems is not None and sname not in systems:
                continue
            secs = time_call(runner, repeat=repeat, warmup=warmup)
            rows.append({"workload": name, "system": sname, "seconds": secs})
    return pd.DataFrame(rows)


def speedup_table(df: pd.DataFrame, baseline: str = "pandas") -> pd.DataFrame:
    """Pivot to one row per workload with times and speedups vs baseline."""
    wide = df.pivot(index="workload", columns="system", values="seconds")
    out = wide.copy()
    if baseline in wide:
        for c in wide.columns:
            if c != baseline:
                out[f"speedup_{c}"] = wide[baseline] / wide[c]
    return out.reset_index()


def geomean(series) -> float:
    vals = np.asarray([v for v in series if np.isfinite(v) and v > 0])
    return float(np.exp(np.log(vals).mean())) if len(vals) else float("nan")


def to_markdown(df: pd.DataFrame, floatfmt: str = "{:.4g}") -> str:
    df = df.copy()
    for c in df.columns:
        if pd.api.types.is_float_dtype(df[c]):
            df[c] = df[c].map(lambda v: floatfmt.format(v) if pd.notna(v) else "")
    header = "| " + " | ".join(map(str, df.columns)) + " |"
    sep = "|" + "|".join("---" for _ in df.columns) + "|"
    rows = ["| " + " | ".join(map(str, r)) + " |" for r in df.itertuples(index=False)]
    return "\n".join([header, sep] + rows)


# --------------------------------------------------------------------------
# Fig. 10: optimization breakdown
# --------------------------------------------------------------------------


def run_opt_breakdown(workloads: dict, *, spark=None, repeat=3,
                      levels=(0, 1, 2, 3, 4)) -> pd.DataFrame:
    """O-level sweep on DuckDB (and Spark when provided): the Fig. 10 bars."""
    rows = []
    for name, (fn, cat_b, tables) in workloads.items():
        for lvl in levels:
            cq = compile_pytond(fn, cat_b(), opt_level=lvl)
            secs = time_call(_duckdb_runner(cq, tables), repeat=repeat)
            rows.append({"workload": name, "backend": "duckdb",
                         "level": f"O{lvl}", "seconds": secs})
            if spark is not None:
                sdf = {k: spark.createDataFrame(v) for k, v in tables.items()}
                secs = time_call(_spark_runner(cq, spark, sdf), repeat=repeat)
                rows.append({"workload": name, "backend": "spark",
                             "level": f"O{lvl}", "seconds": secs})
    return pd.DataFrame(rows)


# --------------------------------------------------------------------------
# Fig. 7/8: scalability
# --------------------------------------------------------------------------


def run_scalability(workloads: dict, *, spark=None, threads=(1, 2, 4),
                    repeat=3) -> pd.DataFrame:
    """Thread sweep. DuckDB uses PRAGMA threads (faithful to the paper);
    Spark's core count is fixed in local[*], so shuffle partitions serve as
    the parallelism proxy (substitution documented in DESIGN.md)."""
    rows = []
    for name, (fn, cat_b, tables) in workloads.items():
        o4 = compile_pytond(fn, cat_b(), opt_level=4)
        for t in threads:
            secs = time_call(_duckdb_runner(o4, tables, threads=t), repeat=repeat)
            rows.append({"workload": name, "system": "pytond_duckdb",
                         "threads": t, "seconds": secs})
        if spark is not None:
            sdf = {k: spark.createDataFrame(v) for k, v in tables.items()}
            for k, v in sdf.items():
                v.cache().count()
            old = spark.conf.get("spark.sql.shuffle.partitions")
            for t in threads:
                spark.conf.set("spark.sql.shuffle.partitions", str(t))
                secs = time_call(_spark_runner(o4, spark, sdf), repeat=repeat)
                rows.append({"workload": name, "system": "pytond_spark",
                             "threads": t, "seconds": secs})
            spark.conf.set("spark.sql.shuffle.partitions", old)
        secs = time_call(lambda: run_pandas(fn, tables), repeat=repeat)
        for t in threads:  # pandas is single-threaded at every point
            rows.append({"workload": name, "system": "pandas",
                         "threads": t, "seconds": secs})
    return pd.DataFrame(rows)


def scalability_speedups(df: pd.DataFrame) -> pd.DataFrame:
    """Speedup of each (workload, system) over its own 1-thread time."""
    base = df[df.threads == df.threads.min()].set_index(["workload", "system"])["seconds"]
    out = df.copy()
    out["speedup"] = [
        base.loc[(w, s)] / sec for w, s, sec in zip(out.workload, out.system, out.seconds)
    ]
    return out


# --------------------------------------------------------------------------
# Fig. 9: covariance sweep
# --------------------------------------------------------------------------


def run_covariance_sweep(*, spark=None, rows_list=(10_000, 50_000, 200_000),
                         cols_list=(4, 8, 16), sparsity_list=(1, 10, 100),
                         fixed_rows=50_000, fixed_cols=8, fixed_sparsity=100,
                         repeat=3) -> pd.DataFrame:
    """NumPy vs PyTond dense/sparse on both engines, one dimension varied at
    a time (paper fixes 1M rows x 32 cols; scaled to the container)."""
    from repro import synth_data
    from repro.workloads import covariance as cov

    configs = (
        [("rows", r, fixed_cols, fixed_sparsity) for r in rows_list]
        + [("cols", fixed_rows, c, fixed_sparsity) for c in cols_list]
        + [("sparsity", fixed_rows, fixed_cols, s) for s in sparsity_list]
    )
    out = []
    for axis, n_rows, n_cols, sparsity in configs:
        m = synth_data.dense_matrix(n_rows, n_cols, sparsity)
        dense_t = synth_data.dense_matrix_table(m)
        coo_t = synth_data.coo_matrix_table(m)
        meta = {"axis": axis, "rows": n_rows, "cols": n_cols, "sparsity": sparsity}
        out.append({**meta, "system": "numpy",
                    "seconds": time_call(lambda: cov.numpy_covar(m), repeat=repeat)})
        dq = compile_pytond(cov.covar, cov.dense_catalog(n_cols), opt_level=4)
        sq = compile_pytond(cov.covar, cov.sparse_catalog(), opt_level=4)
        out.append({**meta, "system": "pytond_duckdb_dense",
                    "seconds": time_call(_duckdb_runner(dq, {"m": dense_t}), repeat=repeat)})
        out.append({**meta, "system": "pytond_duckdb_sparse",
                    "seconds": time_call(_duckdb_runner(sq, {"m": coo_t}), repeat=repeat)})
        if spark is not None:
            sdd = {"m": spark.createDataFrame(dense_t)}
            sdc = {"m": spark.createDataFrame(coo_t)}
            out.append({**meta, "system": "pytond_spark_dense",
                        "seconds": time_call(_spark_runner(dq, spark, sdd), repeat=repeat)})
            out.append({**meta, "system": "pytond_spark_sparse",
                        "seconds": time_call(_spark_runner(sq, spark, sdc), repeat=repeat)})
    return pd.DataFrame(out)
