"""Order- and float-tolerant result comparison between backends.

Aggregates computed by different engines (pandas/NumPy, DuckDB, Spark)
differ in summation order, so float columns are compared with a relative
tolerance; rows are aligned by sorting on a *rounded* copy so ulp-level
differences cannot flip the sort.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def normalize_result(obj) -> pd.DataFrame:
    """Coerce any backend result (scalar, Series, DataFrame) to a frame."""
    if isinstance(obj, pd.DataFrame):
        out = obj.reset_index(drop=True).copy()
    elif isinstance(obj, pd.Series):
        out = obj.to_frame().reset_index(drop=True)
    elif isinstance(obj, np.ndarray) and obj.ndim == 1:
        out = pd.DataFrame({"v0": obj})
    elif np.isscalar(obj) or isinstance(obj, (np.floating, np.integer)):
        out = pd.DataFrame({"v0": [float(obj)]})
    else:
        raise TypeError(f"cannot normalize {type(obj).__name__}")
    out.columns = [str(c) for c in out.columns]
    for c in out.columns:
        # datetimes -> date strings so tz/ns-resolution differences vanish
        if pd.api.types.is_datetime64_any_dtype(out[c]):
            out[c] = out[c].dt.strftime("%Y-%m-%d")
        # decimal.Decimal objects (Spark DECIMAL results) -> float
        elif out[c].dtype == object:
            import decimal

            if out[c].map(lambda v: isinstance(v, decimal.Decimal)).any():
                out[c] = out[c].astype("float64")
    return out


def _sorted(pdf: pd.DataFrame) -> pd.DataFrame:
    # Sort on exact values: cross-engine float noise (~1e-12 relative) can
    # only swap rows whose keys are within that noise, and those rows then
    # pass the tolerance check anyway. (Sorting *rounded* values misaligns
    # genuinely distinct rows that share a rounding bucket.)
    return pdf.sort_values(list(pdf.columns), kind="mergesort").reset_index(drop=True)


def assert_frames_close(got, expected, rtol: float = 1e-6, atol: float = 1e-6,
                        context: str = "") -> None:
    g, e = normalize_result(got), normalize_result(expected)
    if len(g.columns) == 1 and len(e.columns) == 1 and list(g.columns) != list(e.columns):
        g.columns = e.columns = ["v0"]  # e.g. Series.unique() -> unnamed array
    assert sorted(g.columns) == sorted(e.columns), (
        f"{context}: column mismatch {sorted(g.columns)} vs {sorted(e.columns)}"
    )
    g = _sorted(g[sorted(g.columns)])
    e = _sorted(e[sorted(e.columns)])
    assert len(g) == len(e), f"{context}: row count {len(g)} vs {len(e)}"
    for c in g.columns:
        gv, ev = g[c], e[c]
        if pd.api.types.is_numeric_dtype(gv) and pd.api.types.is_numeric_dtype(ev):
            ok = np.isclose(gv.astype("float64"), ev.astype("float64"),
                            rtol=rtol, atol=atol, equal_nan=True)
            assert ok.all(), (
                f"{context}: column {c} differs at rows "
                f"{list(np.where(~ok)[0][:5])}: {gv[~ok].head(3).tolist()} vs "
                f"{ev[~ok].head(3).tolist()}"
            )
        else:
            same = (gv.astype(str).values == ev.astype(str).values)
            assert same.all(), (
                f"{context}: column {c} differs: "
                f"{gv[~same].head(3).tolist()} vs {ev[~same].head(3).tolist()}"
            )
