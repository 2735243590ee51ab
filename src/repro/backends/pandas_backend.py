"""Pandas baseline: run the decorated function directly on pandas inputs.

This is the paper's "Python" competitor — the unmodified Pandas/NumPy
implementation the user wrote.
"""
from __future__ import annotations

import pandas as pd


def run_pandas(func, tables: dict[str, object]):
    """Call ``func`` with pandas frames/arrays in parameter order."""
    import inspect

    params = list(inspect.signature(func).parameters)
    args = [tables[p] for p in params]
    out = func(*args)
    if isinstance(out, pd.Series):
        out = out.to_frame()
    return out
