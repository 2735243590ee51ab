"""Per-API translation tests: Pandas subset -> TondIR -> SQL -> DuckDB,
checked against the real Pandas execution of the same function (Table V)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.api import compile_pytond, pytond
from repro.core.catalog import Catalog, TableSchema
from repro.harness.check import check_duckdb


def _cat():
    cat = Catalog()
    cat.add(TableSchema("df", ("k", "a", "b", "s"), (frozenset({"k"}),)))
    cat.add(TableSchema("df2", ("k2", "x", "t"), (frozenset({"k2"}),)))
    return cat


@pytest.fixture(scope="module")
def tables():
    g = np.random.default_rng(0)
    n = 500
    df = pd.DataFrame({
        "k": np.arange(n), "a": g.integers(0, 50, n).astype("float64"),
        "b": g.random(n) * 100,
        "s": g.choice(["red", "green", "blue", "dark green"], n),
    })
    df2 = pd.DataFrame({
        "k2": np.arange(0, n, 3), "x": g.random(len(range(0, n, 3))),
        "t": g.choice(["u", "v"], len(range(0, n, 3))),
    })
    return {"df": df, "df2": df2}


# --- each decorated function exercises one API ------------------------------

@pytond()
def w_col_select(df):
    return df[["k", "a"]]


@pytond()
def w_attr_col(df):
    r = df[df.a > 10]
    return r


@pytond()
def w_filter_and_or(df):
    return df[((df.a > 10) & (df.b < 50)) | (df.s == "red")]


@pytond()
def w_filter_not(df):
    return df[~(df.a > 10)]


@pytond()
def w_head(df):
    return df.sort_values(["b"]).head(7)


@pytond()
def w_sort_desc(df):
    return df.sort_values(["a", "b"], ascending=[False, True]).head(9)


@pytond()
def w_nlargest(df):
    return df.nlargest(5, "b")


@pytond()
def w_unique(df):
    return df.s.unique()


@pytond()
def w_drop_duplicates(df):
    return df[["s"]].drop_duplicates()


@pytond()
def w_rename_drop(df):
    r = df.rename(columns={"a": "alpha"})
    return r.drop(["s"], axis=1)


@pytond()
def w_assign_col(df):
    d = df.copy()
    d["c"] = d.a * 2 + d.b
    return d


@pytond()
def w_replace_col(df):
    d = df.copy()
    d["a"] = d.a + 1
    return d


@pytond()
def w_apply_lambda(df):
    d = df.copy()
    d["c"] = d.a.apply(lambda v: v * 3 + 1)
    return d


@pytond()
def w_np_where(df):
    d = df.copy()
    d["flag"] = np.where(d.a > 25, 1.0, 0.0)
    return d


@pytond()
def w_groupby_sum(df):
    return df.groupby(["s"], as_index=False).agg(total=("b", "sum"))


@pytond()
def w_groupby_multi(df):
    return df.groupby(["s"], as_index=False).agg(
        total=("b", "sum"), lo=("a", "min"), hi=("a", "max"),
        avg=("b", "mean"), n=("k", "count"), nd=("a", "nunique"))


@pytond()
def w_groupby_size(df):
    return df.groupby(["s"], as_index=False).size()


@pytond()
def w_scalar_sum(df):
    return df.b.sum()


@pytond()
def w_scalar_expr(df):
    return df.b.sum() / df.a.count()


@pytond()
def w_scalar_in_filter(df):
    m = df.b.mean()
    return df[df.b > m]


@pytond()
def w_merge_inner(df, df2):
    return df.merge(df2, left_on="k", right_on="k2")


@pytond()
def w_merge_on(df, df2):
    d = df2.rename(columns={"k2": "k"})
    return df.merge(d, on="k")


@pytond()
def w_merge_left(df, df2):
    j = df.merge(df2, left_on="k", right_on="k2", how="left")
    return j.groupby(["s"], as_index=False).agg(n=("x", "count"))


@pytond()
def w_merge_suffixes(df, df2):
    d = df2.rename(columns={"x": "a", "k2": "k"})
    return df.merge(d, on="k")


@pytond()
def w_isin_series(df, df2):
    return df[df.k.isin(df2.k2)]


@pytond()
def w_not_isin(df, df2):
    return df[~df.k.isin(df2.k2)]


@pytond()
def w_isin_list(df):
    return df[df.s.isin(["red", "blue"])]


@pytond()
def w_between(df):
    return df[df.a.between(10, 20)]


@pytond()
def w_str_contains(df):
    return df[df.s.str.contains("green")]


@pytond()
def w_str_startswith(df):
    return df[df.s.str.startswith("dark")]


@pytond()
def w_str_endswith(df):
    return df[df.s.str.endswith("een")]


@pytond()
def w_str_slice(df):
    d = df.copy()
    d["s2"] = d.s.str[:2]
    return d


@pytond()
def w_round_abs(df):
    d = df.copy()
    d["r"] = (d.b - 50.0).abs().round(1)
    return d


@pytond(pivot_values={"s": ["red", "green", "blue", "dark green"]})
def w_pivot(df):
    d = df.copy()
    d["grp"] = np.where(d.a > 25, 1, 0)
    return d.pivot_table(index="grp", columns="s", values="b",
                         aggfunc="sum", fill_value=0).reset_index()


@pytond()
def w_implicit_join(df, df2):
    d = pd.DataFrame()
    d["a"] = df["a"]
    return d


ALL = [
    w_col_select, w_attr_col, w_filter_and_or, w_filter_not, w_head,
    w_sort_desc, w_nlargest, w_unique, w_drop_duplicates, w_rename_drop,
    w_assign_col, w_replace_col, w_apply_lambda, w_np_where, w_groupby_sum,
    w_groupby_multi, w_groupby_size, w_scalar_sum, w_scalar_expr,
    w_scalar_in_filter, w_merge_inner, w_merge_on, w_merge_left,
    w_merge_suffixes, w_isin_series, w_not_isin, w_isin_list, w_between,
    w_str_contains, w_str_startswith, w_str_endswith, w_str_slice,
    w_round_abs, w_pivot,
]


@pytest.mark.parametrize("fn", ALL, ids=lambda f: f.__name__)
def test_api(fn, tables):
    import inspect

    needed = {p: tables[p] for p in inspect.signature(fn).parameters}
    check_duckdb(fn, _cat, needed)


def test_implicit_join_uid(tables):
    """The paper's implicit-join pattern: seed an empty DataFrame from one
    frame's column (Section III-C, UID-based alignment)."""
    check_duckdb(w_implicit_join, _cat,
                 {"df": tables["df"], "df2": tables["df2"]})


def test_merge_suffix_naming(tables):
    """Overlapping non-key columns get pandas' _x/_y suffixes."""
    from repro.core.evaluator import translate

    prog = translate(w_merge_suffixes, _cat())
    sink_cols = prog.sink.head.cols
    assert "a_x" in sink_cols and "a_y" in sink_cols and "a" not in sink_cols


def test_pivot_requires_values():
    cat = Catalog().add(TableSchema("df", ("k", "a", "b", "s")))

    @pytond()
    def bad(df):
        return df.pivot_table(index="a", columns="s", values="b", aggfunc="sum")

    with pytest.raises(KeyError, match="pivot_table"):
        compile_pytond(bad, cat)


def test_mixed_frame_expression_rejected(tables):
    @pytond()
    def bad(df, df2):
        return df[df.a > df2.x]

    with pytest.raises(ValueError, match="merge the frames"):
        compile_pytond(bad, _cat())
