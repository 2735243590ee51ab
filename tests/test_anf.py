"""Tests for A-Normal-Form normalization (paper Section III-B)."""
import ast

import pytest

from repro.core.anf import anf_source, normalize_function


def _fn(src: str) -> ast.FunctionDef:
    tree = ast.parse(src)
    return next(n for n in ast.walk(tree) if isinstance(n, ast.FunctionDef))


def _norm(src: str) -> str:
    return anf_source(_fn(src))


class TestANF:
    def test_simple_untouched(self):
        out = _norm("def f(df):\n    x = df\n    return x\n")
        assert out.splitlines()[1:] == ["    x = df", "    return x"]

    def test_nested_filter_hoisted(self):
        out = _norm("def f(df):\n    r = df[df.b > 10]\n    return r\n")
        lines = out.splitlines()[1:]
        # the comparison is hoisted to a temp, then used as the subscript
        assert any("df.b > 10" in l and l.strip().startswith("_a") for l in lines)
        assert any("df[_a" in l for l in lines)

    def test_paper_example_shape(self):
        src = (
            "def f(df1, df2):\n"
            "    res = df1[df1.b > 10]['a'].merge(df2[df2.y == 'r']['x'],"
            " left_on='a', right_on='x')\n"
            "    return res\n"
        )
        out = _norm(src)
        # one API call per line: both filters, both projections, the merge
        assert out.count("_a") >= 8
        assert "merge" in out.splitlines()[-2]

    def test_call_args_atomized(self):
        out = _norm("def f(df):\n    r = df.head(1 + 2)\n    return r\n")
        assert any("1 + 2" in l and "_a" in l for l in out.splitlines())

    def test_kwarg_constants_stay(self):
        out = _norm("def f(a, b):\n    r = a.merge(b, on='k')\n    return r\n")
        assert "on='k'" in out

    def test_string_list_stays(self):
        out = _norm("def f(df):\n    r = df[['a', 'b']]\n    return r\n")
        assert "df[['a', 'b']]" in out

    def test_lambda_untouched(self):
        out = _norm("def f(df):\n    r = df.a.apply(lambda x: x + 1)\n    return r\n")
        assert "lambda x: x + 1" in out

    def test_return_atomized(self):
        out = _norm("def f(df):\n    return (df.a * df.b).sum()\n")
        assert out.splitlines()[-1].strip().startswith("return _a")

    def test_chained_compare_rejected_later_not_here(self):
        # chained method calls split into one call per statement
        out = _norm("def f(df):\n    r = df.sort_values('a').head(5)\n    return r\n")
        lines = [l.strip() for l in out.splitlines()[1:]]
        assert any(l.endswith(".sort_values('a')") for l in lines)
        assert any(".head(5)" in l for l in lines)

    def test_docstring_dropped(self):
        out = _norm('def f(df):\n    """doc"""\n    return df\n')
        assert "doc" not in out

    def test_subscript_assign_target(self):
        out = _norm("def f(df):\n    df['x'] = df.a * 2\n    return df\n")
        assert "df['x'] =" in out

    def test_unsupported_statement(self):
        with pytest.raises(NotImplementedError):
            normalize_function(_fn("def f(df):\n    for i in df:\n        pass\n    return df\n"))

    def test_negative_literal_trivial(self):
        out = _norm("def f(df):\n    r = df[df.a > -60.0]\n    return r\n")
        assert "-60.0" in out

    def test_boolop_values_atomized(self):
        out = _norm(
            "def f(df):\n    r = df[(df.a > 1) & (df.b < 2)]\n    return r\n"
        )
        # both comparisons hoisted before the & expression
        assert out.count("_a") >= 4
