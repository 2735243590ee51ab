"""A-Normal-Form normalization of the decorated function's AST.

The paper (Section III-B) converts each ``@pytond`` function to ANF so that
every translation rule only has to handle one API call per statement:
nested sub-expressions are hoisted into assignments to fresh variables.

We keep *trivial* expressions in place (names, constants, attribute chains
such as ``df.col`` or ``x.str``, literal lists/tuples/dicts of constants,
and lambdas, whose bodies are translated symbolically later). Everything
else — calls, subscripts, binary/boolean/compare/unary expressions — is
hoisted when it appears nested inside another expression.
"""
from __future__ import annotations

import ast
import itertools
from typing import List


class _Normalizer:
    def __init__(self) -> None:
        self._ids = itertools.count(1)

    def fresh(self) -> str:
        return f"_a{next(self._ids)}"

    # -- expression helpers -------------------------------------------------
    def _is_trivial(self, e: ast.expr) -> bool:
        if isinstance(e, (ast.Name, ast.Constant, ast.Lambda)):
            return True
        if isinstance(e, ast.Attribute):
            return self._is_trivial(e.value)
        if isinstance(e, (ast.List, ast.Tuple, ast.Set)):
            return all(self._is_trivial(x) for x in e.elts)
        if isinstance(e, ast.Dict):
            return all(self._is_trivial(k) for k in e.keys if k is not None) and all(
                self._is_trivial(v) for v in e.values
            )
        if isinstance(e, ast.UnaryOp) and isinstance(e.operand, ast.Constant):
            return True  # e.g. -1
        if isinstance(e, ast.Slice):
            return all(
                s is None or self._is_trivial(s) for s in (e.lower, e.upper, e.step)
            )
        return False

    def _atomize(self, e: ast.expr, out: List[ast.stmt]) -> ast.expr:
        """Return a trivial expression equivalent to ``e``, emitting
        assignments for anything deeper into ``out``."""
        e = self._shallow(e, out)
        if self._is_trivial(e):
            return e
        name = self.fresh()
        out.append(ast.Assign(targets=[ast.Name(id=name, ctx=ast.Store())], value=e))
        return ast.Name(id=name, ctx=ast.Load())

    def _shallow(self, e: ast.expr, out: List[ast.stmt]) -> ast.expr:
        """Normalize ``e`` so its direct children are trivial."""
        if self._is_trivial(e):
            return e
        if isinstance(e, ast.BinOp):
            return ast.BinOp(
                left=self._atomize(e.left, out), op=e.op, right=self._atomize(e.right, out)
            )
        if isinstance(e, ast.BoolOp):
            return ast.BoolOp(op=e.op, values=[self._atomize(v, out) for v in e.values])
        if isinstance(e, ast.UnaryOp):
            return ast.UnaryOp(op=e.op, operand=self._atomize(e.operand, out))
        if isinstance(e, ast.Compare):
            return ast.Compare(
                left=self._atomize(e.left, out),
                ops=e.ops,
                comparators=[self._atomize(c, out) for c in e.comparators],
            )
        if isinstance(e, ast.Call):
            func = e.func
            if isinstance(func, ast.Attribute):
                func = ast.Attribute(
                    value=self._atomize(func.value, out), attr=func.attr, ctx=func.ctx
                )
            return ast.Call(
                func=func,
                args=[self._atomize(a, out) for a in e.args],
                keywords=[
                    ast.keyword(arg=k.arg, value=self._atomize(k.value, out))
                    for k in e.keywords
                ],
            )
        if isinstance(e, ast.Subscript):
            sl = e.slice
            if isinstance(sl, ast.Slice):
                sl = ast.Slice(
                    lower=None if sl.lower is None else self._atomize(sl.lower, out),
                    upper=None if sl.upper is None else self._atomize(sl.upper, out),
                    step=None if sl.step is None else self._atomize(sl.step, out),
                )
            elif isinstance(sl, ast.Tuple):
                sl = ast.Tuple(
                    elts=[
                        s if isinstance(s, ast.Slice) else self._atomize(s, out)
                        for s in sl.elts
                    ],
                    ctx=ast.Load(),
                )
            else:
                sl = self._atomize(sl, out)
            return ast.Subscript(value=self._atomize(e.value, out), slice=sl, ctx=e.ctx)
        if isinstance(e, ast.Attribute):
            return ast.Attribute(value=self._atomize(e.value, out), attr=e.attr, ctx=e.ctx)
        if isinstance(e, (ast.List, ast.Tuple)):
            cls = type(e)
            return cls(elts=[self._atomize(x, out) for x in e.elts], ctx=ast.Load())
        if isinstance(e, ast.Dict):
            return ast.Dict(
                keys=list(e.keys), values=[self._atomize(v, out) for v in e.values]
            )
        raise NotImplementedError(f"ANF: unsupported expression {ast.dump(e)}")

    # -- statements ---------------------------------------------------------
    def stmt(self, s: ast.stmt) -> List[ast.stmt]:
        out: List[ast.stmt] = []
        if isinstance(s, ast.Assign):
            if len(s.targets) != 1:
                raise NotImplementedError("ANF: multiple assignment targets")
            tgt = s.targets[0]
            val = self._shallow(s.value, out)
            if isinstance(tgt, ast.Subscript):
                tgt = ast.Subscript(
                    value=self._atomize(tgt.value, out),
                    slice=self._atomize(tgt.slice, out)
                    if not self._is_trivial(tgt.slice)
                    else tgt.slice,
                    ctx=ast.Store(),
                )
            out.append(ast.Assign(targets=[tgt], value=val))
        elif isinstance(s, ast.Return):
            if s.value is None:
                raise NotImplementedError("ANF: bare return")
            out.append(ast.Return(value=self._atomize(s.value, out)))
        elif isinstance(s, ast.Expr):
            out.append(ast.Expr(value=self._shallow(s.value, out)))
        else:
            raise NotImplementedError(
                f"ANF: unsupported statement {type(s).__name__} "
                "(PyTond functions are straight-line Pandas/NumPy pipelines)"
            )
        return out


def normalize_function(fn: ast.FunctionDef) -> ast.FunctionDef:
    """Return a new FunctionDef whose body is in A-Normal Form."""
    norm = _Normalizer()
    body: List[ast.stmt] = []
    for s in fn.body:
        if isinstance(s, ast.Expr) and isinstance(s.value, ast.Constant):
            continue  # docstring
        body.extend(norm.stmt(s))
    new = ast.FunctionDef(
        name=fn.name,
        args=fn.args,
        body=body,
        decorator_list=[],
        returns=None,
        type_comment=None,
        type_params=[],
    )
    return ast.fix_missing_locations(ast.copy_location(new, fn))


def anf_source(fn: ast.FunctionDef) -> str:
    """Unparsed ANF body — used in tests to check the normal form."""
    return ast.unparse(normalize_function(fn))
