"""Symbolic evaluator: executes the ANF'd AST over Sym* values.

Each ANF statement is one Pandas/NumPy "API call"; this module implements
the per-API translation rules of Table V by dispatching on the receiver's
symbolic type and the method name, emitting TondIR rules through the
:class:`~repro.core.frontend.Translator`.
"""
from __future__ import annotations

import ast
import datetime as dt
import inspect
import textwrap
from typing import Optional

import numpy as np
import pandas as pd

from . import einsum as einsum_mod
from .anf import normalize_function
from .catalog import Catalog
from .frontend import (
    BoundMethod,
    ColRef,
    ConstArray,
    EmptyFrame,
    InSub,
    ModuleRef,
    ScalarRef,
    SymArray,
    SymFrame,
    SymGroupBy,
    SymScalar,
    SymSeries,
    Translator,
)
from .ir import Agg, BinOp, Const, Ext, If, Program, Term, UnOp

_BIN = {ast.Add: "+", ast.Sub: "-", ast.Mult: "*", ast.Div: "/",
        ast.BitAnd: "and", ast.BitOr: "or"}
_CMP = {ast.Eq: "==", ast.NotEq: "!=", ast.Lt: "<", ast.LtE: "<=", ast.Gt: ">", ast.GtE: ">="}

_AGG_FUNCS = {"sum": "sum", "min": "min", "max": "max", "mean": "avg", "count": "count",
              "nunique": "count_distinct"}


def _to_const(v) -> Term:
    if isinstance(v, (pd.Timestamp, dt.datetime)):
        return Const(v.date() if hasattr(v, "date") else v)
    return Const(v)


class SymbolicEvaluator:
    def __init__(self, tr: Translator, func_globals: dict):
        self.tr = tr
        self.env: dict[str, object] = {}
        self.globals = func_globals
        self.result = None

    # ------------------------------------------------------------------ run
    def run(self, fn: ast.FunctionDef, params: dict[str, object]) -> object:
        self.env.update(params)
        for stmt in fn.body:
            self._stmt(stmt)
            if self.result is not None:
                break
        if self.result is None:
            raise ValueError("@pytond function must end with a return")
        return self.result

    # ------------------------------------------------------------- helpers
    def _series_expr(self, v, frame: Optional[SymFrame]):
        """Coerce ``v`` to (term, frame) merging frame provenance."""
        if isinstance(v, SymSeries):
            f = v.frame or frame
            if frame is not None and v.frame is not None and v.frame.rel != frame.rel:
                raise ValueError(
                    f"expression mixes columns of {v.frame.rel} and {frame.rel}; "
                    "merge the frames first"
                )
            return v.expr, f
        if isinstance(v, SymScalar):
            return v.expr, frame
        if isinstance(v, (int, float, str, bool, dt.date, pd.Timestamp)):
            return _to_const(v), frame
        raise TypeError(f"cannot use {type(v).__name__} in a column expression")

    def _binop(self, op: str, a, b) -> object:
        ea, f = self._series_expr(a, None)
        eb, f = self._series_expr(b, f)
        expr = BinOp(op, ea, eb)
        if f is None:
            return SymScalar(expr)
        return SymSeries(f, expr)

    # ------------------------------------------------------------ statements
    def _stmt(self, s: ast.stmt) -> None:
        if isinstance(s, ast.Assign):
            tgt = s.targets[0]
            if isinstance(tgt, ast.Name):
                self.env[tgt.id] = self._expr(s.value)
            elif isinstance(tgt, ast.Subscript):
                self._setitem(tgt, s.value)
            else:
                raise NotImplementedError(f"assignment target {ast.dump(tgt)}")
        elif isinstance(s, ast.Return):
            self.result = self._expr(s.value)
        elif isinstance(s, ast.Expr):
            self._expr(s.value)
        else:
            raise NotImplementedError(f"statement {type(s).__name__}")

    def _setitem(self, tgt: ast.Subscript, value: ast.expr) -> None:
        obj = self._expr(tgt.value)
        key = self._expr(tgt.slice)
        val = self._expr(value)
        if not isinstance(key, str):
            raise NotImplementedError("df[...] = ... requires a string column name")
        name = self._target_name(tgt.value)
        if isinstance(obj, EmptyFrame):
            # df3 = pd.DataFrame(); df3['a'] = df1['a']  (implicit-join seed)
            if not isinstance(val, SymSeries) or val.frame is None:
                raise NotImplementedError("seeding an empty DataFrame needs a column")
            new = self.tr.emit_select(val.frame, [(key, val.expr)])
            self.env[name] = new
            return
        if not isinstance(obj, SymFrame):
            raise NotImplementedError(f"cannot assign into {type(obj).__name__}")
        if isinstance(val, SymSeries) and val.frame is not None and val.frame.rel != obj.rel:
            # Implicit join (paper Section III-C): align by generated UIDs.
            left = self.tr.ensure_id(obj)
            right = self.tr.ensure_id(val.frame)
            # re-root the value expression onto the UID'd right frame
            expr = _replace_rel(val.expr, val.frame.rel, right.rel)
            joined = self.tr.emit_join(left, right, ["__id"], ["__id"], "inner",
                                       suffixes=("", "_r"))
            out = [(c, ColRef(joined.rel, c)) for c in obj.cols if c != key]
            out.append((key, _replace_rel(expr, right.rel, joined.rel)))
            self.env[name] = self.tr.emit_select(joined, out)
            return
        expr, _ = self._series_expr(val, obj)
        out = []
        replaced = False
        for c in obj.cols:
            if c == key:
                out.append((key, expr))
                replaced = True
            else:
                out.append((c, ColRef(obj.rel, c)))
        if not replaced:
            out.append((key, expr))
        self.env[name] = self.tr.emit_select(obj, out, filters=())

    @staticmethod
    def _target_name(node: ast.expr) -> str:
        if isinstance(node, ast.Name):
            return node.id
        raise NotImplementedError("subscript assignment requires a simple name")

    # ------------------------------------------------------------ expressions
    def _expr(self, e: ast.expr):
        if isinstance(e, ast.Name):
            if e.id in self.env:
                return self.env[e.id]
            if e.id in self.globals:
                g = self.globals[e.id]
                if g is np:
                    return ModuleRef("np")
                if g is pd:
                    return ModuleRef("pd")
                if isinstance(g, (int, float, str, bool, dt.date, list, tuple, dict)):
                    return g
            if e.id in ("len", "float", "int", "abs", "round"):
                return ("builtin", e.id)
            raise NameError(f"unknown name {e.id!r}")
        if isinstance(e, ast.Constant):
            return e.value
        if isinstance(e, (ast.List, ast.Tuple, ast.Set)):
            return [self._expr(x) for x in e.elts]
        if isinstance(e, ast.Dict):
            return {self._expr(k): self._expr(v) for k, v in zip(e.keys, e.values)}
        if isinstance(e, ast.Lambda):
            return ("lambda", e)
        if isinstance(e, ast.Attribute):
            return self._attribute(e)
        if isinstance(e, ast.Subscript):
            return self._subscript(e)
        if isinstance(e, ast.Call):
            return self._call(e)
        if isinstance(e, ast.BinOp):
            op = _BIN.get(type(e.op))
            if op is None:
                raise NotImplementedError(f"operator {type(e.op).__name__}")
            return self._binop(op, self._expr(e.left), self._expr(e.right))
        if isinstance(e, ast.Compare):
            if len(e.ops) != 1:
                raise NotImplementedError("chained comparisons")
            op = _CMP.get(type(e.ops[0]))
            if op is None:
                raise NotImplementedError(f"comparison {type(e.ops[0]).__name__}")
            return self._binop(op, self._expr(e.left), self._expr(e.comparators[0]))
        if isinstance(e, ast.BoolOp):
            op = "and" if isinstance(e.op, ast.And) else "or"
            vals = [self._expr(v) for v in e.values]
            out = vals[0]
            for v in vals[1:]:
                out = self._binop(op, out, v)
            return out
        if isinstance(e, ast.UnaryOp):
            v = self._expr(e.operand)
            if isinstance(e.op, ast.Invert) or isinstance(e.op, ast.Not):
                expr, f = self._series_expr(v, None)
                return SymSeries(f, UnOp("not", expr)) if f else SymScalar(UnOp("not", expr))
            if isinstance(e.op, ast.USub):
                if isinstance(v, (int, float)):
                    return -v
                expr, f = self._series_expr(v, None)
                return SymSeries(f, UnOp("-", expr)) if f else SymScalar(UnOp("-", expr))
            raise NotImplementedError(f"unary {type(e.op).__name__}")
        raise NotImplementedError(f"expression {type(e).__name__}")

    # -- attributes ---------------------------------------------------------
    _FRAME_METHODS = {
        "merge", "groupby", "sort_values", "head", "nlargest", "drop", "rename",
        "drop_duplicates", "reset_index", "copy", "to_numpy", "pivot_table",
        "assign",
    }
    _SERIES_METHODS = {
        "sum", "mean", "min", "max", "count", "nunique", "unique", "isin",
        "between", "round", "astype", "apply", "abs", "to_numpy",
    }
    _ARRAY_METHODS = {"sum", "all", "nonzero", "round", "compress", "transpose"}

    def _attribute(self, e: ast.Attribute):
        base = self._expr(e.value)
        a = e.attr
        if isinstance(base, ModuleRef):
            return ("module_fn", base.kind, a)
        if isinstance(base, SymFrame):
            if a in base.cols:
                return SymSeries(base, ColRef(base.rel, a), name=a)
            if a in self._FRAME_METHODS:
                return BoundMethod(base, a, self.tr)
            raise AttributeError(f"frame has no column/method {a!r} (cols={base.cols})")
        if isinstance(base, SymSeries):
            if a == "str":
                return ("strns", base)
            if a == "dt":
                return ("dtns", base)
            if a in self._SERIES_METHODS:
                return BoundMethod(base, a, self.tr)
            raise AttributeError(f"series has no method {a!r}")
        if isinstance(base, tuple) and base and base[0] == "strns":
            return ("str_method", base[1], a)
        if isinstance(base, tuple) and base and base[0] == "dtns":
            s: SymSeries = base[1]
            if a in ("year", "month", "day"):
                return SymSeries(s.frame, Ext(a, (s.expr,)))
            raise AttributeError(f".dt.{a} not supported")
        if isinstance(base, SymArray):
            if a in self._ARRAY_METHODS:
                return BoundMethod(base, a, self.tr)
            if a == "T":
                return einsum_mod.translate_einsum(self.tr, "ij->ji", [base])
            raise AttributeError(f"array has no method {a!r}")
        if isinstance(base, SymGroupBy):
            if a in ("agg", "size"):
                return BoundMethod(base, a, self.tr)
            raise AttributeError(f"groupby has no method {a!r}")
        if isinstance(base, SymScalar) and a in self._SERIES_METHODS:
            raise NotImplementedError(f"scalar method {a}")
        raise NotImplementedError(f"attribute {a!r} on {type(base).__name__}")

    # -- subscripts ---------------------------------------------------------
    def _subscript(self, e: ast.Subscript):
        base = self._expr(e.value)
        if isinstance(base, tuple) and base and base[0] == "strns":
            # phone.str[:2]
            s: SymSeries = base[1]
            sl = e.slice
            if isinstance(sl, ast.Slice):
                lo = 0 if sl.lower is None else self._expr(sl.lower)
                hi = self._expr(sl.upper)
                return SymSeries(s.frame, Ext("substr", (s.expr, Const(lo + 1), Const(hi - lo))))
            raise NotImplementedError("str[...] requires a slice")
        key = self._expr(e.slice) if not isinstance(e.slice, ast.Slice) else e.slice
        if isinstance(base, SymFrame):
            if isinstance(key, str):
                if key not in base.cols:
                    raise KeyError(f"no column {key!r} in {base.cols}")
                return SymSeries(base, ColRef(base.rel, key), name=key)
            if isinstance(key, list) and all(isinstance(k, str) for k in key):
                out = [(k, ColRef(base.rel, k)) for k in key]
                return self.tr.emit_select(base, out)
            if isinstance(key, SymSeries):
                if key.frame is not None and key.frame.rel != base.rel:
                    raise ValueError("boolean mask must come from the same frame")
                out = [(c, ColRef(base.rel, c)) for c in base.cols]
                return self.tr.emit_select(base, out, filters=[key.expr])
            raise NotImplementedError(f"df[{key!r}]")
        if isinstance(base, SymArray):
            raise NotImplementedError("array subscripts: use compress/nonzero")
        raise NotImplementedError(f"subscript on {type(base).__name__}")

    # -- calls --------------------------------------------------------------
    def _call(self, e: ast.Call):
        fn = self._expr(e.func)
        args = [self._expr(a) for a in e.args]
        kwargs = {k.arg: self._expr(k.value) for k in e.keywords}
        if isinstance(fn, BoundMethod):
            return self._method(fn.obj, fn.name, args, kwargs)
        if isinstance(fn, tuple):
            kind = fn[0]
            if kind == "module_fn":
                return self._module_fn(fn[1], fn[2], args, kwargs)
            if kind == "str_method":
                return self._str_method(fn[1], fn[2], args, kwargs)
            if kind == "builtin":
                return self._builtin(fn[1], args)
        raise NotImplementedError(f"call target {fn!r}")

    def _builtin(self, name: str, args):
        if name == "len":
            (obj,) = args
            if isinstance(obj, SymFrame):
                return self.tr.emit_scalar(obj, Agg("count", None))
            raise NotImplementedError("len() of non-frame")
        if name in ("float", "int"):
            return args[0]
        if name == "abs":
            expr, f = self._series_expr(args[0], None)
            t = Ext("abs", (expr,))
            return SymSeries(f, t) if f else SymScalar(t)
        if name == "round":
            expr, f = self._series_expr(args[0], None)
            nd = Const(args[1]) if len(args) > 1 else Const(0)
            t = Ext("round", (expr, nd))
            return SymSeries(f, t) if f else SymScalar(t)
        raise NotImplementedError(f"builtin {name}")

    def _str_method(self, s: SymSeries, name: str, args, kwargs):
        if name == "contains":
            pat = args[0]
            if kwargs.get("regex", False):
                pat = pat.replace(".*", "%")
            return SymSeries(s.frame, Ext("like", (s.expr, Const(f"%{pat}%"))))
        if name == "startswith":
            return SymSeries(s.frame, Ext("like", (s.expr, Const(f"{args[0]}%"))))
        if name == "endswith":
            return SymSeries(s.frame, Ext("like", (s.expr, Const(f"%{args[0]}"))))
        if name == "slice":
            lo, hi = args[0], args[1]
            return SymSeries(s.frame, Ext("substr", (s.expr, Const(lo + 1), Const(hi - lo))))
        if name in ("lower", "upper"):
            return SymSeries(s.frame, Ext(name, (s.expr,)))
        raise NotImplementedError(f".str.{name}")

    def _module_fn(self, mod: str, name: str, args, kwargs):
        if mod == "np":
            if name == "where":
                cond, a, b = args
                ec, f = self._series_expr(cond, None)
                ea, f = self._series_expr(a, f)
                eb, f = self._series_expr(b, f)
                t = If(ec, ea, eb)
                return SymSeries(f, t) if f else SymScalar(t)
            if name == "einsum":
                spec = args[0]
                return einsum_mod.translate_einsum(self.tr, spec, args[1:])
            if name == "array":
                return ConstArray(np.asarray(args[0], dtype="float64"))
            if name == "dot":
                a, b = args
                if isinstance(a, SymArray) and isinstance(b, (ConstArray, SymArray)):
                    return einsum_mod.translate_einsum(self.tr, "ij,j->i", [a, b])
            raise NotImplementedError(f"np.{name}")
        if mod == "pd":
            if name == "Timestamp":
                return pd.Timestamp(args[0])
            if name == "DataFrame":
                if not args and not kwargs:
                    return EmptyFrame()
                if args and isinstance(args[0], SymArray):
                    arr = args[0]
                    names = kwargs.get("columns")
                    if arr.layout != "dense":
                        raise NotImplementedError("pd.DataFrame of sparse array")
                    if names is None:
                        names = arr.value_cols
                    src = SymFrame(arr.rel, ["id"] + arr.value_cols)
                    out = [(n, ColRef(arr.rel, c)) for n, c in zip(names, arr.value_cols)]
                    return self.tr.emit_select(src, out)
                raise NotImplementedError("pd.DataFrame(...) of this shape")
            raise NotImplementedError(f"pd.{name}")
        raise NotImplementedError(f"module {mod}")

    # -- method dispatch ----------------------------------------------------
    def _method(self, obj, name: str, args, kwargs):
        if isinstance(obj, SymFrame):
            return self._frame_method(obj, name, args, kwargs)
        if isinstance(obj, SymSeries):
            return self._series_method(obj, name, args, kwargs)
        if isinstance(obj, SymGroupBy):
            return self._groupby_method(obj, name, args, kwargs)
        if isinstance(obj, SymArray):
            return self._array_method(obj, name, args, kwargs)
        raise NotImplementedError(f"method {name} on {type(obj).__name__}")

    def _frame_method(self, fr: SymFrame, name: str, args, kwargs):
        tr = self.tr
        if name == "merge":
            other = args[0]
            how = kwargs.get("how", "inner")
            if "on" in kwargs:
                on = kwargs["on"]
                on = [on] if isinstance(on, str) else list(on)
                left_on = right_on = on
            elif how == "cross":
                left_on = right_on = []
            else:
                left_on = kwargs["left_on"]
                right_on = kwargs["right_on"]
                left_on = [left_on] if isinstance(left_on, str) else list(left_on)
                right_on = [right_on] if isinstance(right_on, str) else list(right_on)
            suffixes = tuple(kwargs.get("suffixes", ("_x", "_y")))
            return tr.emit_join(fr, other, left_on, right_on, how, suffixes)
        if name == "groupby":
            keys = args[0]
            keys = [keys] if isinstance(keys, str) else list(keys)
            return SymGroupBy(fr, keys)
        if name == "sort_values":
            by = args[0] if args else kwargs["by"]
            by = [by] if isinstance(by, str) else list(by)
            asc = kwargs.get("ascending", True)
            asc = [asc] * len(by) if isinstance(asc, bool) else list(asc)
            out = SymFrame(fr.rel, fr.cols)
            out.sort_pending = list(zip(by, asc))
            return out
        if name == "head":
            n = args[0]
            sort = tuple(fr.sort_pending or ())
            out = [(c, ColRef(fr.rel, c)) for c in fr.cols]
            return tr.emit_select(fr, out, sort=sort, limit=n)
        if name == "nlargest":
            n, col = args[0], args[1]
            out = [(c, ColRef(fr.rel, c)) for c in fr.cols]
            return tr.emit_select(fr, out, sort=((col, False),), limit=n)
        if name == "drop":
            cols = kwargs.get("columns", args[0] if args else None)
            cols = [cols] if isinstance(cols, str) else list(cols)
            out = [(c, ColRef(fr.rel, c)) for c in fr.cols if c not in cols]
            return tr.emit_select(fr, out)
        if name == "rename":
            mapping = kwargs["columns"]
            out = [(mapping.get(c, c), ColRef(fr.rel, c)) for c in fr.cols]
            return tr.emit_select(fr, out)
        if name == "drop_duplicates":
            out = [(c, ColRef(fr.rel, c)) for c in fr.cols]
            return tr.emit_select(fr, out, distinct=True)
        if name in ("reset_index", "copy"):
            return fr
        if name == "to_numpy":
            return tr.frame_to_dense_array(fr)
        if name == "pivot_table":
            return self._pivot(fr, kwargs)
        raise NotImplementedError(f"DataFrame.{name}")

    def _pivot(self, fr: SymFrame, kwargs):
        index = kwargs["index"]
        columns = kwargs["columns"]
        values = kwargs["values"]
        aggfunc = kwargs.get("aggfunc", "mean")
        func = _AGG_FUNCS.get(aggfunc, aggfunc)
        vals = self.tr.catalog.distinct_values("*", columns)
        out = [(index, ColRef(fr.rel, index))]
        for v in vals:
            cond = BinOp("==", ColRef(fr.rel, columns), Const(v))
            out.append((str(v), Agg(func, If(cond, ColRef(fr.rel, values), Const(0)))))
        return self.tr.emit_select(fr, out, group_keys=[index])

    def _series_method(self, s: SymSeries, name: str, args, kwargs):
        tr = self.tr
        if name in ("sum", "mean", "min", "max", "count", "nunique"):
            if s.frame is None:
                raise ValueError("aggregate of scalar expression")
            func = _AGG_FUNCS[name]
            distinct = func == "count_distinct"
            agg = Agg("count" if distinct else func, s.expr, distinct)
            return tr.emit_scalar(s.frame, agg)
        if name == "unique":
            f = tr.emit_select(s.frame, [(s.name or "v0", s.expr)], distinct=True)
            return f
        if name == "isin":
            (vals,) = args
            if isinstance(vals, list):
                return SymSeries(s.frame, BinOp("in", s.expr, Const(tuple(vals))))
            if isinstance(vals, SymSeries):
                if vals.frame is None:
                    raise ValueError("isin() of scalar expression")
                sub = tr.emit_select(vals.frame, [("v0", vals.expr)], distinct=True)
                return SymSeries(s.frame, InSub(s.expr, sub.rel, "v0"))
            if isinstance(vals, SymFrame):
                if len(vals.cols) != 1:
                    raise ValueError("isin(frame) requires a single-column frame")
                return SymSeries(s.frame, InSub(s.expr, vals.rel, vals.cols[0]))
            raise NotImplementedError("isin of this operand")
        if name == "between":
            lo, hi = args
            lo_t, _ = self._series_expr(lo, s.frame)
            hi_t, _ = self._series_expr(hi, s.frame)
            return SymSeries(
                s.frame,
                BinOp("and", BinOp(">=", s.expr, lo_t), BinOp("<=", s.expr, hi_t)),
            )
        if name == "round":
            nd = Const(args[0] if args else 0)
            return SymSeries(s.frame, Ext("round", (s.expr, nd)))
        if name == "abs":
            return SymSeries(s.frame, Ext("abs", (s.expr,)))
        if name == "astype":
            t = args[0]
            tname = t if isinstance(t, str) else getattr(t, "__name__", str(t))
            cast = {"float": "cast_double", "float64": "cast_double",
                    "int": "cast_long", "int64": "cast_long", "str": "cast_string"}
            if tname not in cast:
                raise NotImplementedError(f"astype({tname})")
            return SymSeries(s.frame, Ext(cast[tname], (s.expr,)))
        if name == "apply":
            (fn,) = args
            if not (isinstance(fn, tuple) and fn[0] == "lambda"):
                raise NotImplementedError("apply() requires a lambda")
            lam: ast.Lambda = fn[1]
            pname = lam.args.args[0].arg
            saved = self.env.get(pname, None)
            self.env[pname] = s
            try:
                out = self._expr(lam.body)
            finally:
                if saved is None:
                    self.env.pop(pname, None)
                else:
                    self.env[pname] = saved
            return out
        raise NotImplementedError(f"Series.{name}")

    def _groupby_method(self, g: SymGroupBy, name: str, args, kwargs):
        tr = self.tr
        if name == "agg":
            out = [(k, ColRef(g.frame.rel, k)) for k in g.keys]
            for out_name, spec in kwargs.items():
                col, fname = spec
                func = _AGG_FUNCS[fname]
                distinct = func == "count_distinct"
                src = ColRef(g.frame.rel, col)
                out.append((out_name, Agg("count" if distinct else func, src, distinct)))
            return tr.emit_select(g.frame, out, group_keys=g.keys)
        if name == "size":
            out = [(k, ColRef(g.frame.rel, k)) for k in g.keys]
            out.append(("size", Agg("count", None)))
            return tr.emit_select(g.frame, out, group_keys=g.keys)
        raise NotImplementedError(f"GroupBy.{name}")

    def _array_method(self, arr: SymArray, name: str, args, kwargs):
        return einsum_mod.array_method(self.tr, arr, name, args, kwargs)


def _replace_rel(term, old: str, new: str):
    """Re-root ColRefs from one relation onto another (same column names)."""
    from .ir import sub_term  # noqa: F401  (ColRef is not a Var; manual walk)

    if isinstance(term, ColRef):
        return ColRef(new, term.col) if term.rel == old else term
    if isinstance(term, BinOp):
        return BinOp(term.op, _replace_rel(term.left, old, new), _replace_rel(term.right, old, new))
    if isinstance(term, UnOp):
        return UnOp(term.op, _replace_rel(term.arg, old, new))
    if isinstance(term, If):
        return If(_replace_rel(term.cond, old, new), _replace_rel(term.then, old, new),
                  _replace_rel(term.other, old, new))
    if isinstance(term, Ext):
        return Ext(term.name, tuple(_replace_rel(a, old, new) for a in term.args))
    if isinstance(term, Agg):
        return Agg(term.func, None if term.arg is None else _replace_rel(term.arg, old, new),
                   term.distinct)
    return term


# --------------------------------------------------------------------------
# Entry point
# --------------------------------------------------------------------------


def translate(func, catalog: Catalog) -> Program:
    """Compile a Python function (Pandas/NumPy subset) to a TondIR program.

    Function parameters name base relations in ``catalog``; the returned
    program's sink rule projects the function's return value.
    """
    src = textwrap.dedent(inspect.getsource(func))
    tree = ast.parse(src)
    fn = next(n for n in ast.walk(tree) if isinstance(n, ast.FunctionDef))
    fn = normalize_function(fn)

    tr = Translator(catalog)
    params: dict[str, object] = {}
    for p in fn.args.args:
        schema = catalog.table(p.arg)
        if schema.layout == "dense":
            n_val = len([c for c in schema.cols if c != (schema.id_col or "id")])
            params[p.arg] = SymArray(schema.name, 2 if n_val > 1 else 1, "dense", n_val)
        elif schema.layout == "coo":
            params[p.arg] = SymArray(schema.name, 2, "coo", None)
        else:
            params[p.arg] = SymFrame(schema.name, list(schema.cols))

    ev = SymbolicEvaluator(tr, getattr(func, "__wrapped__", func).__globals__)
    result = ev.run(fn, params)

    # Sink rule: identity projection of the returned value (keeps ORDER BY
    # semantics — the final rule becomes the outer SELECT in codegen).
    if isinstance(result, SymFrame):
        sort = tuple(result.sort_pending or ())
        out = [(c, ColRef(result.rel, c)) for c in result.cols]
        tr.emit_select(result, out, sort=sort, rel_name=tr.fresh_rel("sink"))
    elif isinstance(result, SymScalar):
        # General scalar expression over one-row relations: resolve the
        # ScalarRefs (each becomes a cross join of a 1-row CTE).
        from .ir import Assign, Head, Rule

        body: list = []
        cache: dict = {}
        resolved = tr._resolve(result.expr, {}, body, cache)
        v = tr.fresh_var("a")
        body.append(Assign(v, resolved))
        tr.add_rule(Rule(Head(tr.fresh_rel("sink"), ("v0",), (v,)), body))
    elif isinstance(result, SymSeries):
        if result.frame is None:
            raise NotImplementedError("returning a frameless series")
        tr.emit_select(result.frame, [(result.name or "v0", result.expr)],
                       rel_name=tr.fresh_rel("sink"))
    elif isinstance(result, SymArray):
        cols = list(tr.rel_cols(result.rel))
        src_f = SymFrame(result.rel, cols)
        out = [(c, ColRef(result.rel, c)) for c in cols]
        order_col = "id" if "id" in cols else ("row" if "row" in cols else cols[0])
        tr.emit_select(src_f, out, sort=((order_col, True),),
                       rel_name=tr.fresh_rel("sink"))
    else:
        raise NotImplementedError(f"cannot return {type(result).__name__}")
    return Program(tr.rules)
