"""Pandas/NumPy -> TondIR translation (paper Sections III-B..III-D).

The decorated function's source is parsed with ``ast``, normalized to ANF
(:mod:`repro.core.anf`) and then *symbolically evaluated*: DataFrames,
Series, group-bys, NumPy arrays and scalars are shadowed by ``Sym*``
objects; each Pandas/NumPy API call appends one (or a few) TondIR rules to
the program under construction, following the translation rules of
Table V. NumPy ``einsum`` is planned separately (:mod:`repro.core.einsum`).

Pseudo-terms used only during translation (resolved when a rule is
emitted): :class:`ColRef` (column of a symbolic frame), :class:`ScalarRef`
(the single value of a 1-row relation — rendered as a cross join) and
:class:`InSub` (membership in a relation's column — rendered as an
``exists`` atom).
"""
from __future__ import annotations

import ast
import datetime as dt
import inspect
import itertools
import textwrap
from dataclasses import dataclass
from typing import Optional

import numpy as np
import pandas as pd

from .anf import normalize_function
from .catalog import Catalog
from .ir import (
    Agg,
    Assign,
    BinOp,
    Const,
    ConstRel,
    Exists,
    Ext,
    Filter,
    Head,
    If,
    OuterJoin,
    Program,
    RelAtom,
    Rule,
    Term,
    UnOp,
    Var,
)

# --------------------------------------------------------------------------
# Pseudo-terms (translation-time only)
# --------------------------------------------------------------------------


@dataclass(frozen=True)
class ColRef:
    """Reference to column ``col`` of the frame whose relation is ``rel``."""

    rel: str
    col: str


@dataclass(frozen=True)
class ScalarRef:
    """The single value of one-row relation ``rel`` (column ``col``)."""

    rel: str
    col: str


@dataclass(frozen=True)
class InSub:
    """``term IN (SELECT col FROM rel)`` — becomes an ``exists`` atom."""

    term: object
    rel: str
    col: str


# --------------------------------------------------------------------------
# Symbolic values
# --------------------------------------------------------------------------


class SymFrame:
    """Symbolic DataFrame bound to TondIR relation ``rel`` with ``cols``."""

    def __init__(self, rel: str, cols: list[str], sort_pending=None):
        self.rel = rel
        self.cols = list(cols)
        self.sort_pending = sort_pending  # list[(col, asc)] | None

    def __repr__(self):
        return f"SymFrame({self.rel}, {self.cols})"


class SymSeries:
    """Symbolic Series: a term over one frame's columns (or scalar-only)."""

    def __init__(self, frame: Optional[SymFrame], expr, name: Optional[str] = None):
        self.frame = frame
        self.expr = expr
        self.name = name


class SymScalar:
    """Symbolic scalar (constant or 1-row-relation value)."""

    def __init__(self, expr):
        self.expr = expr


class SymGroupBy:
    def __init__(self, frame: SymFrame, keys: list[str]):
        self.frame = frame
        self.keys = keys


class SymArray:
    """Symbolic NumPy array stored as a relation.

    dense: ``rel(id, c0..c{n-1})`` (ndim=2) or ``rel(id, c0)`` (ndim=1);
    coo:   ``rel(row, col, val)`` (ndim=2) or ``rel(row, val)`` (ndim=1).
    ``shape`` entries may be None when statically unknown.
    """

    def __init__(self, rel: str, ndim: int, layout: str, n_cols: Optional[int],
                 n_rows: Optional[int] = None):
        self.rel = rel
        self.ndim = ndim
        self.layout = layout  # 'dense' | 'coo'
        self.n_cols = n_cols
        self.n_rows = n_rows

    @property
    def value_cols(self) -> list[str]:
        assert self.layout == "dense"
        return [f"c{i}" for i in range(self.n_cols if self.ndim == 2 else 1)]


class ConstArray:
    """A literal ``np.array([...])`` — inlined into kernels (const folding)."""

    def __init__(self, values: np.ndarray):
        self.values = np.asarray(values, dtype="float64")


class ModuleRef:
    def __init__(self, kind: str):
        self.kind = kind  # 'np' | 'pd'


class EmptyFrame:
    """``pd.DataFrame()`` placeholder for the implicit-join pattern."""

    pass


class BoundMethod:
    def __init__(self, obj, name: str, tr: "Translator"):
        self.obj = obj
        self.name = name
        self.tr = tr


# --------------------------------------------------------------------------
# Translator: rule-emission machinery
# --------------------------------------------------------------------------


def split_and(t) -> list:
    if isinstance(t, BinOp) and t.op == "and":
        return split_and(t.left) + split_and(t.right)
    return [t]


class Translator:
    """Owns the program under construction and emits rules."""

    def __init__(self, catalog: Catalog):
        self.catalog = catalog
        self.rules: list[Rule] = []
        self.derived: dict[str, tuple[str, ...]] = {}
        self._v = itertools.count(1)
        self._r = itertools.count(1)

    # -- naming -------------------------------------------------------------
    def fresh_var(self, prefix: str = "x") -> str:
        return f"{prefix}{next(self._v)}"

    def fresh_rel(self, prefix: str = "t") -> str:
        return f"{prefix}{next(self._r)}"

    def rel_cols(self, rel: str) -> tuple[str, ...]:
        if rel in self.derived:
            return self.derived[rel]
        return self.catalog.table(rel).cols

    def add_rule(self, rule: Rule) -> None:
        self.rules.append(rule)
        self.derived[rule.head.rel] = rule.head.cols

    # -- pseudo-term resolution --------------------------------------------
    def _resolve(self, t, env: dict[str, str], body: list, scalar_cache: dict) -> Term:
        """Replace ColRef/ScalarRef in ``t`` with bound variables."""
        if isinstance(t, ColRef):
            if t.col not in env:
                raise KeyError(f"column {t.col!r} not bound (frame {t.rel})")
            return Var(env[t.col])
        if isinstance(t, ScalarRef):
            key = t.rel
            if key not in scalar_cache:
                cols = self.rel_cols(t.rel)
                vs = tuple(self.fresh_var("s") for _ in cols)
                body.append(RelAtom(t.rel, vs))
                scalar_cache[key] = dict(zip(cols, vs))
            return Var(scalar_cache[key][t.col])
        if isinstance(t, InSub):
            raise ValueError("isin() may only appear in a top-level filter conjunct")
        if isinstance(t, BinOp):
            return BinOp(t.op, self._resolve(t.left, env, body, scalar_cache),
                         self._resolve(t.right, env, body, scalar_cache))
        if isinstance(t, UnOp):
            return UnOp(t.op, self._resolve(t.arg, env, body, scalar_cache))
        if isinstance(t, If):
            return If(self._resolve(t.cond, env, body, scalar_cache),
                      self._resolve(t.then, env, body, scalar_cache),
                      self._resolve(t.other, env, body, scalar_cache))
        if isinstance(t, Agg):
            return Agg(t.func,
                       None if t.arg is None else self._resolve(t.arg, env, body, scalar_cache),
                       t.distinct)
        if isinstance(t, Ext):
            return Ext(t.name, tuple(self._resolve(a, env, body, scalar_cache) for a in t.args))
        if isinstance(t, (Var, Const)):
            return t
        raise TypeError(f"cannot resolve term {t!r}")

    def _add_filters(self, filters, env, body, scalar_cache) -> None:
        for f in filters:
            for c in split_and(f):
                neg = False
                inner = c
                if isinstance(inner, UnOp) and inner.op == "not" and isinstance(inner.arg, InSub):
                    neg, inner = True, inner.arg
                if isinstance(inner, InSub):
                    sub_cols = self.rel_cols(inner.rel)
                    vs = tuple(self.fresh_var("e") for _ in sub_cols)
                    target = vs[sub_cols.index(inner.col)]
                    lhs = self._resolve(inner.term, env, body, scalar_cache)
                    body.append(Exists(
                        [RelAtom(inner.rel, vs), Filter(BinOp("==", Var(target), lhs))],
                        negated=neg,
                    ))
                else:
                    body.append(Filter(self._resolve(c, env, body, scalar_cache)))

    # -- rule emission ------------------------------------------------------
    def emit_select(self, frame: SymFrame, out: list[tuple[str, object]], *,
                    filters=(), group_keys=None, sort=(), limit=None,
                    distinct=False, rel_name=None) -> SymFrame:
        """Emit one rule selecting from ``frame``.

        ``out``: (output column name, term over ColRefs) pairs. ``group_keys``
        is a list of output column names to group by (their terms must be
        plain column refs). ``sort``: (output column name, asc) pairs.
        """
        rel = rel_name or self.fresh_rel()
        src_cols = self.rel_cols(frame.rel)
        env = {c: self.fresh_var() for c in src_cols}
        body: list = [RelAtom(frame.rel, tuple(env[c] for c in src_cols))]
        scalar_cache: dict = {}
        self._add_filters(filters, env, body, scalar_cache)

        head_cols: list[str] = []
        head_vars: list[str] = []
        for name, expr in out:
            if isinstance(expr, ColRef):
                v = env[expr.col]
            else:
                v = self.fresh_var("a")
                body.append(Assign(v, self._resolve(expr, env, body, scalar_cache)))
            head_cols.append(name)
            head_vars.append(v)
        col2var = dict(zip(head_cols, head_vars))
        group = None
        if group_keys is not None:
            group = tuple(col2var[k] for k in group_keys)
        sort_t = tuple((col2var[c], asc) for c, asc in sort)
        self.add_rule(Rule(
            Head(rel, tuple(head_cols), tuple(head_vars), group, sort_t, limit, distinct),
            body,
        ))
        return SymFrame(rel, head_cols)

    def emit_join(self, left: SymFrame, right: SymFrame, left_on, right_on,
                  how: str, suffixes=("_x", "_y")) -> SymFrame:
        """Emit a merge rule with Pandas naming semantics (implicit _x/_y)."""
        lcols, rcols = list(self.rel_cols(left.rel)), list(self.rel_cols(right.rel))
        lv = {c: self.fresh_var() for c in lcols}
        rv = {c: self.fresh_var() for c in rcols}
        if how == "inner":
            for lc, rc in zip(left_on, right_on):
                rv[rc] = lv[lc]
            body: list = [RelAtom(left.rel, tuple(lv[c] for c in lcols)),
                          RelAtom(right.rel, tuple(rv[c] for c in rcols))]
        elif how == "left":
            la = RelAtom(left.rel, tuple(lv[c] for c in lcols))
            ra = RelAtom(right.rel, tuple(rv[c] for c in rcols))
            on = tuple((lv[lc], rv[rc]) for lc, rc in zip(left_on, right_on))
            body = [OuterJoin("left", la, ra, on)]
        elif how == "cross":
            body = [RelAtom(left.rel, tuple(lv[c] for c in lcols)),
                    RelAtom(right.rel, tuple(rv[c] for c in rcols))]
        else:
            raise NotImplementedError(f"merge how={how!r}")

        shared_keys = {lc for lc, rc in zip(left_on, right_on) if lc == rc}
        overlap = (set(lcols) & set(rcols)) - shared_keys
        head_cols, head_vars = [], []
        for c in lcols:
            name = c + suffixes[0] if c in overlap else c
            head_cols.append(name)
            head_vars.append(lv[c])
        for c in rcols:
            if c in shared_keys:
                continue
            name = c + suffixes[1] if c in overlap else c
            head_cols.append(name)
            head_vars.append(rv[c])
        rel = self.fresh_rel()
        self.add_rule(Rule(Head(rel, tuple(head_cols), tuple(head_vars)), body))
        return SymFrame(rel, head_cols)

    def emit_scalar(self, frame: SymFrame, agg_expr, filters=()) -> SymScalar:
        """Global aggregate over ``frame`` -> one-row relation -> SymScalar."""
        f = self.emit_select(frame, [("v0", agg_expr)], filters=filters)
        return SymScalar(ScalarRef(f.rel, "v0"))

    def ensure_id(self, frame: SymFrame) -> SymFrame:
        """Prepend a UID column (paper Section III-E) if not present."""
        if "__id" in frame.cols:
            return frame
        out = [("__id", Ext("uid", (ColRef(frame.rel, frame.cols[0]),)))]
        out += [(c, ColRef(frame.rel, c)) for c in frame.cols]
        return self.emit_select(frame, out)

    def frame_to_dense_array(self, frame: SymFrame) -> SymArray:
        """`to_numpy()` — relation with ``id, c0..c{n-1}`` columns."""
        f = self.ensure_id(frame)
        vcols = [c for c in f.cols if c != "__id"]
        out = [("id", ColRef(f.rel, "__id"))]
        out += [(f"c{i}", ColRef(f.rel, c)) for i, c in enumerate(vcols)]
        g = self.emit_select(f, out)
        return SymArray(g.rel, 2, "dense", len(vcols))
