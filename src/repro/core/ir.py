"""TondIR — the paper's Datalog-like intermediate representation (Table IV).

A :class:`Program` is a list of :class:`Rule`. Each rule derives a relation
(the :class:`Head`, with optional ``group``/``sort``/``limit``/``distinct``)
from a conjunctive :attr:`Rule.body` of atoms:

* :class:`RelAtom` — positional access to a base or derived relation; the
  same variable appearing in two atoms (or twice in one atom) expresses an
  equi-join, exactly as in Datalog.
* :class:`ConstRel` — an inline constant relation (SQL ``VALUES``); used by
  the einsum reshape kernels (paper Fig. 2, ``v4_2``).
* :class:`Filter` — a boolean term over bound variables (the paper's
  ``x θ t`` comparison atoms).
* :class:`Assign` — binds a *new* variable to a term (the paper's ``x = t``
  assignment atoms); aggregate terms may only appear here.
* :class:`Exists` — existential filter ``exists(B)`` (optionally negated),
  used for ``isin`` / semi- and anti-joins.
* :class:`OuterJoin` — the paper's external ``outer_left`` atoms carrying
  join kind and column pairs for non-inner merges.

Terms are :class:`Var`, :class:`Const`, :class:`BinOp`, :class:`UnOp`,
:class:`If`, :class:`Agg` and :class:`Ext` (external functions such as
``year``, ``like``, ``uid``).
"""
from __future__ import annotations

import datetime as _dt
from dataclasses import dataclass, field, replace
from typing import Iterable, Optional, Union

# --------------------------------------------------------------------------
# Terms
# --------------------------------------------------------------------------


@dataclass(frozen=True)
class Var:
    """Reference to a body-bound variable."""

    name: str


@dataclass(frozen=True)
class Const:
    """Literal: int, float, str, bool, ``datetime.date`` or None."""

    value: object


@dataclass(frozen=True)
class BinOp:
    """Binary operation; ``op`` in +,-,*,/,and,or,==,!=,<,<=,>,>=,in."""

    op: str
    left: "Term"
    right: "Term"


@dataclass(frozen=True)
class UnOp:
    """Unary operation; ``op`` in not,-."""

    op: str
    arg: "Term"


@dataclass(frozen=True)
class If:
    """Conditional term ``if(cond, then, other)`` -> SQL CASE WHEN."""

    cond: "Term"
    then: "Term"
    other: "Term"


@dataclass(frozen=True)
class Agg:
    """Aggregation term; ``func`` in sum,min,max,count,avg. ``arg`` is None
    for ``count(*)``; ``distinct`` renders COUNT(DISTINCT x)."""

    func: str
    arg: Optional["Term"] = None
    distinct: bool = False


@dataclass(frozen=True)
class Ext:
    """External function call ``ext(args)``; name is dialect-adapted by the
    SQL generator (year, substr, like, lower, upper, round, abs, uid, ...)."""

    name: str
    args: tuple = ()


Term = Union[Var, Const, BinOp, UnOp, If, Agg, Ext]

_COMPARISONS = {"==", "!=", "<", "<=", ">", ">="}


def term_vars(t: Term) -> set[str]:
    """Free variables of a term."""
    if isinstance(t, Var):
        return {t.name}
    if isinstance(t, Const):
        return set()
    if isinstance(t, BinOp):
        return term_vars(t.left) | term_vars(t.right)
    if isinstance(t, UnOp):
        return term_vars(t.arg)
    if isinstance(t, If):
        return term_vars(t.cond) | term_vars(t.then) | term_vars(t.other)
    if isinstance(t, Agg):
        return term_vars(t.arg) if t.arg is not None else set()
    if isinstance(t, Ext):
        out: set[str] = set()
        for a in t.args:
            out |= term_vars(a)
        return out
    raise TypeError(f"not a term: {t!r}")


def sub_term(t: Term, mapping: dict[str, Term]) -> Term:
    """Substitute variables in ``t`` using ``mapping`` (name -> term)."""
    if isinstance(t, Var):
        return mapping.get(t.name, t)
    if isinstance(t, Const):
        return t
    if isinstance(t, BinOp):
        return BinOp(t.op, sub_term(t.left, mapping), sub_term(t.right, mapping))
    if isinstance(t, UnOp):
        return UnOp(t.op, sub_term(t.arg, mapping))
    if isinstance(t, If):
        return If(
            sub_term(t.cond, mapping),
            sub_term(t.then, mapping),
            sub_term(t.other, mapping),
        )
    if isinstance(t, Agg):
        return Agg(t.func, sub_term(t.arg, mapping) if t.arg is not None else None, t.distinct)
    if isinstance(t, Ext):
        return Ext(t.name, tuple(sub_term(a, mapping) for a in t.args))
    raise TypeError(f"not a term: {t!r}")


def contains_agg(t: Term) -> bool:
    """True if ``t`` contains an :class:`Agg` node."""
    if isinstance(t, Agg):
        return True
    if isinstance(t, BinOp):
        return contains_agg(t.left) or contains_agg(t.right)
    if isinstance(t, UnOp):
        return contains_agg(t.arg)
    if isinstance(t, If):
        return contains_agg(t.cond) or contains_agg(t.then) or contains_agg(t.other)
    if isinstance(t, Ext):
        return any(contains_agg(a) for a in t.args)
    return False


def fmt_term(t: Term) -> str:
    """Paper-style pretty printing (for debugging and IR tests)."""
    if isinstance(t, Var):
        return t.name
    if isinstance(t, Const):
        v = t.value
        if isinstance(v, str):
            return f"'{v}'"
        if isinstance(v, _dt.date):
            return f"date'{v.isoformat()}'"
        return repr(v)
    if isinstance(t, BinOp):
        return f"({fmt_term(t.left)} {t.op} {fmt_term(t.right)})"
    if isinstance(t, UnOp):
        return f"({t.op} {fmt_term(t.arg)})"
    if isinstance(t, If):
        return f"if({fmt_term(t.cond)}, {fmt_term(t.then)}, {fmt_term(t.other)})"
    if isinstance(t, Agg):
        inner = "*" if t.arg is None else fmt_term(t.arg)
        d = "distinct " if t.distinct else ""
        return f"{t.func}({d}{inner})"
    if isinstance(t, Ext):
        return f"{t.name}({', '.join(fmt_term(a) for a in t.args)})"
    raise TypeError(f"not a term: {t!r}")


# --------------------------------------------------------------------------
# Atoms
# --------------------------------------------------------------------------


@dataclass
class RelAtom:
    """Positional access ``X(x1, ..., xn)`` to relation ``rel``."""

    rel: str
    vars: tuple[str, ...]


@dataclass
class ConstRel:
    """Inline constant relation: ``vars`` bound over literal ``rows``."""

    vars: tuple[str, ...]
    rows: tuple[tuple, ...]


@dataclass
class Filter:
    """Boolean predicate atom."""

    term: Term


@dataclass
class Assign:
    """Definition of a fresh variable ``var`` as ``term``."""

    var: str
    term: Term


@dataclass
class Exists:
    """Existential filter ``[not] exists(body)``; body atoms may reference
    outer variables (correlation)."""

    body: list
    negated: bool = False


@dataclass
class OuterJoin:
    """Non-inner join marker over two relation accesses.

    ``kind`` in left/right/full. ``on`` pairs (left_var, right_var).
    """

    kind: str
    left: RelAtom
    right: RelAtom
    on: tuple[tuple[str, str], ...]


Atom = Union[RelAtom, ConstRel, Filter, Assign, Exists, OuterJoin]


def atom_rel_atoms(a: Atom) -> list[RelAtom]:
    """All relation accesses directly inside an atom (not inside Exists)."""
    if isinstance(a, RelAtom):
        return [a]
    if isinstance(a, OuterJoin):
        return [a.left, a.right]
    return []


def body_bound_vars(body: Iterable[Atom]) -> set[str]:
    """Variables bound by relation accesses, const relations or assigns."""
    out: set[str] = set()
    for a in body:
        for ra in atom_rel_atoms(a):
            out |= set(ra.vars)
        if isinstance(a, ConstRel):
            out |= set(a.vars)
        if isinstance(a, Assign):
            out.add(a.var)
    return out


def fmt_atom(a: Atom) -> str:
    if isinstance(a, RelAtom):
        return f"{a.rel}({', '.join(a.vars)})"
    if isinstance(a, ConstRel):
        return f"[{', '.join(a.vars)} in {list(a.rows)!r}]"
    if isinstance(a, Filter):
        return f"({fmt_term(a.term)})"
    if isinstance(a, Assign):
        return f"({a.var} = {fmt_term(a.term)})"
    if isinstance(a, Exists):
        neg = "not " if a.negated else ""
        return f"{neg}exists({', '.join(fmt_atom(x) for x in a.body)})"
    if isinstance(a, OuterJoin):
        on = ", ".join(f"{l}={r}" for l, r in a.on)
        return f"outer_{a.kind}({fmt_atom(a.left)}, {fmt_atom(a.right)}, [{on}])"
    raise TypeError(f"not an atom: {a!r}")


# --------------------------------------------------------------------------
# Head / Rule / Program
# --------------------------------------------------------------------------


@dataclass
class Head:
    """Rule head: output relation with named columns bound to body vars.

    ``cols[i]`` is the output column name of variable ``vars[i]``. ``group``
    lists grouping vars (must be a subset of ``vars``); ``sort`` is a list
    of (var, ascending); ``limit`` caps rows; ``distinct`` deduplicates.
    """

    rel: str
    cols: tuple[str, ...]
    vars: tuple[str, ...]
    group: Optional[tuple[str, ...]] = None
    sort: tuple[tuple[str, bool], ...] = ()
    limit: Optional[int] = None
    distinct: bool = False

    def __post_init__(self) -> None:
        if len(self.cols) != len(self.vars):
            raise ValueError(f"head {self.rel}: cols/vars arity mismatch")


@dataclass
class Rule:
    head: Head
    body: list[Atom]

    def pretty(self) -> str:
        h = f"{self.head.rel}({', '.join(self.head.cols)})"
        if self.head.distinct:
            h += " distinct"
        if self.head.group is not None:
            h += f" group({', '.join(self.head.group)})"
        if self.head.sort:
            h += f" sort({', '.join((('' if asc else '-') + v) for v, asc in self.head.sort)})"
        if self.head.limit is not None:
            h += f" limit({self.head.limit})"
        return f"{h} :- {', '.join(fmt_atom(a) for a in self.body)}."


@dataclass
class Program:
    """Ordered list of rules; the last rule is the program sink (result)."""

    rules: list[Rule] = field(default_factory=list)

    @property
    def sink(self) -> Rule:
        return self.rules[-1]

    def schemas(self) -> dict[str, tuple[str, ...]]:
        """Output column names of every derived relation."""
        return {r.head.rel: r.head.cols for r in self.rules}

    def pretty(self) -> str:
        return "\n".join(r.pretty() for r in self.rules)


def copy_rule(r: Rule) -> Rule:
    """Deep-ish copy (terms are frozen dataclasses; atoms/heads are not)."""
    import copy

    return copy.deepcopy(r)


def rename_rule_vars(r: Rule, mapping: dict[str, str]) -> Rule:
    """Rename variables of a rule consistently (head and body)."""
    tmap = {k: Var(v) for k, v in mapping.items()}

    def ren_atoms(body: list[Atom]) -> list[Atom]:
        out: list[Atom] = []
        for a in body:
            if isinstance(a, RelAtom):
                out.append(RelAtom(a.rel, tuple(mapping.get(v, v) for v in a.vars)))
            elif isinstance(a, ConstRel):
                out.append(ConstRel(tuple(mapping.get(v, v) for v in a.vars), a.rows))
            elif isinstance(a, Filter):
                out.append(Filter(sub_term(a.term, tmap)))
            elif isinstance(a, Assign):
                out.append(Assign(mapping.get(a.var, a.var), sub_term(a.term, tmap)))
            elif isinstance(a, Exists):
                out.append(Exists(ren_atoms(a.body), a.negated))
            elif isinstance(a, OuterJoin):
                left = RelAtom(a.left.rel, tuple(mapping.get(v, v) for v in a.left.vars))
                right = RelAtom(a.right.rel, tuple(mapping.get(v, v) for v in a.right.vars))
                on = tuple((mapping.get(l, l), mapping.get(rr, rr)) for l, rr in a.on)
                out.append(OuterJoin(a.kind, left, right, on))
            else:
                raise TypeError(f"not an atom: {a!r}")
        return out

    head = Head(
        r.head.rel,
        r.head.cols,
        tuple(mapping.get(v, v) for v in r.head.vars),
        None if r.head.group is None else tuple(mapping.get(v, v) for v in r.head.group),
        tuple((mapping.get(v, v), asc) for v, asc in r.head.sort),
        r.head.limit,
        r.head.distinct,
    )
    return Rule(head, ren_atoms(r.body))
