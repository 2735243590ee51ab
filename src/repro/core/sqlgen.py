"""TondIR -> SQL code generation (paper Section III-E).

Each rule becomes a CTE; the sink rule becomes the outer SELECT so that its
ORDER BY / LIMIT survive (CTEs do not preserve order). UID terms become
``row_number() OVER (ORDER BY <first column>) - 1``. A small *backend
adaptation* layer handles dialect differences between Spark SQL and DuckDB
(identifier quoting, cast type names) — the paper's point that supporting a
new engine only touches the code generator.
"""
from __future__ import annotations

import datetime as dt

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
    If,
    OuterJoin,
    Program,
    RelAtom,
    Rule,
    Term,
    UnOp,
    Var,
    contains_agg,
)


class Dialect:
    name = "ansi"
    cast_types = {"cast_double": "DOUBLE", "cast_long": "BIGINT", "cast_string": "VARCHAR"}

    def quote(self, ident: str) -> str:
        return '"' + ident.replace('"', '""') + '"'


class SparkDialect(Dialect):
    name = "spark"
    cast_types = {"cast_double": "DOUBLE", "cast_long": "BIGINT", "cast_string": "STRING"}

    def quote(self, ident: str) -> str:
        return "`" + ident.replace("`", "``") + "`"


class DuckDBDialect(Dialect):
    name = "duckdb"


DIALECTS = {"spark": SparkDialect(), "duckdb": DuckDBDialect()}

_BINOP_SQL = {"+": "+", "-": "-", "*": "*", "/": "/", "==": "=", "!=": "<>",
              "<": "<", "<=": "<=", ">": ">", ">=": ">=", "and": "AND", "or": "OR"}

_AGG_SQL = {"sum": "SUM", "min": "MIN", "max": "MAX", "avg": "AVG", "count": "COUNT"}


def _const_sql(v, d: Dialect) -> str:
    if v is None:
        return "NULL"
    if isinstance(v, bool):
        return "TRUE" if v else "FALSE"
    if isinstance(v, str):
        return "'" + v.replace("'", "''") + "'"
    if isinstance(v, dt.datetime):
        return f"TIMESTAMP '{v.isoformat(sep=' ')}'"
    if isinstance(v, dt.date):
        # Date columns arrive as pandas datetime64 -> TIMESTAMP(_NS) in both
        # engines; a TIMESTAMP literal compares without explicit casts.
        return f"TIMESTAMP '{v.isoformat()} 00:00:00'"
    if isinstance(v, float):
        # Scientific notation parses as DOUBLE in both Spark and DuckDB;
        # plain "1.0" would be DECIMAL in Spark and poison downstream types.
        r = repr(v)
        return r if ("e" in r or "E" in r or "inf" in r or "nan" in r) else r + "E0"
    if isinstance(v, int):
        return str(v)
    raise TypeError(f"cannot render constant {v!r}")


class _RuleGen:
    def __init__(self, schemas: dict[str, tuple[str, ...]], d: Dialect, outer=None):
        self.schemas = schemas
        self.d = d
        self.bind: dict[str, str] = {}        # var -> SQL expression
        self.join_preds: list[str] = []
        self.from_items: list[str] = []
        self.outer = outer                    # enclosing _RuleGen for Exists
        self._alias = 0

    def alias(self) -> str:
        self._alias += 1
        prefix = "e" if self.outer is not None else "r"
        return f"{prefix}{self._alias}"

    def lookup(self, var: str) -> str:
        g: "_RuleGen | None" = self
        while g is not None:
            if var in g.bind:
                return g.bind[var]
            g = g.outer
        raise KeyError(f"unbound variable {var}")

    # -- terms --------------------------------------------------------------
    def term(self, t: Term) -> str:
        d = self.d
        if isinstance(t, Var):
            return self.lookup(t.name)
        if isinstance(t, Const):
            return _const_sql(t.value, d)
        if isinstance(t, BinOp):
            if t.op == "in":
                vals = t.right.value if isinstance(t.right, Const) else None
                if not isinstance(vals, tuple):
                    raise ValueError("IN requires a constant tuple")
                items = ", ".join(_const_sql(v, d) for v in vals)
                return f"({self.term(t.left)} IN ({items}))"
            return f"({self.term(t.left)} {_BINOP_SQL[t.op]} {self.term(t.right)})"
        if isinstance(t, UnOp):
            if t.op == "not":
                return f"(NOT {self.term(t.arg)})"
            return f"(- {self.term(t.arg)})"
        if isinstance(t, If):
            return (f"(CASE WHEN {self.term(t.cond)} THEN {self.term(t.then)} "
                    f"ELSE {self.term(t.other)} END)")
        if isinstance(t, Agg):
            if t.func == "count" and t.arg is None:
                return "COUNT(*)"
            inner = self.term(t.arg)
            if t.distinct:
                return f"COUNT(DISTINCT {inner})"
            if t.func == "sum":
                # pandas Series.sum() over no rows is 0, SQL SUM is NULL
                return f"COALESCE(SUM({inner}), 0)"
            return f"{_AGG_SQL[t.func]}({inner})"
        if isinstance(t, Ext):
            return self.ext(t)
        raise TypeError(f"cannot render term {t!r}")

    def ext(self, t: Ext) -> str:
        args = [self.term(a) for a in t.args]
        n = t.name
        if n in ("year", "month", "day", "lower", "upper", "abs"):
            return f"{n}({args[0]})"
        if n == "like":
            return f"({args[0]} LIKE {args[1]})"
        if n == "substr":
            return f"substr({args[0]}, {args[1]}, {args[2]})"
        if n == "round":
            return f"round({args[0]}, {args[1]})"
        if n == "uid":
            return f"(row_number() OVER (ORDER BY {args[0]}) - 1)"
        if n in self.d.cast_types:
            return f"CAST({args[0]} AS {self.d.cast_types[n]})"
        raise NotImplementedError(f"external function {n}")

    # -- atoms --------------------------------------------------------------
    def add_rel_atom(self, atom: RelAtom, join_kind: str = "inner",
                     on: tuple = ()) -> str:
        a = self.alias()
        cols = self.schemas[atom.rel]
        if len(cols) != len(atom.vars):
            raise ValueError(
                f"arity mismatch accessing {atom.rel}: {len(atom.vars)} vars "
                f"for columns {cols}"
            )
        exprs = {}
        for c, v in zip(cols, atom.vars):
            e = f"{a}.{self.d.quote(c)}"
            if v in self.bind and join_kind == "inner":
                self.join_preds.append(f"{self.bind[v]} = {e}")
            elif v in exprs:  # repeated var within the atom (e.g. sparse 'ii')
                self.join_preds.append(f"{exprs[v]} = {e}")
            else:
                self.bind[v] = e
                exprs[v] = e
        src = self.d.quote(atom.rel)
        if not self.from_items:
            self.from_items.append(f"{src} AS {a}")
        elif join_kind == "inner":
            self.from_items.append(f"CROSS JOIN {src} AS {a}")
        else:
            conds = " AND ".join(f"{self.lookup(l)} = {self.lookup(r)}" for l, r in on)
            self.from_items.append(f"{join_kind.upper()} JOIN {src} AS {a} ON {conds or 'TRUE'}")
        return a

    def add_const_rel(self, atom: ConstRel) -> None:
        a = self.alias()
        rows = ", ".join(
            "(" + ", ".join(_const_sql(v, self.d) for v in row) + ")" for row in atom.rows
        )
        cols = ", ".join(self.d.quote(f"k{i}") for i in range(len(atom.vars)))
        item = f"(VALUES {rows}) AS {a}({cols})"
        for i, v in enumerate(atom.vars):
            e = f"{a}.{self.d.quote(f'k{i}')}"
            if v in self.bind:  # shared var => equi-join, same as add_rel_atom
                self.join_preds.append(f"{self.bind[v]} = {e}")
            else:
                self.bind[v] = e
        if not self.from_items:
            self.from_items.append(item)
        else:
            self.from_items.append(f"CROSS JOIN {item}")

    # -- whole rule ---------------------------------------------------------
    def select(self, rule: Rule) -> str:
        wheres: list[str] = []
        assigns_after: list[Assign] = []
        for a in rule.body:
            if isinstance(a, RelAtom):
                self.add_rel_atom(a)
            elif isinstance(a, ConstRel):
                self.add_const_rel(a)
            elif isinstance(a, OuterJoin):
                self.add_rel_atom(a.left)
                self.add_rel_atom(a.right, join_kind=a.kind, on=a.on)
            elif isinstance(a, (Filter, Assign, Exists)):
                assigns_after.append(a)
        for a in assigns_after:
            if isinstance(a, Filter):
                wheres.append(self.term(a.term))
            elif isinstance(a, Assign):
                self.bind[a.var] = f"({self.term(a.term)})"
            elif isinstance(a, Exists):
                wheres.append(self.exists_sql(a))
        wheres = self.join_preds + wheres

        h = rule.head
        sel = []
        for c, v in zip(h.cols, h.vars):
            sel.append(f"{self.lookup(v)} AS {self.d.quote(c)}")
        parts = ["SELECT " + ("DISTINCT " if h.distinct else "") + ", ".join(sel)]
        if self.from_items:
            parts.append("FROM " + " ".join(self.from_items))
        if wheres:
            parts.append("WHERE " + " AND ".join(wheres))
        if h.group is not None:
            parts.append("GROUP BY " + ", ".join(self.lookup(v) for v in h.group))
        if h.sort:
            order = ", ".join(
                f"{self.d.quote(h.cols[h.vars.index(v)])} {'ASC' if asc else 'DESC'}"
                for v, asc in h.sort
            )
            parts.append("ORDER BY " + order)
        if h.limit is not None:
            parts.append(f"LIMIT {h.limit}")
        return "\n".join(parts)

    def exists_sql(self, a: Exists) -> str:
        sub = _RuleGen(self.schemas, self.d, outer=self)
        wheres: list[str] = []
        for atom in a.body:
            if isinstance(atom, RelAtom):
                sub.add_rel_atom(atom)
            elif isinstance(atom, Filter):
                wheres.append(sub.term(atom.term))
            elif isinstance(atom, Assign):
                sub.bind[atom.var] = f"({sub.term(atom.term)})"
            else:
                raise NotImplementedError("exists body supports relations/filters")
        wheres = sub.join_preds + wheres
        q = "SELECT 1 FROM " + " ".join(sub.from_items)
        if wheres:
            q += " WHERE " + " AND ".join(wheres)
        neg = "NOT " if a.negated else ""
        return f"{neg}EXISTS ({q})"


def program_to_sql(prog: Program, catalog: Catalog, dialect: str = "spark") -> str:
    """Render a TondIR program as a WITH-chain plus a final SELECT."""
    d = DIALECTS[dialect]
    schemas: dict[str, tuple[str, ...]] = {
        name: s.cols for name, s in catalog.tables.items()
    }
    ctes = []
    for rule in prog.rules:
        gen = _RuleGen(schemas, d)
        body = gen.select(rule)
        schemas[rule.head.rel] = rule.head.cols
        if rule is prog.sink:
            if not ctes:
                return body
            return "WITH " + ",\n".join(ctes) + "\n" + body
        indented = "\n".join("  " + line for line in body.splitlines())
        ctes.append(f"{d.quote(rule.head.rel)} AS (\n{indented}\n)")
    raise ValueError("empty program")
