"""SQL code generation (Section III-E): CTE chaining, sink ORDER BY,
UID windows, EXISTS, outer joins, VALUES and the dialect adaptation layer."""
import datetime as dt

import duckdb
import pandas as pd
import pytest

from repro.core.catalog import Catalog, TableSchema
from repro.core.ir import (
    Agg, Assign, BinOp, Const, ConstRel, Exists, Ext, Filter, Head, If,
    OuterJoin, Program, RelAtom, Rule, UnOp, Var,
)
from repro.core.sqlgen import program_to_sql


def _cat():
    return Catalog().add(TableSchema("r", ("a", "b")))


def _exec(prog, tables):
    con = duckdb.connect()
    try:
        for k, v in tables.items():
            con.register(k, v)
        return con.execute(program_to_sql(prog, _cat(), "duckdb")).fetchdf()
    finally:
        con.close()


R = pd.DataFrame({"a": [1, 2, 3, 4], "b": [10.0, 20.0, 30.0, 40.0]})


class TestShapes:
    def test_single_rule_no_cte(self):
        p = Program([Rule(Head("t", ("a",), ("x",)), [RelAtom("r", ("x", "y"))])])
        sql = program_to_sql(p, _cat(), "duckdb")
        assert "WITH" not in sql

    def test_chain_uses_cte(self):
        p = Program([
            Rule(Head("t1", ("a",), ("x",)), [RelAtom("r", ("x", "y"))]),
            Rule(Head("t2", ("a",), ("u",)), [RelAtom("t1", ("u",))]),
        ])
        sql = program_to_sql(p, _cat(), "duckdb")
        assert sql.startswith("WITH")
        assert '"t1" AS' in sql

    def test_sink_order_by_survives(self):
        p = Program([
            Rule(Head("t", ("a", "b"), ("x", "y"), sort=(("y", False),)),
                 [RelAtom("r", ("x", "y"))]),
        ])
        out = _exec(p, {"r": R})
        assert list(out["b"]) == [40.0, 30.0, 20.0, 10.0]

    def test_limit(self):
        p = Program([
            Rule(Head("t", ("a",), ("x",), sort=(("x", True),), limit=2),
                 [RelAtom("r", ("x", "y"))]),
        ])
        assert list(_exec(p, {"r": R})["a"]) == [1, 2]

    def test_distinct(self):
        p = Program([
            Rule(Head("t", ("c",), ("c",), distinct=True),
                 [RelAtom("r", ("x", "y")), Assign("c", Const(7))]),
        ])
        assert len(_exec(p, {"r": R})) == 1

    def test_group_by(self):
        p = Program([
            Rule(Head("t", ("g", "s"), ("g", "s"), group=("g",)),
                 [RelAtom("r", ("x", "y")),
                  Assign("g", If(BinOp("<", Var("x"), Const(3)), Const("lo"), Const("hi"))),
                  Assign("s", Agg("sum", Var("y")))]),
        ])
        out = _exec(p, {"r": R}).sort_values("g")
        assert list(out["s"]) == [70.0, 30.0]


class TestAtoms:
    def test_join_shared_var(self):
        p = Program([
            Rule(Head("t", ("a", "b2"), ("x", "y2")),
                 [RelAtom("r", ("x", "y")), RelAtom("r", ("x", "y2"))]),
        ])
        out = _exec(p, {"r": R})
        assert len(out) == 4  # join on a (values unique here)

    def test_exists(self):
        p = Program([
            Rule(Head("t", ("a",), ("x",)),
                 [RelAtom("r", ("x", "y")),
                  Exists([RelAtom("r", ("e1", "e2")),
                          Filter(BinOp("==", Var("e1"), BinOp("+", Var("x"), Const(1))))])]),
        ])
        assert sorted(_exec(p, {"r": R})["a"]) == [1, 2, 3]

    def test_not_exists(self):
        p = Program([
            Rule(Head("t", ("a",), ("x",)),
                 [RelAtom("r", ("x", "y")),
                  Exists([RelAtom("r", ("e1", "e2")),
                          Filter(BinOp("==", Var("e1"), BinOp("+", Var("x"), Const(1))))],
                         negated=True)]),
        ])
        assert sorted(_exec(p, {"r": R})["a"]) == [4]

    def test_left_join_nulls(self):
        small = pd.DataFrame({"a": [1, 2], "b": [1.0, 2.0]})
        oj = OuterJoin("left", RelAtom("r", ("x", "y")), RelAtom("r2", ("u", "v")),
                       (("x", "u"),))
        cat = _cat().add(TableSchema("r2", ("a", "b")))
        p = Program([Rule(Head("t", ("a", "v"), ("x", "v")), [oj])])
        con = duckdb.connect()
        con.register("r", R)
        con.register("r2", small)
        out = con.execute(program_to_sql(p, cat, "duckdb")).fetchdf()
        con.close()
        assert len(out) == 4 and out["v"].isna().sum() == 2

    def test_values(self):
        p = Program([
            Rule(Head("t", ("i",), ("i",), sort=(("i", True),)),
                 [ConstRel(("i",), ((0,), (1,), (2,)))]),
        ])
        assert list(_exec(p, {})["i"]) == [0, 1, 2]

    def test_uid(self):
        p = Program([
            Rule(Head("t", ("i", "a"), ("i", "x"), sort=(("x", True),)),
                 [RelAtom("r", ("x", "y")), Assign("i", Ext("uid", (Var("x"),)))]),
        ])
        assert list(_exec(p, {"r": R})["i"]) == [0, 1, 2, 3]


class TestTerms:
    def test_in_tuple(self):
        p = Program([
            Rule(Head("t", ("a",), ("x",)),
                 [RelAtom("r", ("x", "y")),
                  Filter(BinOp("in", Var("x"), Const((1, 3))))]),
        ])
        assert sorted(_exec(p, {"r": R})["a"]) == [1, 3]

    def test_not(self):
        p = Program([
            Rule(Head("t", ("a",), ("x",)),
                 [RelAtom("r", ("x", "y")),
                  Filter(UnOp("not", BinOp(">", Var("x"), Const(2))))]),
        ])
        assert sorted(_exec(p, {"r": R})["a"]) == [1, 2]

    def test_string_escape(self):
        p = Program([
            Rule(Head("t", ("s",), ("s",), limit=1),
                 [RelAtom("r", ("x", "y")), Assign("s", Const("it's"))]),
        ])
        assert _exec(p, {"r": R})["s"].iloc[0] == "it's"

    def test_timestamp_literal(self):
        rd = pd.DataFrame({"a": [1], "b": pd.to_datetime(["1994-06-01"])})
        p = Program([
            Rule(Head("t", ("a",), ("x",)),
                 [RelAtom("r", ("x", "y")),
                  Filter(BinOp(">", Var("y"), Const(dt.date(1994, 1, 1))))]),
        ])
        assert list(_exec(p, {"r": rd})["a"]) == [1]

    def test_count_distinct(self):
        p = Program([
            Rule(Head("t", ("n",), ("n",)),
                 [RelAtom("r", ("x", "y")),
                  Assign("n", Agg("count", Var("x"), distinct=True))]),
        ])
        assert _exec(p, {"r": R})["n"].iloc[0] == 4


class TestDialects:
    def test_spark_backticks(self):
        p = Program([Rule(Head("t", ("a",), ("x",)), [RelAtom("r", ("x", "y"))])])
        assert "`a`" in program_to_sql(p, _cat(), "spark")
        assert '"a"' in program_to_sql(p, _cat(), "duckdb")

    def test_cast_type_names(self):
        p = Program([
            Rule(Head("t", ("c",), ("c",)),
                 [RelAtom("r", ("x", "y")), Assign("c", Ext("cast_string", (Var("x"),)))]),
        ])
        assert "AS STRING" in program_to_sql(p, _cat(), "spark")
        assert "AS VARCHAR" in program_to_sql(p, _cat(), "duckdb")

    def test_arity_mismatch_raises(self):
        p = Program([Rule(Head("t", ("a",), ("x",)), [RelAtom("r", ("x",))])])
        with pytest.raises(ValueError, match="arity"):
            program_to_sql(p, _cat(), "duckdb")
