"""Unit tests for TondIR node utilities (terms, atoms, rules, renaming)."""
import datetime as dt

import pytest

from repro.core.ir import (
    Agg, Assign, BinOp, Const, ConstRel, Exists, Ext, Filter, Head, If,
    OuterJoin, Program, RelAtom, Rule, UnOp, Var, body_bound_vars,
    contains_agg, fmt_atom, fmt_term, rename_rule_vars, sub_term, term_vars,
)


class TestTermVars:
    def test_var(self):
        assert term_vars(Var("x")) == {"x"}

    def test_const(self):
        assert term_vars(Const(3)) == set()

    def test_binop(self):
        assert term_vars(BinOp("+", Var("a"), Var("b"))) == {"a", "b"}

    def test_nested(self):
        t = If(BinOp("==", Var("a"), Const(1)), Var("b"), Ext("round", (Var("c"), Const(0))))
        assert term_vars(t) == {"a", "b", "c"}

    def test_agg(self):
        assert term_vars(Agg("sum", Var("x"))) == {"x"}

    def test_count_star(self):
        assert term_vars(Agg("count", None)) == set()

    def test_unop(self):
        assert term_vars(UnOp("not", Var("p"))) == {"p"}


class TestSubTerm:
    def test_var_hit(self):
        assert sub_term(Var("x"), {"x": Const(1)}) == Const(1)

    def test_var_miss(self):
        assert sub_term(Var("y"), {"x": Const(1)}) == Var("y")

    def test_binop(self):
        t = sub_term(BinOp("*", Var("x"), Var("y")), {"x": Var("z")})
        assert t == BinOp("*", Var("z"), Var("y"))

    def test_if(self):
        t = If(Var("c"), Var("a"), Var("b"))
        out = sub_term(t, {"c": Const(True)})
        assert out.cond == Const(True) and out.then == Var("a")

    def test_agg_preserves_distinct(self):
        t = sub_term(Agg("count", Var("x"), True), {"x": Var("y")})
        assert t == Agg("count", Var("y"), True)

    def test_ext(self):
        t = sub_term(Ext("year", (Var("d"),)), {"d": Var("e")})
        assert t == Ext("year", (Var("e"),))


class TestContainsAgg:
    def test_plain(self):
        assert not contains_agg(BinOp("+", Var("a"), Const(1)))

    def test_direct(self):
        assert contains_agg(Agg("sum", Var("a")))

    def test_nested(self):
        assert contains_agg(BinOp("/", Agg("sum", Var("a")), Const(7)))

    def test_in_if(self):
        assert contains_agg(If(Var("c"), Agg("min", Var("a")), Const(0)))


class TestFormat:
    def test_const_str(self):
        assert fmt_term(Const("abc")) == "'abc'"

    def test_const_date(self):
        assert fmt_term(Const(dt.date(1994, 1, 1))) == "date'1994-01-01'"

    def test_agg_distinct(self):
        assert fmt_term(Agg("count", Var("x"), True)) == "count(distinct x)"

    def test_atom_filter(self):
        assert fmt_atom(Filter(BinOp("<", Var("a"), Const(5)))) == "((a < 5))"

    def test_atom_exists(self):
        a = Exists([RelAtom("r", ("x",))], negated=True)
        assert fmt_atom(a) == "not exists(r(x))"

    def test_rule_pretty(self):
        r = Rule(Head("t", ("a",), ("x",), group=("x",)), [RelAtom("s", ("x", "y"))])
        assert "group(x)" in r.pretty()
        assert r.pretty().startswith("t(a)")


class TestHead:
    def test_arity_check(self):
        with pytest.raises(ValueError):
            Head("t", ("a", "b"), ("x",))

    def test_sort_fmt(self):
        r = Rule(Head("t", ("a",), ("x",), sort=(("x", False),), limit=3),
                 [RelAtom("s", ("x",))])
        assert "sort(-x)" in r.pretty() and "limit(3)" in r.pretty()


class TestBodyBoundVars:
    def test_rel_and_assign(self):
        body = [RelAtom("r", ("x", "y")), Assign("z", BinOp("+", Var("x"), Var("y")))]
        assert body_bound_vars(body) == {"x", "y", "z"}

    def test_const_rel(self):
        assert body_bound_vars([ConstRel(("i",), ((0,), (1,)))]) == {"i"}

    def test_outer_join(self):
        oj = OuterJoin("left", RelAtom("a", ("x",)), RelAtom("b", ("y",)), (("x", "y"),))
        assert body_bound_vars([oj]) == {"x", "y"}


class TestRename:
    def test_head_and_body(self):
        r = Rule(Head("t", ("a", "b"), ("x", "y"), group=("x",), sort=(("y", True),)),
                 [RelAtom("s", ("x", "y")), Filter(BinOp(">", Var("y"), Const(0)))])
        out = rename_rule_vars(r, {"x": "u", "y": "v"})
        assert out.head.vars == ("u", "v")
        assert out.head.group == ("u",)
        assert out.head.sort == (("v", True),)
        assert out.body[0].vars == ("u", "v")
        assert term_vars(out.body[1].term) == {"v"}

    def test_exists_rename(self):
        r = Rule(Head("t", ("a",), ("x",)),
                 [RelAtom("s", ("x",)),
                  Exists([RelAtom("q", ("z",)), Filter(BinOp("==", Var("z"), Var("x")))])])
        out = rename_rule_vars(r, {"x": "u"})
        ex = out.body[1]
        assert term_vars(ex.body[1].term) == {"z", "u"}

    def test_outer_join_rename(self):
        oj = OuterJoin("left", RelAtom("a", ("x",)), RelAtom("b", ("y",)), (("x", "y"),))
        r = Rule(Head("t", ("a", "b"), ("x", "y")), [oj])
        out = rename_rule_vars(r, {"y": "w"})
        assert out.body[0].on == (("x", "w"),)


class TestProgram:
    def test_sink_and_schemas(self):
        p = Program([
            Rule(Head("t1", ("a",), ("x",)), [RelAtom("s", ("x",))]),
            Rule(Head("t2", ("b",), ("y",)), [RelAtom("t1", ("y",))]),
        ])
        assert p.sink.head.rel == "t2"
        assert p.schemas() == {"t1": ("a",), "t2": ("b",)}

    def test_pretty_lines(self):
        p = Program([Rule(Head("t", ("a",), ("x",)), [RelAtom("s", ("x",))])])
        assert p.pretty() == "t(a) :- s(x)."
