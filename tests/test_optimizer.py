"""Unit tests for the Section-IV optimization passes, mirroring the paper's
before/after examples (local/global DCE, group-agg elim, self-join elim,
rule inlining with flow breakers)."""
import pytest

from repro.core.catalog import Catalog, TableSchema
from repro.core.ir import (
    Agg, Assign, BinOp, Const, Exists, Ext, Filter, Head, OuterJoin, Program,
    RelAtom, Rule, Var,
)
from repro.core.optimizer import (
    analyze, drop_dead_rules, group_agg_elim, is_flow_breaker, local_dce,
    optimize, prune_columns, rule_inlining, self_join_elim,
)


def _cat():
    cat = Catalog()
    cat.add(TableSchema("r", ("a", "b", "c", "d"), (frozenset({"a"}),)))
    cat.add(TableSchema("s", ("k", "v")))
    return cat


class TestLocalDCE:
    def test_removes_unused_assign(self):
        # paper: assignment whose variable is not in the head is removed
        rule = Rule(Head("t", ("a",), ("x",)),
                    [RelAtom("r", ("x", "y", "z", "w")),
                     Assign("dead", BinOp("+", Var("y"), Const(1)))])
        assert local_dce(rule)
        assert len(rule.body) == 1

    def test_keeps_used_assign(self):
        rule = Rule(Head("t", ("a", "e"), ("x", "e")),
                    [RelAtom("r", ("x", "y", "z", "w")),
                     Assign("e", BinOp("+", Var("y"), Const(1)))])
        assert not local_dce(rule)

    def test_chain_removed(self):
        rule = Rule(Head("t", ("a",), ("x",)),
                    [RelAtom("r", ("x", "y", "z", "w")),
                     Assign("m", BinOp("+", Var("y"), Const(1))),
                     Assign("n", BinOp("*", Var("m"), Const(2)))])
        assert local_dce(rule)
        assert len(rule.body) == 1


class TestGlobalDCE:
    def test_dead_rule_dropped(self):
        p = Program([
            Rule(Head("t1", ("a",), ("x",)), [RelAtom("r", ("x", "y", "z", "w"))]),
            Rule(Head("dead", ("a",), ("x",)), [RelAtom("r", ("x", "y", "z", "w"))]),
            Rule(Head("t2", ("a",), ("u",)), [RelAtom("t1", ("u",))]),
        ])
        assert drop_dead_rules(p)
        assert [r.head.rel for r in p.rules] == ["t1", "t2"]

    def test_column_pruned(self):
        # paper's global-DCE example: c/d unused downstream
        p = Program([
            Rule(Head("t1", ("a", "b", "c", "d"), ("x", "y", "z", "w")),
                 [RelAtom("r", ("x", "y", "z", "w")),
                  Filter(BinOp("<", Var("x"), Const(10)))]),
            Rule(Head("t2", ("a", "s"), ("x2", "s")),
                 [RelAtom("t1", ("x2", "y2", "z2", "w2")),
                  Assign("s", BinOp("+", Var("x2"), Var("y2")))]),
        ])
        assert prune_columns(p)
        assert p.rules[0].head.cols == ("a", "b")
        assert p.rules[1].body[0].vars == ("x2", "y2")

    def test_join_var_counts_as_used(self):
        p = Program([
            Rule(Head("t1", ("a", "b"), ("x", "y")),
                 [RelAtom("r", ("x", "y", "z", "w"))]),
            Rule(Head("t2", ("b",), ("y2",)),
                 [RelAtom("t1", ("x2", "y2")), RelAtom("s", ("x2", "v2"))]),
        ])
        # col a is the join key: must NOT be pruned
        assert not prune_columns(p)

    def test_exists_reachability(self):
        p = Program([
            Rule(Head("sub", ("a",), ("x",)), [RelAtom("r", ("x", "y", "z", "w"))]),
            Rule(Head("t", ("k",), ("k",)),
                 [RelAtom("s", ("k", "v")),
                  Exists([RelAtom("sub", ("e",)), Filter(BinOp("==", Var("e"), Var("k")))])]),
        ])
        assert not drop_dead_rules(p)
        assert len(p.rules) == 2


class TestGroupAggElim:
    def test_group_on_unique_key(self):
        # paper: group-by-sum on the primary key collapses to projection
        p = Program([
            Rule(Head("t", ("a", "s"), ("x", "s"), group=("x",)),
                 [RelAtom("r", ("x", "y", "z", "w")),
                  Assign("s", Agg("sum", Var("y")))]),
        ])
        assert group_agg_elim(p, _cat())
        assert p.rules[0].head.group is None
        assert p.rules[0].body[1].term == Var("y")

    def test_group_on_non_unique_kept(self):
        p = Program([
            Rule(Head("t", ("b", "s"), ("y", "s"), group=("y",)),
                 [RelAtom("r", ("x", "y", "z", "w")),
                  Assign("s", Agg("sum", Var("x")))]),
        ])
        assert not group_agg_elim(p, _cat())
        assert p.rules[0].head.group is not None

    def test_count_becomes_one(self):
        p = Program([
            Rule(Head("t", ("a", "n"), ("x", "n"), group=("x",)),
                 [RelAtom("r", ("x", "y", "z", "w")),
                  Assign("n", Agg("count", None))]),
        ])
        assert group_agg_elim(p, _cat())
        assert p.rules[0].body[1].term == Const(1)

    def test_lookup_join_preserves_uniqueness(self):
        # join on the other relation's unique key multiplies rows by <=1
        cat = _cat()
        p = Program([
            Rule(Head("t", ("k", "s"), ("k", "s"), group=("k",)),
                 [RelAtom("s", ("k", "v")),
                  RelAtom("r", ("k", "y", "z", "w")),  # r.a unique, joined on it
                  Assign("s", Agg("sum", Var("v")))]),
        ])
        # grouping key is s.k which is NOT unique -> stays grouped
        assert not group_agg_elim(p, cat)


class TestSelfJoinElim:
    def test_merge_on_unique(self):
        # paper: R1 joined with itself on unique a
        p = Program([
            Rule(Head("t", ("b", "c"), ("y", "z2")),
                 [RelAtom("r", ("x", "y", "z", "w")),
                  RelAtom("r", ("x", "y2", "z2", "w2"))]),
        ])
        assert self_join_elim(p, _cat())
        atoms = [a for a in p.rules[0].body if isinstance(a, RelAtom)]
        assert len(atoms) == 1
        assert p.rules[0].head.vars == ("y", "z")

    def test_no_merge_on_non_unique(self):
        p = Program([
            Rule(Head("t", ("v",), ("v",)),
                 [RelAtom("s", ("k", "v")), RelAtom("s", ("k", "v2"))]),
        ])
        assert not self_join_elim(p, _cat())


class TestFlowBreakers:
    def test_group(self):
        r = Rule(Head("t", ("a",), ("x",), group=("x",)), [RelAtom("r", ("x", "y", "z", "w"))])
        assert is_flow_breaker(r)

    def test_distinct(self):
        r = Rule(Head("t", ("a",), ("x",), distinct=True), [RelAtom("r", ("x", "y", "z", "w"))])
        assert is_flow_breaker(r)

    def test_sort_limit(self):
        r = Rule(Head("t", ("a",), ("x",), sort=(("x", True),), limit=5),
                 [RelAtom("r", ("x", "y", "z", "w"))])
        assert is_flow_breaker(r)

    def test_aggregate(self):
        r = Rule(Head("t", ("s",), ("s",)),
                 [RelAtom("r", ("x", "y", "z", "w")), Assign("s", Agg("sum", Var("x")))])
        assert is_flow_breaker(r)

    def test_outer_join(self):
        oj = OuterJoin("left", RelAtom("r", ("x", "y", "z", "w")),
                       RelAtom("s", ("k", "v")), (("x", "k"),))
        r = Rule(Head("t", ("a",), ("x",)), [oj])
        assert is_flow_breaker(r)

    def test_uid(self):
        r = Rule(Head("t", ("i", "a"), ("i", "x")),
                 [RelAtom("r", ("x", "y", "z", "w")), Assign("i", Ext("uid", (Var("x"),)))])
        assert is_flow_breaker(r)

    def test_plain_is_not(self):
        r = Rule(Head("t", ("a",), ("x",)),
                 [RelAtom("r", ("x", "y", "z", "w")), Filter(BinOp("<", Var("x"), Const(3)))])
        assert not is_flow_breaker(r)


class TestInlining:
    def test_paper_example(self):
        # R2/R3/R5 fuse into the grouped sink R7 (paper Section IV)
        p = Program([
            Rule(Head("r2", ("b", "c", "d"), ("y", "z", "w")),
                 [RelAtom("r", ("x", "y", "z", "w")),
                  Filter(BinOp(">", Var("x"), Const(1000)))]),
            Rule(Head("r3", ("b", "d"), ("y2", "w2")),
                 [RelAtom("r2", ("y2", "z2", "w2")),
                  Filter(BinOp("!=", Var("z2"), Const("A")))]),
            Rule(Head("r7", ("b", "m"), ("b3", "m"), group=("b3",)),
                 [RelAtom("r3", ("b3", "d3")),
                  Assign("m", Agg("max", Var("d3")))]),
        ])
        import itertools

        c = itertools.count()
        assert rule_inlining(p, lambda: f"f{next(c)}")
        assert len(p.rules) == 1
        sink = p.rules[0]
        assert sink.head.rel == "r7"
        rels = [a.rel for a in sink.body if isinstance(a, RelAtom)]
        assert rels == ["r"]

    def test_flow_breaker_not_inlined(self):
        p = Program([
            Rule(Head("g", ("a", "s"), ("x", "s"), group=("x",)),
                 [RelAtom("r", ("x", "y", "z", "w")), Assign("s", Agg("sum", Var("y")))]),
            Rule(Head("t", ("a",), ("u",)),
                 [RelAtom("g", ("u", "s2")), Filter(BinOp(">", Var("s2"), Const(0)))]),
        ])
        import itertools

        c = itertools.count()
        assert not rule_inlining(p, lambda: f"f{next(c)}")
        assert len(p.rules) == 2

    def test_multi_consumer_not_inlined(self):
        p = Program([
            Rule(Head("t1", ("a",), ("x",)), [RelAtom("r", ("x", "y", "z", "w"))]),
            Rule(Head("t2", ("a", "a2"), ("u", "v")),
                 [RelAtom("t1", ("u",)), RelAtom("t1", ("v",))]),
        ])
        import itertools

        c = itertools.count()
        assert not rule_inlining(p, lambda: f"f{next(c)}")


class TestAnalyze:
    def test_base_unique_from_catalog(self):
        info = analyze(Program([]), _cat())
        assert frozenset({0}) in info["r"].unique

    def test_group_head_unique(self):
        p = Program([
            Rule(Head("g", ("b", "s"), ("y", "s"), group=("y",)),
                 [RelAtom("r", ("x", "y", "z", "w")), Assign("s", Agg("sum", Var("x")))]),
        ])
        info = analyze(p, _cat())
        assert frozenset({0}) in info["g"].unique

    def test_global_agg_single_row(self):
        p = Program([
            Rule(Head("g", ("s",), ("s",)),
                 [RelAtom("r", ("x", "y", "z", "w")), Assign("s", Agg("sum", Var("x")))]),
        ])
        assert analyze(p, _cat())["g"].single_row

    def test_uid_unique(self):
        p = Program([
            Rule(Head("g", ("i", "b"), ("i", "y")),
                 [RelAtom("s", ("k", "y")), Assign("i", Ext("uid", (Var("k"),)))]),
        ])
        info = analyze(p, _cat())
        assert frozenset({0}) in info["g"].unique


class TestEndToEnd:
    def test_o0_is_identity(self):
        p = Program([
            Rule(Head("t", ("a",), ("x",)), [RelAtom("r", ("x", "y", "z", "w"))]),
            Rule(Head("t2", ("a",), ("u",)), [RelAtom("t", ("u",))]),
        ])
        out = optimize(p, _cat(), 0)
        assert out.pretty() == p.pretty()

    def test_levels_monotone_rule_count(self):
        from repro.core.evaluator import translate
        from repro.workloads import tpch

        prog = translate(tpch.QUERIES["q03"], tpch.tpch_catalog())
        sizes = [len(optimize(prog, tpch.tpch_catalog(), lvl).rules)
                 for lvl in (0, 1, 2, 3, 4)]
        assert sizes[0] >= sizes[1] >= sizes[4]
        assert sizes[4] < sizes[0]
