"""TondIR optimization passes (paper Section IV).

Cumulative optimization levels match the paper's Figure 10 breakdown:

* **O0** — no optimization: the *Grizzly-simulated* baseline (the SQL a
  naive rule-per-API translator would ship).
* **O1** — local + global dead-code elimination.
* **O2** — O1 + group/aggregate elimination (drops ``group`` clauses whose
  keys are provably unique; turns the aggregates into plain expressions).
* **O3** — O2 + self-join elimination (merges two accesses of the same
  relation joined on a unique column).
* **O4** — O3 + rule inlining: fuse producer rules into their single
  consumer unless the producer is a *flow breaker* (Table VII): aggregate,
  group-by, distinct, sort/limit, outer join, UID generation, or the sink.

Uniqueness facts flow from the catalog (primary keys) and from derived
heads (group keys, DISTINCT, UID columns), mirroring the paper's use of
catalog metadata and decorator annotations.
"""
from __future__ import annotations

import copy
from collections import Counter
from dataclasses import dataclass, field

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
    contains_agg,
    rename_rule_vars,
    term_vars,
)

# --------------------------------------------------------------------------
# Helpers
# --------------------------------------------------------------------------


def _body_var_counts(body, counts: Counter) -> None:
    for a in body:
        if isinstance(a, RelAtom):
            counts.update(a.vars)
        elif isinstance(a, ConstRel):
            counts.update(a.vars)
        elif isinstance(a, Filter):
            counts.update(term_vars(a.term))
        elif isinstance(a, Assign):
            counts.update([a.var])
            counts.update(term_vars(a.term))
        elif isinstance(a, Exists):
            _body_var_counts(a.body, counts)
        elif isinstance(a, OuterJoin):
            counts.update(a.left.vars)
            counts.update(a.right.vars)
            for l, r in a.on:
                counts.update([l, r])
        else:
            raise TypeError(a)


def rule_var_counts(rule: Rule) -> Counter:
    counts: Counter = Counter()
    counts.update(rule.head.vars)
    if rule.head.group:
        counts.update(rule.head.group)
    counts.update(v for v, _ in rule.head.sort)
    _body_var_counts(rule.body, counts)
    return counts


def _referenced_rels(body) -> list[str]:
    out = []
    for a in body:
        if isinstance(a, RelAtom):
            out.append(a.rel)
        elif isinstance(a, OuterJoin):
            out.extend([a.left.rel, a.right.rel])
        elif isinstance(a, Exists):
            out.extend(_referenced_rels(a.body))
    return out


def _has_uid(rule: Rule) -> bool:
    def t_has(t: Term) -> bool:
        if isinstance(t, Ext):
            return t.name == "uid" or any(t_has(a) for a in t.args)
        if isinstance(t, BinOp):
            return t_has(t.left) or t_has(t.right)
        if isinstance(t, UnOp):
            return t_has(t.arg)
        if isinstance(t, If):
            return t_has(t.cond) or t_has(t.then) or t_has(t.other)
        if isinstance(t, Agg):
            return t.arg is not None and t_has(t.arg)
        return False

    return any(isinstance(a, Assign) and t_has(a.term) for a in rule.body)


def is_flow_breaker(rule: Rule) -> bool:
    """Table VII: aggregate, group, distinct, sort/limit, outer join (+UID)."""
    h = rule.head
    if h.group is not None or h.distinct or h.sort or h.limit is not None:
        return True
    for a in rule.body:
        if isinstance(a, OuterJoin):
            return True
        if isinstance(a, Assign) and contains_agg(a.term):
            return True
    if _has_uid(rule):
        return True
    return False


# --------------------------------------------------------------------------
# Uniqueness / cardinality analysis
# --------------------------------------------------------------------------


@dataclass
class RelInfo:
    unique: list[frozenset] = field(default_factory=list)  # sets of col indices
    single_row: bool = False


def analyze(prog: Program, catalog: Catalog) -> dict[str, RelInfo]:
    """Per-relation uniqueness and single-row facts, derived in rule order."""
    info: dict[str, RelInfo] = {}
    for name, sch in catalog.tables.items():
        idx = {c: i for i, c in enumerate(sch.cols)}
        sets = []
        for u in sch.unique:
            if all(c in idx for c in u):
                sets.append(frozenset(idx[c] for c in u))
        info[name] = RelInfo(unique=sets)

    for rule in prog.rules:
        info[rule.head.rel] = _rule_info(rule, info)
    return info


def _atom_is_lookup(atom: RelAtom, rule: Rule, info: dict[str, RelInfo]) -> bool:
    """True if ``atom`` matches at most one row per combination of its join
    variables: its shared variables cover one of its unique column sets."""
    ri = info.get(atom.rel)
    if ri is None:
        return False
    if ri.single_row:
        return True
    counts = rule_var_counts(rule)
    shared_positions = {i for i, v in enumerate(atom.vars) if counts[v] >= 2}
    return any(u <= shared_positions for u in ri.unique)


def _rule_info(rule: Rule, info: dict[str, RelInfo]) -> RelInfo:
    h = rule.head
    out = RelInfo()
    col_pos = {v: i for i, v in enumerate(h.vars)}

    has_agg = any(isinstance(a, Assign) and contains_agg(a.term) for a in rule.body)
    if has_agg and h.group is None:
        out.single_row = True
        return out
    if h.limit == 1:
        out.single_row = True
    if h.group is not None:
        gset = frozenset(col_pos[v] for v in h.group if v in col_pos)
        if gset:
            out.unique.append(gset)
    if h.distinct:
        out.unique.append(frozenset(range(len(h.vars))))
    for a in rule.body:
        if isinstance(a, Assign) and isinstance(a.term, Ext) and a.term.name == "uid":
            if a.var in col_pos:
                out.unique.append(frozenset({col_pos[a.var]}))

    # Inherit through a single driving atom when all other atoms are lookups.
    rel_atoms = [a for a in rule.body if isinstance(a, RelAtom)]
    if rel_atoms and h.group is None and not any(
        isinstance(a, (OuterJoin, ConstRel)) for a in rule.body
    ):
        non_single = [a for a in rel_atoms if not info.get(a.rel, RelInfo()).single_row]
        if len(non_single) <= 1:
            drivers = non_single
        else:
            drivers = [
                a for a in non_single
                if all(o is a or _atom_is_lookup(o, rule, info) for o in non_single)
            ]
        for d in drivers:
            ri = info.get(d.rel)
            if ri is None:
                continue
            var_at = {}
            for i, v in enumerate(d.vars):
                var_at.setdefault(v, i)
            for u in ri.unique:
                # map source col indices -> head positions carrying those vars
                positions = set()
                ok = True
                for i in u:
                    v = d.vars[i]
                    if v in col_pos:
                        positions.add(col_pos[v])
                    else:
                        ok = False
                        break
                if ok and positions:
                    out.unique.append(frozenset(positions))
        if not non_single:
            out.single_row = all(
                not contains_agg(a.term) for a in rule.body if isinstance(a, Assign)
            ) and all(info[a.rel].single_row for a in rel_atoms)
    return out


# --------------------------------------------------------------------------
# O1a: local dead-code elimination
# --------------------------------------------------------------------------


def local_dce(rule: Rule) -> bool:
    changed = False
    while True:
        counts = rule_var_counts(rule)
        dead = [a for a in rule.body
                if isinstance(a, Assign) and counts[a.var] <= 1]
        if not dead:
            return changed
        for a in dead:
            rule.body.remove(a)
        changed = True


# --------------------------------------------------------------------------
# O1b: global dead-code elimination (dead rules + column pruning)
# --------------------------------------------------------------------------


def drop_dead_rules(prog: Program) -> bool:
    reachable = {prog.sink.head.rel}
    changed = True
    while changed:
        changed = False
        for r in prog.rules:
            if r.head.rel in reachable:
                for dep in _referenced_rels(r.body):
                    if dep not in reachable:
                        reachable.add(dep)
                        changed = True
    before = len(prog.rules)
    prog.rules = [r for r in prog.rules if r.head.rel in reachable]
    return len(prog.rules) != before


def prune_columns(prog: Program) -> bool:
    """Drop derived-relation columns never used by any consumer."""
    derived = {r.head.rel: r for r in prog.rules}
    used: dict[str, set[int]] = {rel: set() for rel in derived}
    used[prog.sink.head.rel] = set(range(len(prog.sink.head.cols)))

    def scan_body(body, counts):
        for a in body:
            for ra in ([a] if isinstance(a, RelAtom) else
                       ([a.left, a.right] if isinstance(a, OuterJoin) else [])):
                if ra.rel in used:
                    local = Counter(ra.vars)
                    for i, v in enumerate(ra.vars):
                        if counts[v] - local[v] >= 1 or local[v] >= 2:
                            used[ra.rel].add(i)
            if isinstance(a, Exists):
                scan_body(a.body, counts)

    for r in prog.rules:
        counts = rule_var_counts(r)
        # occurrences outside the binding atom itself:
        scan_body(r.body, counts)

    changed = False
    for rel, rule in derived.items():
        if rel == prog.sink.head.rel:
            continue
        keep = sorted(used[rel])
        if len(keep) == len(rule.head.cols):
            continue
        if not keep:
            keep = [0]  # keep one column so the relation stays well-formed
        rule.head = Head(
            rule.head.rel,
            tuple(rule.head.cols[i] for i in keep),
            tuple(rule.head.vars[i] for i in keep),
            rule.head.group,
            rule.head.sort,
            rule.head.limit,
            rule.head.distinct,
        )

        def rewrite(body):
            for a in body:
                if isinstance(a, RelAtom) and a.rel == rel:
                    a.vars = tuple(a.vars[i] for i in keep)
                elif isinstance(a, OuterJoin):
                    for ra in (a.left, a.right):
                        if ra.rel == rel:
                            ra.vars = tuple(ra.vars[i] for i in keep)
                elif isinstance(a, Exists):
                    rewrite(a.body)

        for r in prog.rules:
            rewrite(r.body)
        changed = True
    return changed


# --------------------------------------------------------------------------
# O2: group/aggregate elimination
# --------------------------------------------------------------------------


def _strip_agg(term: Term):
    """Rewrite a top-level aggregate for the 1-row-per-group case."""
    if isinstance(term, Agg):
        if term.func == "count":
            return Const(1)
        return term.arg
    return None


def group_agg_elim(prog: Program, catalog: Catalog) -> bool:
    info = analyze(prog, catalog)
    changed = False
    for rule in prog.rules:
        h = rule.head
        if h.group is None:
            continue
        if any(isinstance(a, (OuterJoin, ConstRel)) for a in rule.body):
            continue
        rel_atoms = [a for a in rule.body if isinstance(a, RelAtom)]
        non_single = [a for a in rel_atoms if not info.get(a.rel, RelInfo()).single_row]
        if not non_single:
            continue
        driver = None
        for d in non_single:
            if not all(o is d or _atom_is_lookup(o, rule, info) for o in non_single):
                continue
            ri = info.get(d.rel)
            if ri is None:
                continue
            group_positions = {
                i for i, v in enumerate(d.vars) if v in set(h.group)
            }
            if any(u <= group_positions for u in ri.unique):
                driver = d
                break
        if driver is None:
            continue
        ok = True
        new_assigns = {}
        for a in rule.body:
            if isinstance(a, Assign) and contains_agg(a.term):
                stripped = _strip_agg(a.term)
                if stripped is None:
                    ok = False
                    break
                new_assigns[id(a)] = stripped
        if not ok:
            continue
        for a in rule.body:
            if id(a) in new_assigns:
                a.term = new_assigns[id(a)]
        rule.head = Head(h.rel, h.cols, h.vars, None, h.sort, h.limit, h.distinct)
        changed = True
    return changed


# --------------------------------------------------------------------------
# O3: self-join elimination
# --------------------------------------------------------------------------


def self_join_elim(prog: Program, catalog: Catalog) -> bool:
    info = analyze(prog, catalog)
    changed = False
    for idx, rule in enumerate(prog.rules):
        while True:
            rel_atoms = [a for a in rule.body if isinstance(a, RelAtom)]
            merged = False
            for i in range(len(rel_atoms)):
                for j in range(i + 1, len(rel_atoms)):
                    a1, a2 = rel_atoms[i], rel_atoms[j]
                    if a1.rel != a2.rel or len(a1.vars) != len(a2.vars):
                        continue
                    ri = info.get(a1.rel)
                    if ri is None:
                        continue
                    shared = {p for p in range(len(a1.vars)) if a1.vars[p] == a2.vars[p]}
                    if not any(u <= shared for u in ri.unique):
                        continue
                    mapping = {a2.vars[p]: a1.vars[p]
                               for p in range(len(a1.vars)) if a2.vars[p] != a1.vars[p]}
                    rule.body.remove(a2)
                    renamed = rename_rule_vars(rule, mapping)
                    rule.head = renamed.head
                    rule.body = renamed.body
                    merged = True
                    changed = True
                    break
                if merged:
                    break
            if not merged:
                break
        prog.rules[idx] = rule
    return changed


# --------------------------------------------------------------------------
# O4: rule inlining
# --------------------------------------------------------------------------


def _consumer_refs(prog: Program) -> dict[str, list[tuple[Rule, RelAtom, bool]]]:
    """rel -> [(consumer rule, atom, inside_exists)]."""
    refs: dict[str, list[tuple[Rule, RelAtom, bool]]] = {}

    def scan(rule, body, inside):
        for a in body:
            if isinstance(a, RelAtom):
                refs.setdefault(a.rel, []).append((rule, a, inside))
            elif isinstance(a, OuterJoin):
                refs.setdefault(a.left.rel, []).append((rule, a.left, True))
                refs.setdefault(a.right.rel, []).append((rule, a.right, True))
            elif isinstance(a, Exists):
                scan(rule, a.body, True)

    for r in prog.rules:
        scan(r, r.body, False)
    return refs


def rule_inlining(prog: Program, fresh) -> bool:
    """Fuse non-flow-breaker rules into their single top-level consumer."""
    changed = False
    while True:
        refs = _consumer_refs(prog)
        producers = {r.head.rel: r for r in prog.rules}
        target = None
        for rel, rule in producers.items():
            if rule is prog.sink or is_flow_breaker(rule):
                continue
            uses = refs.get(rel, [])
            if len(uses) != 1 or uses[0][2]:
                continue
            target = (rel, rule, uses[0][0], uses[0][1])
            break
        if target is None:
            return changed
        rel, producer, consumer, atom = target
        pos = consumer.body.index(atom)
        # rename producer vars: head vars -> consumer atom vars, rest fresh.
        # A producer head var bound to two output columns means the columns
        # are provably equal -> unify the consumer's two vars instead of
        # leaving the second one dangling.
        mapping: dict[str, str] = {}
        dup_renames: dict[str, str] = {}
        for hv, cv in zip(producer.head.vars, atom.vars):
            if hv in mapping and mapping[hv] != cv:
                dup_renames[cv] = mapping[hv]
            else:
                mapping[hv] = cv
        if dup_renames:
            renamed_consumer = rename_rule_vars(consumer, dup_renames)
            consumer.head = renamed_consumer.head
            consumer.body = renamed_consumer.body
        counts = rule_var_counts(producer)
        for v in counts:
            mapping.setdefault(v, fresh())
        renamed = rename_rule_vars(producer, mapping)
        consumer.body[pos:pos + 1] = list(renamed.body)
        prog.rules.remove(producer)
        changed = True


# --------------------------------------------------------------------------
# Driver
# --------------------------------------------------------------------------


def optimize(prog: Program, catalog: Catalog, level: int = 4) -> Program:
    """Apply the paper's optimizations at the given cumulative level (0-4)."""
    prog = copy.deepcopy(prog)
    if level <= 0:
        return prog
    import itertools

    counter = itertools.count(1)

    def fresh() -> str:
        return f"q{next(counter)}"

    for _ in range(25):
        changed = False
        for r in prog.rules:
            changed |= local_dce(r)
        changed |= drop_dead_rules(prog)
        changed |= prune_columns(prog)
        if level >= 3:
            changed |= self_join_elim(prog, catalog)
        if level >= 2:
            changed |= group_agg_elim(prog, catalog)
        if level >= 4:
            changed |= rule_inlining(prog, fresh)
        if not changed:
            break
    return prog
