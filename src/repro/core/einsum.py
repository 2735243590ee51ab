"""Einsum planning and translation to TondIR (paper Section III-D).

Dense layout: a matrix is relation ``(id, c0..c{n-1})``, a vector is
``(id, c0)``. The base kernels of Table VI (ES1..ES9) are emitted here; an
arbitrary einsum is *reduced* to them: repeated labels become diagonals,
labels summed away in a single operand are pre-aggregated, operands are
swapped/transposed to match a kernel. Per the paper, the dense per-row
kernels use a *generalized* translation that groups by the row id and
sums — redundant when the id is unique, which is exactly what the
Group/Aggregate-Elimination optimization (O2) later removes.

Sparse (COO) layout: ``(row, col, val)``; the translation follows Blacher
et al. — labels become join variables, output labels become group-by keys,
and the value is ``sum`` of the product (emitted as TondIR, not SQL).

n-ary einsums are decomposed into binary ones by greedy pairwise
contraction (an offline stand-in for ``opt_einsum``'s path optimizer).
"""
from __future__ import annotations

from functools import reduce
from typing import Optional

import numpy as np

from .frontend import ConstArray, ScalarRef, SymArray, SymScalar, Translator
from .ir import (
    Agg,
    Assign,
    BinOp,
    Const,
    ConstRel,
    Filter,
    Head,
    If,
    RelAtom,
    Rule,
    Var,
)


def _mul(terms):
    return reduce(lambda a, b: BinOp("*", a, b), terms)


def _add(terms):
    return reduce(lambda a, b: BinOp("+", a, b), terms)


def _nested_if(sel_var: str, choices: list) -> object:
    """if(sel==0, choices[0], if(sel==1, choices[1], ...))."""
    out = choices[-1]
    for k in range(len(choices) - 2, -1, -1):
        out = If(BinOp("==", Var(sel_var), Const(k)), choices[k], out)
    return out


class _Emitter:
    """Low-level rule builder for kernels that need explicit joins."""

    def __init__(self, tr: Translator):
        self.tr = tr

    def atom(self, rel: str, n: int) -> tuple[RelAtom, list[str]]:
        vs = [self.tr.fresh_var() for _ in range(n)]
        return RelAtom(rel, tuple(vs)), vs

    def rule(self, cols, vars, body, group=None, sort=(), limit=None) -> str:
        rel = self.tr.fresh_rel("es")
        self.tr.add_rule(Rule(Head(rel, tuple(cols), tuple(vars), group, tuple(sort), limit), body))
        return rel


# --------------------------------------------------------------------------
# Dense kernels
# --------------------------------------------------------------------------


def _dense_cols(tr: Translator, arr: SymArray) -> list[str]:
    cols = list(tr.rel_cols(arr.rel))
    assert cols[0] == "id", f"dense array relation must start with id, got {cols}"
    return cols


def k_diag(tr: Translator, m: SymArray) -> SymArray:
    """ES3 'ii->i': diagonal to column."""
    em = _Emitter(tr)
    n = m.n_cols
    a, vs = em.atom(m.rel, n + 1)
    d = tr.fresh_var("a")
    body = [a, Filter(BinOp("<", Var(vs[0]), Const(n))),
            Assign(d, _nested_if(vs[0], [Var(v) for v in vs[1:]]))]
    rel = em.rule(["id", "c0"], [vs[0], d], body)
    return SymArray(rel, 1, "dense", 1)


def k_rowsum(tr: Translator, m: SymArray) -> SymArray:
    """'ij->i' — generalized: group(id) + sum (O2 removes the group)."""
    em = _Emitter(tr)
    a, vs = em.atom(m.rel, m.n_cols + 1)
    s = tr.fresh_var("a")
    body = [a, Assign(s, Agg("sum", _add([Var(v) for v in vs[1:]])))]
    rel = em.rule(["id", "c0"], [vs[0], s], body, group=(vs[0],))
    return SymArray(rel, 1, "dense", 1)


def k_colsum_row(tr: Translator, m: SymArray) -> str:
    """Global per-column sums as a single wide row; returns the relation."""
    em = _Emitter(tr)
    a, vs = em.atom(m.rel, m.n_cols + 1)
    body = [a]
    outv = []
    for k in range(m.n_cols):
        s = tr.fresh_var("a")
        body.append(Assign(s, Agg("sum", Var(vs[k + 1]))))
        outv.append(s)
    return em.rule([f"s{k}" for k in range(m.n_cols)], outv, body)


def k_row_to_vector(tr: Translator, row_rel: str, n: int) -> SymArray:
    """Reshape a 1-row wide relation (s0..s{n-1}) into a vector (id, c0)."""
    em = _Emitter(tr)
    a, vs = em.atom(row_rel, n)
    idx = tr.fresh_var("i")
    c = tr.fresh_var("a")
    body = [a, ConstRel((idx,), tuple((k,) for k in range(n))),
            Assign(c, _nested_if(idx, [Var(v) for v in vs]))]
    rel = em.rule(["id", "c0"], [idx, c], body)
    return SymArray(rel, 1, "dense", 1)


def k_colsum(tr: Translator, m: SymArray) -> SymArray:
    """'ij->j' — column sums as a vector."""
    return k_row_to_vector(tr, k_colsum_row(tr, m), m.n_cols)


def k_total(tr: Translator, m: SymArray) -> SymScalar:
    """'ij->' / 'i->': full sum."""
    em = _Emitter(tr)
    n = (m.n_cols if m.ndim == 2 else 1)
    a, vs = em.atom(m.rel, n + 1)
    s = tr.fresh_var("a")
    body = [a, Assign(s, Agg("sum", _add([Var(v) for v in vs[1:]])))]
    rel = em.rule(["v0"], [s], body)
    return SymScalar(ScalarRef(rel, "v0"))


def k_pivot_to_row(tr: Translator, v: SymArray, n: int) -> str:
    """Vector (id, c0) of known length n -> one wide row (w0..w{n-1})."""
    em = _Emitter(tr)
    a, vs = em.atom(v.rel, 2)
    body = [a]
    outv = []
    for k in range(n):
        w = tr.fresh_var("a")
        body.append(Assign(w, Agg("sum", If(BinOp("==", Var(vs[0]), Const(k)),
                                            Var(vs[1]), Const(0)))))
        outv.append(w)
    return em.rule([f"w{k}" for k in range(n)], outv, body)


def k_pivot_matrix_to_row(tr: Translator, m: SymArray, n_rows: int) -> str:
    """Matrix (id, c0..) of known row count -> one row of n_rows*n_cols."""
    em = _Emitter(tr)
    a, vs = em.atom(m.rel, m.n_cols + 1)
    body = [a]
    outv, cols = [], []
    for j in range(n_rows):
        for k in range(m.n_cols):
            w = tr.fresh_var("a")
            body.append(Assign(w, Agg("sum", If(BinOp("==", Var(vs[0]), Const(j)),
                                                Var(vs[k + 1]), Const(0)))))
            outv.append(w)
            cols.append(f"s{j}_{k}")
    return em.rule(cols, outv, body)


def k_hadamard(tr: Translator, m1: SymArray, m2: SymArray) -> SymArray:
    """ES7 'ij,ij->ij' — generalized group(id) translation."""
    em = _Emitter(tr)
    n = m1.n_cols
    a1, v1 = em.atom(m1.rel, n + 1)
    a2, v2 = em.atom(m2.rel, n + 1)
    v2[0] = v1[0]
    a2 = RelAtom(a2.rel, tuple(v2))
    body = [a1, a2]
    outv = [v1[0]]
    for k in range(n):
        s = tr.fresh_var("a")
        body.append(Assign(s, Agg("sum", BinOp("*", Var(v1[k + 1]), Var(v2[k + 1])))))
        outv.append(s)
    rel = em.rule(["id"] + [f"c{k}" for k in range(n)], outv, body, group=(v1[0],))
    return SymArray(rel, m1.ndim, "dense", n)


def k_matvec(tr: Translator, m: SymArray, v) -> SymArray:
    """'ij,j->i'. Constant vectors are folded inline (paper III-D)."""
    em = _Emitter(tr)
    n = m.n_cols
    a, vs = em.atom(m.rel, n + 1)
    body = [a]
    if isinstance(v, ConstArray):
        weights = [Const(float(w)) for w in v.values]
    else:
        prow = k_pivot_to_row(tr, v, n)
        pa, pv = em.atom(prow, n)
        body.append(pa)
        weights = [Var(w) for w in pv]
    s = tr.fresh_var("a")
    dot = _add([BinOp("*", Var(vs[k + 1]), weights[k]) for k in range(n)])
    body.append(Assign(s, Agg("sum", dot)))
    rel = em.rule(["id", "c0"], [vs[0], s], body, group=(vs[0],))
    return SymArray(rel, 1, "dense", 1)


def k_gram(tr: Translator, m1: SymArray, m2: SymArray) -> SymArray:
    """ES8 'ij,ik->jk' (covariance/Gram): global sums then VALUES reshape."""
    em = _Emitter(tr)
    n1, n2 = m1.n_cols, m2.n_cols
    a1, v1 = em.atom(m1.rel, n1 + 1)
    a2, v2 = em.atom(m2.rel, n2 + 1)
    v2[0] = v1[0]
    a2 = RelAtom(a2.rel, tuple(v2))
    body = [a1, a2]
    sv = {}
    for j in range(n1):
        for k in range(n2):
            s = tr.fresh_var("a")
            body.append(Assign(s, Agg("sum", BinOp("*", Var(v1[j + 1]), Var(v2[k + 1])))))
            sv[(j, k)] = s
    wide = em.rule([f"s{j}_{k}" for j in range(n1) for k in range(n2)],
                   [sv[(j, k)] for j in range(n1) for k in range(n2)], body)
    # reshape wide row -> n1 x n2 matrix (paper Fig. 2 v4_2/v4_3)
    wa, wv = em.atom(wide, n1 * n2)
    idx = tr.fresh_var("i")
    body2 = [wa, ConstRel((idx,), tuple((j,) for j in range(n1)))]
    outv = [idx]
    for k in range(n2):
        c = tr.fresh_var("a")
        body2.append(Assign(c, _nested_if(idx, [Var(wv[j * n2 + k]) for j in range(n1)])))
        outv.append(c)
    rel = em.rule(["id"] + [f"c{k}" for k in range(n2)], outv, body2)
    return SymArray(rel, 2, "dense", n2, n_rows=n1)


def k_matmul(tr: Translator, m1: SymArray, m2: SymArray) -> SymArray:
    """'ij,jk->ik' — pivot m2 wide (needs m2 row count = m1.n_cols)."""
    em = _Emitter(tr)
    n, k_out = m1.n_cols, m2.n_cols
    prow = k_pivot_matrix_to_row(tr, m2, n)
    a1, v1 = em.atom(m1.rel, n + 1)
    pa, pv = em.atom(prow, n * k_out)
    body = [a1, pa]
    outv = [v1[0]]
    for k in range(k_out):
        s = tr.fresh_var("a")
        dot = _add([BinOp("*", Var(v1[j + 1]), Var(pv[j * k_out + k])) for j in range(n)])
        body.append(Assign(s, Agg("sum", dot)))
        outv.append(s)
    rel = em.rule(["id"] + [f"c{k}" for k in range(k_out)], outv, body, group=(v1[0],))
    return SymArray(rel, 2, "dense", k_out)


def k_scale_rows(tr: Translator, m: SymArray, v: SymArray) -> SymArray:
    """'ij,i->ij': multiply each row of m by the vector entry of its id
    (what ES9 reduces to after the private label is pre-summed)."""
    em = _Emitter(tr)
    n = m.n_cols
    a1, v1 = em.atom(m.rel, n + 1)
    a2, v2 = em.atom(v.rel, 2)
    v2[0] = v1[0]
    a2 = RelAtom(a2.rel, tuple(v2))
    body = [a1, a2]
    outv = [v1[0]]
    for k in range(n):
        s = tr.fresh_var("a")
        body.append(Assign(s, Agg("sum", BinOp("*", Var(v1[k + 1]), Var(v2[1])))))
        outv.append(s)
    rel = em.rule(["id"] + [f"c{k}" for k in range(n)], outv, body, group=(v1[0],))
    return SymArray(rel, 2, "dense", n)


def k_es9(tr: Translator, m1: SymArray, m2: SymArray) -> SymArray:
    """ES9 'ij,ik->ij': scale each row of m1 by m2's row sum."""
    em = _Emitter(tr)
    n1, n2 = m1.n_cols, m2.n_cols
    a1, v1 = em.atom(m1.rel, n1 + 1)
    a2, v2 = em.atom(m2.rel, n2 + 1)
    v2[0] = v1[0]
    a2 = RelAtom(a2.rel, tuple(v2))
    rsum = _add([Var(v) for v in v2[1:]])
    body = [a1, a2]
    outv = [v1[0]]
    for j in range(n1):
        s = tr.fresh_var("a")
        body.append(Assign(s, Agg("sum", BinOp("*", Var(v1[j + 1]), rsum))))
        outv.append(s)
    rel = em.rule(["id"] + [f"c{j}" for j in range(n1)], outv, body, group=(v1[0],))
    return SymArray(rel, 2, "dense", n1)


def k_transpose(tr: Translator, m: SymArray) -> SymArray:
    """ES4 'ij->ji' — requires a statically known row count."""
    if m.n_rows is None:
        raise NotImplementedError(
            "dense transpose needs a statically known row count "
            "(only small intermediate matrices, e.g. einsum results)"
        )
    em = _Emitter(tr)
    r, c = m.n_rows, m.n_cols
    a, vs = em.atom(m.rel, c + 1)
    idx = tr.fresh_var("i")
    body = [a, ConstRel((idx,), tuple((j,) for j in range(c)))]
    outv = [idx]
    for k in range(r):
        d = tr.fresh_var("a")
        sel = _nested_if(idx, [Var(vs[j + 1]) for j in range(c)])
        body.append(Assign(d, Agg("sum", If(BinOp("==", Var(vs[0]), Const(k)), sel, Const(0)))))
        outv.append(d)
    rel = em.rule(["id"] + [f"c{k}" for k in range(r)], outv, body, group=(idx,))
    return SymArray(rel, 2, "dense", r, n_rows=c)


def k_scale(tr: Translator, m: SymArray, s) -> SymArray:
    """ES6 ',ij->ij': scalar times matrix/vector."""
    em = _Emitter(tr)
    n = m.n_cols if m.ndim == 2 else 1
    a, vs = em.atom(m.rel, n + 1)
    body = [a]
    sterm = s.expr if isinstance(s, SymScalar) else Const(float(s))
    outv = [vs[0]]
    for k in range(n):
        c = tr.fresh_var("a")
        body.append(Assign(c, BinOp("*", sub := sterm, Var(vs[k + 1]))))
        outv.append(c)
    # ScalarRef inside sterm: resolve via a cross join atom
    body2 = []
    scalar_cache: dict = {}
    env: dict = {}
    for atom in body:
        if isinstance(atom, Assign):
            body2.append(Assign(atom.var, tr._resolve(atom.term, env, body2, scalar_cache)))
        else:
            body2.append(atom)
    rel = em.rule(["id"] + [f"c{k}" for k in range(n)], outv, body2)
    return SymArray(rel, m.ndim, "dense", n)


# --------------------------------------------------------------------------
# Sparse (COO) generic translation
# --------------------------------------------------------------------------


def _sparse_einsum(tr: Translator, in_specs: list[str], out_spec: str, ops) -> object:
    label_var: dict[str, str] = {}
    body: list = []
    val_terms: list = []
    for spec_i, op in zip(in_specs, ops):
        if isinstance(op, ConstArray):
            raise NotImplementedError("constant operands unsupported in sparse einsum")
        for lbl in spec_i:
            label_var.setdefault(lbl, tr.fresh_var("l"))
        val = tr.fresh_var("v")
        idx_vars = tuple(label_var[l] for l in spec_i)
        body.append(RelAtom(op.rel, idx_vars + (val,)))
        val_terms.append(Var(val))
    product = _mul(val_terms) if val_terms else Const(1.0)
    summed = set("".join(in_specs)) - set(out_spec)
    em = _Emitter(tr)
    out_idx = [label_var[l] for l in out_spec]
    idx_cols = (["row", "col"] if len(out_spec) == 2 else (["row"] if out_spec else []))
    v = tr.fresh_var("a")
    if summed:
        body.append(Assign(v, Agg("sum", product)))
        rel = em.rule(idx_cols + ["val"], out_idx + [v], body,
                      group=tuple(out_idx) if out_idx else None)
    else:
        body.append(Assign(v, product))
        rel = em.rule(idx_cols + ["val"], out_idx + [v], body)
    if not out_spec:
        return SymScalar(ScalarRef(rel, "val"))
    return SymArray(rel, len(out_spec), "coo", None)


# --------------------------------------------------------------------------
# Planner
# --------------------------------------------------------------------------


def _pre_reduce(tr: Translator, spec: str, op, other_labels: set, out_spec: str):
    """Diagonalize repeated labels; sum out labels private to this operand."""
    if isinstance(op, (ConstArray, SymScalar, int, float)):
        return spec, op
    if len(spec) == 2 and spec[0] == spec[1]:
        op = k_diag(tr, op)
        spec = spec[0]
    keep = set(out_spec) | other_labels
    private = [l for l in spec if l not in keep]
    if private:
        if len(spec) == 1:
            return "", k_total(tr, op)
        if len(spec) == 2:
            if spec[1] in private and spec[0] in keep:
                return spec[0], k_rowsum(tr, op)
            if spec[0] in private and spec[1] in keep:
                return spec[1], k_colsum(tr, op)
            return "", k_total(tr, op)
    return spec, op


def _dense_binary(tr: Translator, s1: str, op1, s2: str, op2, out: str):
    def canon(a, b, o):
        """Rename labels by first appearance for structural matching."""
        names = {}
        for l in a + b + o:
            if l not in names:
                names[l] = "ijk"[len(names)]
        return ("".join(names[l] for l in a), "".join(names[l] for l in b),
                "".join(names[l] for l in o))

    for (sa, oa), (sb, ob) in (((s1, op1), (s2, op2)), ((s2, op2), (s1, op1))):
        key = canon(sa, sb, out)
        if key == ("i", "i", ""):  # ES-inner
            had = k_hadamard_vec(tr, oa, ob)
            return k_total(tr, had)
        if key == ("i", "i", "i"):
            return k_hadamard_vec(tr, oa, ob)
        if key == ("ij", "ij", "ij"):
            return k_hadamard(tr, oa, ob)
        if key == ("ij", "j", "i") and not isinstance(oa, (ConstArray, SymScalar)):
            return k_matvec(tr, oa, ob)
        if key == ("ij", "ik", "jk"):
            return k_gram(tr, oa, ob)
        if key == ("ij", "jk", "ik"):
            return k_matmul(tr, oa, ob)
        if key == ("ij", "ik", "ij"):
            return k_es9(tr, oa, ob)
        if key == ("ij", "i", "ij") and not isinstance(ob, (ConstArray, SymScalar)):
            return k_scale_rows(tr, oa, ob)
        if key[0] == "" and isinstance(oa, (SymScalar, int, float)):
            if key[1] == key[2] and key[1]:
                return k_scale(tr, ob, oa)
    raise NotImplementedError(f"einsum pattern {s1},{s2}->{out} not reducible to kernels")


def k_hadamard_vec(tr: Translator, v1, v2) -> SymArray:
    em = _Emitter(tr)
    a1, x1 = em.atom(v1.rel, 2)
    a2, x2 = em.atom(v2.rel, 2)
    x2[0] = x1[0]
    a2 = RelAtom(a2.rel, tuple(x2))
    s = tr.fresh_var("a")
    body = [a1, a2, Assign(s, Agg("sum", BinOp("*", Var(x1[1]), Var(x2[1]))))]
    rel = em.rule(["id", "c0"], [x1[0], s], body, group=(x1[0],))
    return SymArray(rel, 1, "dense", 1)


def _dense_unary(tr: Translator, spec: str, op, out: str):
    if spec == out:
        return op
    if len(spec) == 2 and spec[0] == spec[1]:
        d = k_diag(tr, op)
        return d if out else k_total(tr, d)
    if len(spec) == 2 and spec[0] != spec[1]:
        if out == spec[0]:
            return k_rowsum(tr, op)
        if out == spec[1]:
            return k_colsum(tr, op)
        if out == "":
            return k_total(tr, op)
        if out == spec[::-1]:
            return k_transpose(tr, op)
    if len(spec) == 1 and out == "":
        return k_total(tr, op)
    raise NotImplementedError(f"einsum pattern {spec}->{out}")


def translate_einsum(tr: Translator, spec: str, ops) -> object:
    """Translate ``np.einsum(spec, *ops)`` into TondIR rules."""
    spec = spec.replace(" ", "")
    if "->" not in spec:
        raise NotImplementedError("einsum requires an explicit '->' output")
    lhs, out = spec.split("->")
    in_specs = lhs.split(",")
    ops = list(ops)
    if len(in_specs) != len(ops):
        raise ValueError("einsum operand count mismatch")

    if any(isinstance(o, SymArray) and o.layout == "coo" for o in ops):
        if len(in_specs) > 2:
            in_specs, ops = _pairwise(tr, in_specs, ops, out, sparse=True)
        return _sparse_einsum(tr, in_specs, out, ops)

    # n-ary -> binary by greedy pairwise contraction
    while len(in_specs) > 2:
        in_specs, ops = _pairwise(tr, in_specs, ops, out, sparse=False)

    if len(in_specs) == 1:
        s, op = _pre_reduce(tr, in_specs[0], ops[0], set(), out)
        return _dense_unary(tr, s, op, out)

    s1, s2 = in_specs
    s1, op1 = _pre_reduce(tr, s1, ops[0], set(s2), out)
    s2, op2 = _pre_reduce(tr, s2, ops[1], set(s1), out)
    return _dense_binary(tr, s1, op1, s2, op2, out)


def _pairwise(tr: Translator, in_specs, ops, out, *, sparse: bool):
    """Contract the first two operands (greedy pairwise plan)."""
    s1, s2 = in_specs[0], in_specs[1]
    rest_labels = set("".join(in_specs[2:])) | set(out)
    inter_out = "".join(dict.fromkeys([l for l in s1 + s2 if l in rest_labels]))
    if sparse:
        mid = _sparse_einsum(tr, [s1, s2], inter_out, ops[:2])
    else:
        mid = translate_einsum(tr, f"{s1},{s2}->{inter_out}", ops[:2])
    return [inter_out] + in_specs[2:], [mid] + ops[2:]


# --------------------------------------------------------------------------
# Other NumPy array APIs (Table V)
# --------------------------------------------------------------------------


def array_method(tr: Translator, arr: SymArray, name: str, args, kwargs):
    from .frontend import ColRef, SymFrame

    if name == "sum":
        axis = kwargs.get("axis", args[0] if args else None)
        if arr.ndim == 1 or axis is None:
            return k_total(tr, arr)
        return k_rowsum(tr, arr) if axis == 1 else k_colsum(tr, arr)
    if name == "all":
        # all-set check via min over the values (paper Table V)
        em = _Emitter(tr)
        n = arr.n_cols if arr.ndim == 2 else 1
        a, vs = em.atom(arr.rel, n + 1)
        m = tr.fresh_var("a")
        inner = _mul([Var(v) for v in vs[1:]]) if n > 1 else Var(vs[1])
        body = [a, Assign(m, Agg("min", inner))]
        rel = em.rule(["v0"], [m], body)
        return SymScalar(ScalarRef(rel, "v0"))
    if name == "nonzero":
        cols = list(tr.rel_cols(arr.rel))
        f = SymFrame(arr.rel, cols)
        return tr.emit_select(
            f, [("id", ColRef(arr.rel, "id"))],
            filters=[BinOp("!=", ColRef(arr.rel, cols[1]), Const(0))],
        )
    if name == "round":
        from .ir import Ext

        cols = list(tr.rel_cols(arr.rel))
        f = SymFrame(arr.rel, cols)
        out = [("id", ColRef(arr.rel, "id"))]
        for c in cols[1:]:
            out.append((c, Ext("round", (ColRef(arr.rel, c), Const(0)))))
        g = tr.emit_select(f, out)
        return SymArray(g.rel, arr.ndim, "dense", arr.n_cols, arr.n_rows)
    if name == "compress":
        mask = args[0]
        if isinstance(mask, ConstArray):
            mask = [bool(x) for x in mask.values]
        keep = [i for i, m in enumerate(mask) if m]
        cols = list(tr.rel_cols(arr.rel))
        f = SymFrame(arr.rel, cols)
        out = [("id", ColRef(arr.rel, "id"))]
        for new_i, i in enumerate(keep):
            out.append((f"c{new_i}", ColRef(arr.rel, f"c{i}")))
        g = tr.emit_select(f, out)
        return SymArray(g.rel, arr.ndim, "dense", len(keep), arr.n_rows)
    if name == "transpose":
        return k_transpose(tr, arr)
    raise NotImplementedError(f"array method {name}")
