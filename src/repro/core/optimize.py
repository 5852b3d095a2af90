"""Comprehension optimizations (paper Section 4 and Section 3.6).

* **Range elimination** (Sec. 3.6): a generator ``i ← range(lo, hi)``
  joined by equality with an index variable ``I`` of an array traversal
  becomes a predicate ``inRange(F(I), lo, hi)`` where ``F`` is the
  right inverse of the (affine) index term: handled forms are ``I = i``,
  ``I = i + c``, ``I = i - c`` (and mirrored operand orders).
* **Rule 16**: a group-by whose key binds no generator variables (the
  unit key of scalar accumulations, or all-constant keys) is removed;
  the aggregation becomes a total aggregation over all rows.
* **Rule 17**: a group-by whose key is provably unique — the key
  variables are exactly the index variables of the single generator
  before the group-by — is removed and each ``⊕/e`` reduction is
  replaced by ``e`` itself (every group is a singleton).
"""
from __future__ import annotations

from .comprehension import (
    Agg,
    BinOp,
    Call,
    Comp,
    Cond,
    Const,
    Generator,
    GroupByQ,
    InRange,
    LetQ,
    Merge,
    OuterLookup,
    Proj,
    PTuple,
    PVar,
    RangeT,
    StateRef,
    TupleT,
    UnOp,
    Var,
    free_vars,
    pat_vars,
    subst,
)
from .normalize import norm_term


def _array_index_vars(q: Generator):
    """Index variable names of a flat array-generator pattern
    ``(i1, …, in, v)`` (None if not an array traversal)."""
    if isinstance(q.source, StateRef) and isinstance(q.pat, PTuple):
        names = pat_vars(q.pat)
        return names[:-1]
    return None


def _solve_for(var: str, eq: BinOp):
    """Given ``a == b`` involving range variable ``var`` on one side as
    an affine term, return (other_term_as_inverse, ) — the term that
    ``var`` equals, expressed without ``var`` — or None.

    Handled: var == t, t == var, t == var+c, t == var-c, var+c == t,
    var-c == t  (c a constant; t any term not containing var).
    """

    def inverse(affine, other):
        # affine is an expression in var; other is the opposite side
        if isinstance(affine, Var) and affine.name == var:
            return other
        if isinstance(affine, BinOp) and affine.op in ("+", "-"):
            a, b, op = affine.left, affine.right, affine.op
            if isinstance(a, Var) and a.name == var and var not in free_vars(b):
                # var + c = other  =>  var = other - c
                return BinOp("-" if op == "+" else "+", other, b)
            if op == "+" and isinstance(b, Var) and b.name == var and var not in free_vars(a):
                return BinOp("-", other, a)
        return None

    for affine, other in ((eq.left, eq.right), (eq.right, eq.left)):
        if var in free_vars(affine) and var not in free_vars(other):
            r = inverse(affine, other)
            if r is not None:
                return r
    return None


def _eliminate_ranges(c: Comp) -> Comp:
    quals, head = list(c.quals), c.head
    changed = True
    while changed:
        changed = False
        for gi, g in enumerate(quals):
            if not (isinstance(g, Generator) and isinstance(g.source, RangeT)
                    and isinstance(g.pat, PVar)):
                continue
            var = g.pat.name
            # find a pre-group-by equality condition that determines var
            # from other bound variables
            for q in quals:
                if isinstance(q, GroupByQ):
                    break
                if not (isinstance(q, Cond) and isinstance(q.expr, BinOp)
                        and q.expr.op == "=="):
                    continue
                sol = _solve_for(var, q.expr)
                if sol is None:
                    continue
                rest = quals[:gi] + quals[gi + 1:]
                rest[rest.index(q)] = Cond(
                    InRange(sol, g.source.lo, g.source.hi)
                )
                env = {var: sol}
                quals = [_subst_qual(r, env) for r in rest]
                # the range variable may appear directly in the head of
                # a group-by-free comprehension (e.g. rule 15b keys);
                # after a group-by the head only sees the rebound key
                # variables, so this substitution is a no-op there.
                head = subst(head, env)
                changed = True
                break
            if changed:
                break
    return Comp(head, tuple(quals))


def _subst_qual(q, env):
    if isinstance(q, Generator):
        return Generator(q.pat, subst(q.source, env))
    if isinstance(q, Cond):
        return Cond(subst(q.expr, env))
    if isinstance(q, LetQ):
        return LetQ(q.pat, subst(q.expr, env))
    if isinstance(q, GroupByQ):
        return GroupByQ(q.pat, subst(q.key, env))
    if isinstance(q, OuterLookup):
        return OuterLookup(q.var, q.array, subst(q.key, env), subst(q.default, env))
    raise TypeError(f"unknown qualifier {q!r}")


def _replace_aggs(t):
    """Rule 17 helper: ``⊕/e → e`` (groups are singletons)."""
    if isinstance(t, Agg):
        return _replace_aggs(t.expr)
    if isinstance(t, BinOp):
        return BinOp(t.op, _replace_aggs(t.left), _replace_aggs(t.right))
    if isinstance(t, UnOp):
        return UnOp(t.op, _replace_aggs(t.expr))
    if isinstance(t, TupleT):
        return TupleT(tuple(_replace_aggs(x) for x in t.items))
    if isinstance(t, Call):
        return Call(t.fn, tuple(_replace_aggs(x) for x in t.args))
    if isinstance(t, Proj):
        return Proj(_replace_aggs(t.expr), t.field)
    return t


def _groupby_rules(c: Comp) -> Comp:
    quals = list(c.quals)
    for qi, q in enumerate(quals):
        if not isinstance(q, GroupByQ):
            continue
        pre = quals[:qi]
        gen_vars = set()
        for p in pre:
            if isinstance(p, (Generator,)):
                gen_vars |= set(pat_vars(p.pat))

        key_free = free_vars(q.key)
        if not (key_free & gen_vars) and not any(
            isinstance(r, OuterLookup) for r in quals[qi + 1:]
        ):
            # Rule 16: constant key — total aggregation; bind the key
            # pattern with a let and drop the group-by. Array increments
            # (which carry an OuterLookup for the pre-update value) keep
            # the group-by: grouping by a constant column preserves the
            # no-op-on-empty-input semantics, which a total aggregation
            # (always one row) would not.
            new = pre + [LetQ(q.pat, q.key)] + quals[qi + 1:]
            return Comp(c.head, tuple(new))

        # Rule 17: unique key — exactly one generator before the
        # group-by, and the key variables are precisely its index set.
        gens = [p for p in pre if isinstance(p, Generator)]
        if len(gens) == 1:
            g = gens[0]
            if isinstance(g.source, RangeT) and isinstance(g.pat, PVar):
                idx = [g.pat.name]
            else:
                idx = _array_index_vars(g)
            key_vars = (
                [x.name for x in q.key.items if isinstance(x, Var)]
                if isinstance(q.key, TupleT)
                else ([q.key.name] if isinstance(q.key, Var) else None)
            )
            if (
                idx is not None
                and key_vars is not None
                and (not isinstance(q.key, TupleT)
                     or all(isinstance(x, Var) for x in q.key.items))
                and set(key_vars) == set(idx)
                and len(key_vars) == len(idx)
            ):
                new = pre + [LetQ(q.pat, q.key)] + [
                    _map_qual_aggs(r) for r in quals[qi + 1:]
                ]
                return Comp(_replace_aggs(c.head), tuple(new))
        break  # at most one group-by per comprehension in our pipeline
    return c


def _map_qual_aggs(q):
    if isinstance(q, Cond):
        return Cond(_replace_aggs(q.expr))
    if isinstance(q, LetQ):
        return LetQ(q.pat, _replace_aggs(q.expr))
    if isinstance(q, OuterLookup):
        return OuterLookup(
            q.var, q.array, _replace_aggs(q.key), _replace_aggs(q.default)
        )
    return q


# identity constants for tuple-monoid expansion
_SCALAR_IDENT = {
    "+": Const(0),
    "*": Const(1),
    "min": Const(float("inf")),
    "max": Const(float("-inf")),
    "&&": Const(True),
    "||": Const(False),
}


def _expand_tuple_monoids(c: Comp) -> Comp:
    """Rewrite tuple-valued reductions into per-component scalar ones.

    An incremental update with a tuple value (the paper's ``Avg``-style
    monoid, e.g. ``avg[k] += (x, y, 1)``) produces a head term
    ``w ⊕ (⊕/ (e1, …, en))``. Backends only aggregate scalars, so this
    becomes ``(w._1 ⊕ ⊕/e1, …, w._n ⊕ ⊕/en)`` with a null-safe
    ``coalesce(w._i, identity)`` for the pre-update value (the outer
    lookup's default switches to NULL). ``argmin`` is intrinsically
    tuple-typed and is left alone."""

    def rewrite(t, lookups):
        if isinstance(t, BinOp) and t.op in _SCALAR_IDENT:
            rhs = t.right
            items = None
            if isinstance(rhs, Agg) and rhs.monoid == t.op and isinstance(rhs.expr, TupleT):
                items = [Agg(t.op, x) for x in rhs.expr.items]
            elif isinstance(rhs, TupleT):  # rule 17 already removed the Agg
                items = list(rhs.items)
            if items is not None:
                w = t.left
                ident = _SCALAR_IDENT[t.op]
                if isinstance(w, Var):
                    lookups.add(w.name)
                return TupleT(tuple(
                    BinOp(
                        t.op,
                        Call("coalesce", (Proj(w, f"_{i + 1}"), ident)),
                        x,
                    )
                    for i, x in enumerate(items)
                ))
            return BinOp(t.op, rewrite(t.left, lookups), rewrite(t.right, lookups))
        if isinstance(t, TupleT):
            return TupleT(tuple(rewrite(x, lookups) for x in t.items))
        return t

    lookups: set = set()
    head = rewrite(c.head, lookups)
    if head == c.head:
        return c
    quals = tuple(
        OuterLookup(q.var, q.array, q.key, Const(None))
        if isinstance(q, OuterLookup) and q.var in lookups
        else q
        for q in c.quals
    )
    return Comp(head, quals)


def optimize_term(t):
    """Apply all optimizations bottom-up, then re-normalize."""
    if isinstance(t, Comp):
        t = Comp(
            optimize_term(t.head),
            tuple(_opt_qual(q) for q in t.quals),
        )
        t = _eliminate_ranges(t)
        t = _groupby_rules(t)
        t = _expand_tuple_monoids(t)
        return norm_term(t)
    if isinstance(t, Merge):
        return Merge(optimize_term(t.old), optimize_term(t.new))
    if isinstance(t, BinOp):
        return BinOp(t.op, optimize_term(t.left), optimize_term(t.right))
    if isinstance(t, UnOp):
        return UnOp(t.op, optimize_term(t.expr))
    if isinstance(t, TupleT):
        return TupleT(tuple(optimize_term(x) for x in t.items))
    if isinstance(t, Call):
        return Call(t.fn, tuple(optimize_term(x) for x in t.args))
    if isinstance(t, Agg):
        return Agg(t.monoid, optimize_term(t.expr))
    if isinstance(t, Proj):
        return Proj(optimize_term(t.expr), t.field)
    return t


def _opt_qual(q):
    if isinstance(q, Generator):
        return Generator(q.pat, optimize_term(q.source))
    if isinstance(q, Cond):
        return Cond(optimize_term(q.expr))
    if isinstance(q, LetQ):
        return LetQ(q.pat, optimize_term(q.expr))
    if isinstance(q, GroupByQ):
        return GroupByQ(q.pat, optimize_term(q.key))
    if isinstance(q, OuterLookup):
        return OuterLookup(q.var, q.array, optimize_term(q.key), optimize_term(q.default))
    raise TypeError(f"unknown qualifier {q!r}")


def optimize_code(code):
    from .translate import TAssign, TInit, TWhile

    out = []
    for st in code:
        if isinstance(st, TAssign):
            out.append(TAssign(st.name, optimize_term(st.term)))
        elif isinstance(st, TWhile):
            out.append(TWhile(optimize_term(st.cond), optimize_code(st.body)))
        elif isinstance(st, TInit):
            out.append(st)
        else:
            raise TypeError(f"unknown target statement {st!r}")
    return out
