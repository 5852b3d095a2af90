"""Comprehension IR utilities: free variables, substitution, printing."""
from repro.core.comprehension import (
    Agg,
    BinOp,
    Comp,
    Cond,
    Const,
    Generator,
    GroupByQ,
    LetQ,
    Merge,
    OuterLookup,
    Proj,
    PTuple,
    PVar,
    RangeT,
    StateRef,
    TupleT,
    Var,
    fresh,
    free_vars,
    pat_vars,
    show,
    subst,
)


def test_fresh_names_unique():
    names = {fresh("x") for _ in range(100)}
    assert len(names) == 100


def test_pat_vars_nested():
    p = PTuple((PVar("a"), PTuple((PVar("b"), PVar("c")))))
    assert pat_vars(p) == ["a", "b", "c"]


def test_free_vars_simple():
    assert free_vars(BinOp("+", Var("a"), Const(1))) == {"a"}


def test_free_vars_stateref_excluded():
    assert free_vars(BinOp("+", StateRef("s"), Var("a"))) == {"a"}


def test_free_vars_generator_binds():
    c = Comp(Var("v"), (Generator(PTuple((PVar("i"), PVar("v"))), StateRef("V")),))
    assert free_vars(c) == set()


def test_free_vars_generator_source_free():
    c = Comp(Var("v"), (Generator(PVar("v"), Var("A")),))
    assert free_vars(c) == {"A"}


def test_free_vars_groupby_key():
    c = Comp(
        Var("k"),
        (
            Generator(PTuple((PVar("i"), PVar("v"))), StateRef("V")),
            GroupByQ(PVar("k"), Var("i")),
        ),
    )
    assert free_vars(c) == set()


def test_free_vars_outer_lookup():
    c = Comp(
        Var("w"),
        (OuterLookup("w", "V", Var("k"), Const(0)),),
    )
    assert free_vars(c) == {"k"}


def test_subst_var():
    assert subst(Var("a"), {"a": Const(3)}) == Const(3)


def test_subst_into_binop():
    t = subst(BinOp("+", Var("a"), Var("b")), {"a": Const(1)})
    assert t == BinOp("+", Const(1), Var("b"))


def test_subst_respects_comp_binding():
    # a is rebound by the generator; only the source occurrence changes
    c = Comp(Var("a"), (Generator(PVar("a"), Var("a")),))
    out = subst(c, {"a": StateRef("X")})
    assert out == Comp(Var("a"), (Generator(PVar("a"), StateRef("X")),))


def test_subst_into_lookup_key():
    q = Comp(Var("w"), (OuterLookup("w", "V", Var("k"), Const(0)),))
    out = subst(q, {"k": Const(5)})
    assert out.quals[0].key == Const(5)


def test_show_roundtrips_structure():
    c = Comp(
        TupleT((Var("k"), Agg("+", Var("v")))),
        (
            Generator(PTuple((PVar("i"), PVar("v"))), StateRef("V")),
            GroupByQ(PVar("k"), Var("i")),
        ),
    )
    s = show(c)
    assert "group by" in s and "+/v" in s and "$V" in s


def test_show_merge():
    s = show(Merge(StateRef("V"), Comp(Const(1), ())))
    assert "<|" in s


def test_show_range_and_proj():
    assert show(RangeT(Const(0), Const(9))) == "range(0, 9)"
    assert show(Proj(Var("p"), "red")) == "p.red"
