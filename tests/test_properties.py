"""Property-based tests (hypothesis): the sequential bulk backend and
the literal interpreter agree on randomized data for representative
program shapes. (The Spark backend is covered by the e2e suite; these
run hundreds of random cases cheaply without the JVM.)"""
import hypothesis.strategies as st
from hypothesis import given, settings

from repro.core import ast as A
from repro.core.convert import approx_dict_equal
from repro.core.interp import interpret
from repro.core.pipeline import compile_program
from repro.core.seq_backend import run_program_seq

VEC_L = A.TArray(1, A.TBasic("long"))
VEC_D = A.TArray(1, A.TBasic("double"))

vec_longs = st.lists(st.integers(-100, 100), min_size=0, max_size=30).map(
    lambda xs: {i: v for i, v in enumerate(xs)}
)
vec_doubles = st.lists(
    st.floats(-1e3, 1e3, allow_nan=False), min_size=0, max_size=30
).map(lambda xs: {i: v for i, v in enumerate(xs)})


def agree(src, env, types, outs, approx=()):
    compiled = compile_program(src, types)
    seq = run_program_seq(compiled, env)
    ref = interpret(src, env)
    for o in outs:
        if o in approx:
            a, b = seq.get(o), ref.get(o)
            if isinstance(a, dict):
                assert approx_dict_equal(a, b, tol=1e-9)
            else:
                assert abs(a - b) <= 1e-9 * max(1.0, abs(a), abs(b))
        else:
            assert seq.get(o) == ref.get(o), (o, seq.get(o), ref.get(o))


@settings(max_examples=60, deadline=None)
@given(vec_longs)
def test_sum_agrees(V):
    agree(
        "var s: long = 0; for v in V do s += v;",
        {"V": V}, {"V": VEC_L}, ["s"],
    )


@settings(max_examples=60, deadline=None)
@given(vec_longs)
def test_conditional_count_agrees(V):
    agree(
        "var c: long = 0; for v in V do if (v > 0) c += 1;",
        {"V": V}, {"V": VEC_L}, ["c"],
    )


@settings(max_examples=60, deadline=None)
@given(vec_longs, st.integers(1, 5))
def test_group_by_modulo_agrees(V, k):
    # C[K[i]] += V[i] with K derived from V by modulo
    K = {i: abs(v) % k for i, v in V.items()}
    agree(
        "var C: vector[long] = vector(); for i = 0, 29 do C[K[i]] += V[i];",
        {"V": V, "K": K}, {"V": VEC_L, "K": VEC_L}, ["C"],
    )


@settings(max_examples=60, deadline=None)
@given(vec_doubles)
def test_elementwise_copy_agrees(V):
    agree(
        "var R: vector[double] = vector(); for i = 0, 29 do R[i] := V[i] * 2.0;",
        {"V": V}, {"V": VEC_D}, ["R"], approx=("R",)
    )


@settings(max_examples=40, deadline=None)
@given(vec_doubles)
def test_min_max_agree(V):
    agree(
        "var mx: double = -1e18; var mn: double = 1e18;"
        "for v in V do { mx max= v; mn min= v; };",
        {"V": V}, {"V": VEC_D}, ["mx", "mn"],
    )


@settings(max_examples=40, deadline=None)
@given(vec_longs)
def test_shifted_read_agrees(V):
    # affine index inversion: R[i] := V[i+1]
    agree(
        "var R: vector[long] = vector(); for i = 0, 28 do R[i] := V[i + 1];",
        {"V": V}, {"V": VEC_L}, ["R"],
    )


@settings(max_examples=40, deadline=None)
@given(vec_longs, vec_longs)
def test_two_array_join_agrees(Va, Vb):
    agree(
        "var s: long = 0; for i = 0, 29 do s += A[i] * B[i];",
        {"A": Va, "B": Vb}, {"A": VEC_L, "B": VEC_L}, ["s"],
    )
