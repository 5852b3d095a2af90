"""Definition-3.1 restriction checker: the paper's accept/reject cases."""
import pytest

from repro.core.parser import parse
from repro.core.restrictions import RestrictionError, check_program
from repro.programs.suite import PROGRAMS


def ok(src):
    check_program(parse(src))


def bad(src):
    with pytest.raises(RestrictionError):
        check_program(parse(src))


# ------------------------------------------------- paper's accept cases
def test_incremental_group_by_accepted():
    # Section 3.2: "for i do C[V[i].K] += V[i].D" — increments but does
    # not read C
    ok("for i = 0, 9 do C[V[i]] += W[i];")


def test_simple_copy_accepted():
    ok("for i = 1, 10 do V[i] := W[i];")


def test_matrix_copy_accepted():
    ok("for i = 1, 10 do for j = 1, 20 do M[i, j] := N[i, j];")


def test_incr_then_read_same_location_accepted():
    # Section 3.2 example: V[i] += 1 inside j-loop, W[i] := V[i] outside
    ok("for i = 0, 9 do { for j = 0, 9 do V[i] += 1; W[i] := V[i]; };")


def test_write_then_read_same_location_accepted():
    # exception (a): n[i] := V[i]; W[i] := f(n[i])
    ok("for i = 0, 9 do { n[i] := V[i]; W[i] := sqrt(n[i]); };")


def test_indirect_increment_accepted():
    # V[W[i]] += n * C[i] * C[i+1] — the paper's reader/writer example
    ok("for i = 0, 9 do V[W[i]] += n * C[i] * C[i + 1];")


def test_matmul_accepted():
    ok(
        """
        for i = 0, 9 do
          for j = 0, 9 do {
            R[i, j] := 0.0;
            for k = 0, 9 do R[i, j] += M[i, k] * N[k, j];
          };
        """
    )


# ------------------------------------------------- paper's reject cases
def test_stencil_recurrence_rejected():
    # Section 3.2: V[i] := (V[i-1] + V[i+1]) / 2 — V read and written
    bad("for i = 1, 9 do V[i] := (V[i - 1] + V[i + 1]) / 2;")


def test_scalar_temp_rejected():
    # Section 3.2: n := V[i] — n does not cover the loop indexes
    bad("for i = 0, 9 do { n := V[i]; W[i] := sqrt(n); };")


def test_fixed_scalar_temp_accepted():
    # the paper's fix: give n an array dimension
    ok("for i = 0, 9 do { n[i] := V[i]; W[i] := sqrt(n[i]); };")


def test_self_recurrence_rejected():
    bad("for i = 1, 9 do V[i] := V[i - 1];")


def test_increment_and_read_same_array_rejected():
    # V[i] += V[i-1]: aggregator/reader overlap, d1 != d2
    bad("for i = 1, 9 do V[i] += V[i - 1];")


def test_bubble_sort_swap_rejected():
    # irregular loop: swapping vector elements reads and writes V
    bad(
        """
        for i = 0, 8 do
          if (V[i] > V[i + 1]) {
            t[i] := V[i];
            V[i] := V[i + 1];
            V[i + 1] := t[i];
          };
        """
    )


def test_noncovering_write_rejected():
    # destination V[i] inside a j-loop does not cover j
    bad("for i = 0, 9 do for j = 0, 9 do V[i] := W[j];")


def test_noncovering_write_incremental_accepted():
    # the same shape is fine as an increment
    ok("for i = 0, 9 do for j = 0, 9 do V[i] += W[j];")


def test_nonaffine_write_destination_rejected():
    # indirect index in a non-incremental update
    bad("for i = 0, 9 do V[W[i]] := 1;")


def test_exception_b_context_violation_rejected():
    # the paper: M[i,j] := V[i] inside the inner loop would violate (b)
    bad(
        """
        for i = 0, 9 do
          for j = 0, 9 do {
            V[i] += 1;
            M[i, j] := V[i];
          };
        """
    )


def test_read_before_write_rejected():
    # exception (a) requires the write to precede the read
    bad("for i = 0, 9 do { W[i] := V[i]; V[i] := 0.0; };")


def test_duplicate_loop_index_rejected():
    bad("for i = 0, 9 do for i = 0, 9 do V[i] := 0;")


def test_decl_inside_for_rejected():
    bad("for i = 0, 9 do var x: double = 0.0;")


def test_while_inside_for_rejected():
    bad("for i = 0, 9 do while (V[i] > 0) V[i] -= 1;")


def test_nonincremental_scalar_write_in_for_rejected():
    bad("for v in V do s := v;")


def test_incremental_scalar_in_for_accepted():
    ok("for v in V do s += v;")


def test_if_condition_reads_participate():
    # the condition reads V[i+1], a *different* location than the V[i]
    # written in the same loop → reject (no exception applies)
    bad("for i = 0, 9 do { V[i] := 0.0; if (V[i + 1] > 0) W[i] := 1.0; };")


def test_if_condition_same_location_accepted():
    # reading the same location after the write is exception (a)
    ok("for i = 0, 9 do { V[i] := 0.0; if (V[i] > 0) W[i] := 1.0; };")


def test_matrix_factorization_accepted():
    # Section 3.2's corrected MF program (pq/err as matrices) passes
    from repro.programs.suite import MATFACT_SRC

    ok(MATFACT_SRC)


def test_kmeans_exception_b_accepted():
    from repro.programs.suite import KMEANS_SRC

    ok(KMEANS_SRC)


@pytest.mark.parametrize("prog", PROGRAMS, ids=lambda p: p.name)
def test_all_suite_programs_accepted(prog):
    ok(prog.source)
