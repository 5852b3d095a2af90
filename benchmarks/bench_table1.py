"""Table 1 — "Compilation time in secs": DIABLO vs MOLD-like vs
CASPER-like translator time on the 16 Table-1 programs.

Paper shape to reproduce: DIABLO compile times are small and flat
(5–14.5 s there, including Scala byte-code generation; milliseconds
here, pure translation) while the search-based baselines are orders of
magnitude slower and fail on the complex programs (MOLD: PageRank and
Matrix Factorization have no template; CASPER: fail on MatMul, KMeans,
PCA and the multi-phase programs).

Run: ``pytest benchmarks/bench_table1.py --benchmark-only``.
"""
import pytest

from repro.baselines import casper_like, mold_like
from repro.core.pipeline import compile_program
from repro.programs.suite import PROGRAMS, build_envs

T1 = [p for p in PROGRAMS if "t1" in p.tables]
IDS = [p.name for p in T1]


def _types(prog):
    _, _, types = build_envs(prog, "tiny", None)
    return types


@pytest.mark.parametrize("prog", T1, ids=IDS)
def test_diablo_compile(benchmark, prog):
    types = _types(prog)
    benchmark.extra_info["system"] = "DIABLO"
    benchmark.extra_info["paper_secs"] = prog.paper_t1["diablo"]
    out = benchmark(compile_program, prog.source, types)
    assert out.code  # really compiled


@pytest.mark.parametrize("prog", T1, ids=IDS)
def test_mold_translate(benchmark, prog):
    outcome = {}

    def run():
        try:
            mold_like.translate(prog.source, max_states=4000)
            outcome["r"] = "ok"
        except mold_like.MoldFail:
            outcome["r"] = "fail"

    benchmark.extra_info["system"] = "MOLD-like"
    benchmark.extra_info["paper_secs"] = prog.paper_t1["mold"]
    benchmark(run)
    benchmark.extra_info["outcome"] = outcome["r"]
    # the paper: MOLD cannot translate PageRank or Matrix Factorization
    if prog.name in ("PageRank", "Matrix Factorization"):
        assert outcome["r"] == "fail"


@pytest.mark.parametrize("prog", T1, ids=IDS)
def test_casper_translate(benchmark, prog):
    outcome = {}

    def run():
        try:
            casper_like.translate(prog.source, budget_s=20.0, max_candidates=100_000)
            outcome["r"] = "ok"
        except casper_like.CasperFail:
            outcome["r"] = "fail"

    benchmark.extra_info["system"] = "CASPER-like"
    benchmark.extra_info["paper_secs"] = prog.paper_t1["casper"]
    benchmark.pedantic(run, rounds=3, iterations=1)
    benchmark.extra_info["outcome"] = outcome["r"]
    if prog.name in ("Matrix Multiplication", "KMeans", "PCA"):
        assert outcome["r"] == "fail"  # paper Table 1 'fail' rows
