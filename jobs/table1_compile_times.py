"""Reproduce paper Table 1: "Compilation time in secs".

Measures the DIABLO translator (this reproduction), the MOLD-like
template-search baseline and the CASPER-like synthesis baseline on the
16 Table-1 programs, and prints them next to the paper's numbers.

Run: ``python jobs/table1_compile_times.py`` (no Spark needed — this is
pure compile time).
"""
import statistics
import time

from _session import fmt, print_table  # noqa: E402

from repro.baselines import casper_like, mold_like
from repro.core.pipeline import compile_program
from repro.programs.suite import PROGRAMS, build_envs


def timed(fn, repeat=5):
    best = []
    outcome = "ok"
    for _ in range(repeat):
        t0 = time.perf_counter()
        try:
            fn()
        except (mold_like.MoldFail, casper_like.CasperFail):
            outcome = "fail"
        best.append(time.perf_counter() - t0)
    return statistics.median(best), outcome


def main():
    rows = []
    for prog in (p for p in PROGRAMS if "t1" in p.tables):
        _, _, types = build_envs(prog, "tiny", None)
        d_t, _ = timed(lambda: compile_program(prog.source, types))
        m_t, m_o = timed(lambda: mold_like.translate(prog.source), repeat=3)
        c_t, c_o = timed(
            lambda: casper_like.translate(prog.source, budget_s=20.0), repeat=3
        )
        rows.append(
            [
                prog.name,
                fmt(prog.paper_t1["mold"]),
                "fail" if m_o == "fail" else f"{m_t * 1e3:.1f} ms",
                fmt(prog.paper_t1["casper"]),
                "fail" if c_o == "fail" else f"{c_t * 1e3:.1f} ms",
                fmt(prog.paper_t1["diablo"]),
                f"{d_t * 1e3:.1f} ms",
            ]
        )
    print_table(
        "Table 1 — compilation time (paper: secs on a 2.7 GHz i5; "
        "ours: translator time, no JVM byte-code stage)",
        [
            "program",
            "MOLD (paper s)",
            "MOLD-like (ours)",
            "Casper (paper s)",
            "Casper-like (ours)",
            "DIABLO (paper s)",
            "DIABLO (ours)",
        ],
        rows,
    )


if __name__ == "__main__":
    main()
