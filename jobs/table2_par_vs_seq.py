"""Reproduce paper Table 2: "Parallel (par) vs Sequential (seq)
evaluation time in secs".

Each of the 12 Table-2 programs is compiled once by DIABLO and executed
(a) on Spark ``local[*]`` (par) and (b) on the sequential-collections
backend (seq), over identical synthetic data at laptop scale.

Run: ``spark-submit jobs/table2_par_vs_seq.py`` or
``python jobs/table2_par_vs_seq.py``.
"""
import time

from _session import fmt, get_spark, print_table  # noqa: E402

from repro.core import ast as A
from repro.core.pipeline import compile_program, run_program
from repro.core.seq_backend import run_program_seq
from repro.programs.suite import PROGRAMS, build_envs


def force(env, compiled):
    for name, t in compiled.types.items():
        if isinstance(t, A.TArray) and hasattr(env.get(name), "write"):
            env[name].write.format("noop").mode("overwrite").save()


def main():
    spark = get_spark("table2")
    rows = []
    for prog in (p for p in PROGRAMS if "t2" in p.tables):
        spark_env, dict_env, types = build_envs(prog, "bench", spark)
        n_input = max(
            (len(v) for v in dict_env.values() if isinstance(v, dict)), default=0
        )
        for k, v in spark_env.items():
            if hasattr(v, "persist"):
                spark_env[k] = v.persist()
                spark_env[k].count()
        compiled = compile_program(prog.source, types)

        # par: warmup once, then best of 2
        force(run_program(compiled, spark_env, spark), compiled)
        par = []
        for _ in range(2):
            t0 = time.perf_counter()
            force(run_program(compiled, spark_env, spark), compiled)
            par.append(time.perf_counter() - t0)

        seq = []
        for _ in range(2):
            t0 = time.perf_counter()
            run_program_seq(compiled, dict_env)
            seq.append(time.perf_counter() - t0)

        for v in spark_env.values():
            if hasattr(v, "unpersist"):
                v.unpersist()
        rows.append(
            [
                prog.name,
                n_input,
                fmt(prog.paper_t2["par"], 1),
                f"{min(par):.2f}",
                fmt(prog.paper_t2["seq"], 1),
                f"{min(seq):.2f}",
            ]
        )
        print(f"done {prog.name}: par={min(par):.2f}s seq={min(seq):.2f}s")
    print_table(
        "Table 2 — par vs seq evaluation time in secs "
        "(paper: 24-core Xeon, Scala collections; ours: 16-core local[*] "
        "Spark vs sequential Python collections)",
        ["program", "input rows (ours)", "par (paper)", "par (ours)",
         "seq (paper)", "seq (ours)"],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main()
