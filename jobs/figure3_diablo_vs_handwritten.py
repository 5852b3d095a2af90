"""Reproduce paper Figure 3 (as a table): DIABLO-generated vs
hand-written Spark programs on the Table-2 workloads.

The paper's qualitative result: generated code is comparable to
hand-written Spark except for KMeans (hand-written broadcasts the
centroids; DIABLO joins an RDD of centroids), with extra generated
joins also visible in PageRank and Matrix Factorization.

Run: ``spark-submit jobs/figure3_diablo_vs_handwritten.py``.
"""
import time

from _session import get_spark, print_table  # noqa: E402

from repro.core import ast as A
from repro.core.pipeline import compile_program, run_program
from repro.programs.handwritten import HANDWRITTEN
from repro.programs.suite import BY_NAME, build_envs


def force_dfs(d):
    for v in d.values():
        if hasattr(v, "write"):
            v.write.format("noop").mode("overwrite").save()


def main():
    spark = get_spark("figure3")
    rows = []
    for name in sorted(HANDWRITTEN):
        prog = BY_NAME[name]
        spark_env, _, types = build_envs(prog, "bench", spark)
        for k, v in spark_env.items():
            if hasattr(v, "persist"):
                spark_env[k] = v.persist()
                spark_env[k].count()
        compiled = compile_program(prog.source, types)

        def run_diablo():
            env = run_program(compiled, spark_env, spark)
            force_dfs({k: env[k] for k in prog.outputs
                       if hasattr(env.get(k), "write")})

        def run_hand():
            force_dfs(HANDWRITTEN[name](spark_env))

        times = {}
        for label, fn in (("diablo", run_diablo), ("hand", run_hand)):
            fn()  # warmup
            samples = []
            for _ in range(2):
                t0 = time.perf_counter()
                fn()
                samples.append(time.perf_counter() - t0)
            times[label] = min(samples)
        for v in spark_env.values():
            if hasattr(v, "unpersist"):
                v.unpersist()
        ratio = times["diablo"] / times["hand"]
        rows.append([name, f"{times['diablo']:.2f}", f"{times['hand']:.2f}",
                     f"{ratio:.2f}x"])
        print(f"done {name}: diablo={times['diablo']:.2f}s "
              f"hand={times['hand']:.2f}s")
    print_table(
        "Figure 3 (as a table) — DIABLO-generated vs hand-written Spark, "
        "secs on local[*]",
        ["program", "DIABLO (ours)", "hand-written (ours)", "ratio"],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main()
