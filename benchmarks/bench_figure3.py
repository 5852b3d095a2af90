"""Figure 3 (reproduced as a table) — DIABLO-generated vs hand-written
Spark programs on the Table 2 workloads.

Paper shape to reproduce: DIABLO-generated code is comparable to
hand-written Spark for the simple programs and matrices, and clearly
slower for KMeans (the hand-written version broadcasts the centroids
while DIABLO joins against a centroid RDD), with PageRank and Matrix
Factorization also paying for extra generated joins.

Run: ``pytest benchmarks/bench_figure3.py --benchmark-only``.
"""
import pytest

from repro.core import ast as A
from repro.core.pipeline import compile_program, run_program
from repro.programs.handwritten import HANDWRITTEN
from repro.programs.suite import BY_NAME, build_envs

NAMES = sorted(HANDWRITTEN)

_cache: dict = {}
_uses: dict = {}


def _prepared(name, spark):
    if name not in _cache:
        prog = BY_NAME[name]
        spark_env, _, types = build_envs(prog, "bench", spark)
        for k, v in spark_env.items():
            if hasattr(v, "persist"):
                spark_env[k] = v.persist()
                spark_env[k].count()
        _cache[name] = (prog, compile_program(prog.source, types), spark_env)
        _uses[name] = 0
    _uses[name] += 1
    return _cache[name]


def _release(name):
    if _uses.get(name, 0) >= 2:
        _, _, spark_env = _cache.pop(name)
        for v in spark_env.values():
            if hasattr(v, "unpersist"):
                v.unpersist()
        _uses.pop(name)


def _force_dfs(d):
    for v in d.values():
        if hasattr(v, "write"):
            v.write.format("noop").mode("overwrite").save()


@pytest.mark.parametrize("name", NAMES, ids=str)
def test_diablo(benchmark, spark, name):
    prog, compiled, spark_env = _prepared(name, spark)
    benchmark.extra_info["system"] = "DIABLO-generated"

    def run():
        env = run_program(compiled, spark_env, spark)
        _force_dfs({k: env[k] for k in prog.outputs if hasattr(env.get(k), "write")})

    benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    _release(name)


@pytest.mark.parametrize("name", NAMES, ids=str)
def test_handwritten(benchmark, spark, name):
    _, _, spark_env = _prepared(name, spark)
    benchmark.extra_info["system"] = "hand-written Spark"

    def run():
        _force_dfs(HANDWRITTEN[name](spark_env))

    benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    _release(name)
