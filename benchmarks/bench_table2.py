"""Table 2 — "Parallel (par) vs Sequential (seq) evaluation time in
secs": the same DIABLO-compiled program executed by the Spark
``local[*]`` backend (par) and by the sequential-collections backend
(seq) over identical data.

Paper shape to reproduce: parallel evaluation wins for all programs
except Group-By and KMeans, where the sequential evaluation is
competitive or faster. (Our sequential substrate uses hash-based
collections rather than Scala cons lists, so the pathological
Matrix-Addition seq time of the paper — positional list indexing —
does not recur; see EXPERIMENTS.md.)

Run: ``pytest benchmarks/bench_table2.py --benchmark-only``.
"""
import pytest

from repro.core import ast as A
from repro.core.pipeline import compile_program, run_program
from repro.core.seq_backend import run_program_seq
from repro.programs.suite import PROGRAMS, build_envs

T2 = [p for p in PROGRAMS if "t2" in p.tables]
IDS = [p.name for p in T2]

_cache: dict = {}
_uses: dict = {}


def _prepared(prog, spark):
    """Build (compiled, spark_env, dict_env) once per program; evict
    after both the par and the seq benchmark consumed it."""
    if prog.name not in _cache:
        spark_env, dict_env, types = build_envs(prog, "bench", spark)
        for k, v in spark_env.items():
            if hasattr(v, "persist"):
                spark_env[k] = v.persist()
                spark_env[k].count()  # materialize the input, untimed
        compiled = compile_program(prog.source, types)
        _cache[prog.name] = (compiled, spark_env, dict_env)
        _uses[prog.name] = 0
    _uses[prog.name] += 1
    return _cache[prog.name]


def _release(prog):
    if _uses.get(prog.name, 0) >= 2:
        compiled, spark_env, _ = _cache.pop(prog.name)
        for v in spark_env.values():
            if hasattr(v, "unpersist"):
                v.unpersist()
        _uses.pop(prog.name)


def _force(env, compiled):
    """Materialize every array output (noop write executes the full
    plan; count() alone would let Catalyst prune value columns)."""
    for name, t in compiled.types.items():
        if isinstance(t, A.TArray) and hasattr(env.get(name), "write"):
            env[name].write.format("noop").mode("overwrite").save()


@pytest.mark.parametrize("prog", T2, ids=IDS)
def test_par(benchmark, spark, prog):
    compiled, spark_env, _ = _prepared(prog, spark)
    benchmark.extra_info["system"] = "par (Spark local[*])"
    benchmark.extra_info["paper_secs"] = prog.paper_t2["par"]

    def run():
        env = run_program(compiled, spark_env, spark)
        _force(env, compiled)
        return env

    benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    _release(prog)


@pytest.mark.parametrize("prog", T2, ids=IDS)
def test_seq(benchmark, spark, prog):
    compiled, _, dict_env = _prepared(prog, spark)
    benchmark.extra_info["system"] = "seq (Python collections)"
    benchmark.extra_info["paper_secs"] = prog.paper_t2["seq"]
    benchmark.pedantic(
        lambda: run_program_seq(compiled, dict_env), rounds=1, iterations=1
    )
    _release(prog)
