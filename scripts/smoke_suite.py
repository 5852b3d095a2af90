"""Run all 18 suite programs at tiny scale on all three engines and
compare results (manual driver used during development)."""
import sys, traceback

sys.path.insert(0, "/root/repo")
import conftest  # noqa: F401  (sets PYSPARK_SUBMIT_ARGS)

from pyspark.sql import SparkSession

from repro.core import ast as A
from repro.core.convert import approx_dict_equal, df_to_dict
from repro.core.interp import interpret
from repro.core.pipeline import compile_program, run_program
from repro.core.seq_backend import run_program_seq
from repro.programs.suite import PROGRAMS, build_envs

spark = (
    SparkSession.builder.appName("smoke_suite")
    .config("spark.sql.shuffle.partitions", "4")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

only = sys.argv[1:] or None
failures = []
for prog in PROGRAMS:
    if only and prog.name not in only:
        continue
    try:
        spark_env, dict_env, types = build_envs(prog, "tiny", spark)
        compiled = compile_program(prog.source, types)
        ref = interpret(prog.source, dict_env)
        seq = run_program_seq(compiled, dict_env)
        par = run_program(compiled, spark_env, spark)
        for out in prog.outputs:
            t = compiled.types.get(out)
            if isinstance(t, A.TArray):
                got = df_to_dict(par[out], t.ndims)
                want = ref[out]
                sq = seq[out]
                assert approx_dict_equal(got, want), (
                    f"{prog.name}/{out}: spark!=interp\n  spark={dict(sorted(got.items())[:6])}\n  interp={dict(sorted(want.items())[:6])}"
                )
                assert approx_dict_equal(sq, want), f"{prog.name}/{out}: seq!=interp"
            else:
                g, w, s = par[out], ref[out], seq[out]
                if isinstance(w, float):
                    assert abs(g - w) < 1e-6 * max(1, abs(w)), (prog.name, out, g, w)
                    assert abs(s - w) < 1e-6 * max(1, abs(w)), (prog.name, out, s, w)
                else:
                    assert g == w == s, (prog.name, out, g, w, s)
        print(f"OK    {prog.name}")
    except Exception as e:
        failures.append(prog.name)
        print(f"FAIL  {prog.name}: {e}")
        traceback.print_exc(limit=8)

print("\nfailures:", failures or "none")
sys.exit(1 if failures else 0)
