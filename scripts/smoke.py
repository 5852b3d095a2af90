"""Manual smoke test for the DIABLO pipeline (not part of pytest)."""
import os, sys

sys.path.insert(0, "/root/repo")
import conftest  # sets PYSPARK_SUBMIT_ARGS before pyspark import

from pyspark.sql import SparkSession

from repro.core import ast as A
from repro.core.pipeline import compile_program, run_program
from repro.core.interp import interpret
from repro.core.convert import dict_to_df, df_to_dict, approx_dict_equal
from repro.core.translate import TAssign
from repro.core.comprehension import show

spark = SparkSession.builder.appName("smoke").config(
    "spark.sql.shuffle.partitions", "4"
).config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate()
spark.sparkContext.setLogLevel("ERROR")

VEC_D = A.TArray(1, A.TBasic("double"))
MAT_D = A.TArray(2, A.TBasic("double"))

def show_code(code, ind=0):
    for st in code:
        if isinstance(st, TAssign):
            print(" " * ind + f"{st.name} := {show(st.term)}")
        elif hasattr(st, "cond"):
            print(" " * ind + f"while {show(st.cond)}:")
            show_code(st.body, ind + 2)
        else:
            print(" " * ind + repr(st))

# --- 1. conditional sum ---
src1 = """
var sum: double = 0.0;
for v in V do if (v < 100.0) sum += v;
"""
V = {i: float(v) for i, v in enumerate([5.0, 200.0, 30.0, 99.0, 150.0])}
c1 = compile_program(src1, {"V": VEC_D})
print("--- conditional sum target code:")
show_code(c1.code)
env1 = run_program(c1, {"V": dict_to_df(spark, V, VEC_D)}, spark)
ref1 = interpret(src1, {"V": V})
print("spark sum =", env1["sum"], " interp sum =", ref1["sum"])
assert abs(env1["sum"] - ref1["sum"]) < 1e-9

# --- 2. group-by increment (word count style over long keys) ---
src2 = """
var C: vector[double] = vector();
for v in W do C[v._1] += v._2;
"""
W_t = A.TArray(1, A.TTuple((A.TBasic("long"), A.TBasic("double"))))
W = {i: (k, float(x)) for i, (k, x) in enumerate([(1, 2.0), (2, 3.0), (1, 5.0), (3, 1.0)])}
c2 = compile_program(src2, {"W": W_t})
print("--- group-by target code:")
show_code(c2.code)
env2 = run_program(c2, {"W": dict_to_df(spark, W, W_t)}, spark)
got2 = df_to_dict(env2["C"], 1)
ref2 = interpret(src2, {"W": W})["C"]
print("spark:", got2, " interp:", ref2)
assert approx_dict_equal(got2, ref2)

# --- 3. matrix multiplication ---
src3 = """
var R: matrix[double] = matrix();
for i = 0, n-1 do
  for j = 0, n-1 do {
    R[i,j] := 0.0;
    for k = 0, n-1 do
      R[i,j] += M[i,k] * N[k,j];
  };
"""
import random
random.seed(0)
n = 4
M = {(i, j): random.random() for i in range(n) for j in range(n)}
N = {(i, j): random.random() for i in range(n) for j in range(n)}
c3 = compile_program(src3, {"M": MAT_D, "N": MAT_D})
print("--- matmul target code:")
show_code(c3.code)
env3 = run_program(
    c3,
    {"M": dict_to_df(spark, M, MAT_D), "N": dict_to_df(spark, N, MAT_D), "n": n},
    spark,
)
got3 = df_to_dict(env3["R"], 2)
ref3 = interpret(src3, {"M": M, "N": N, "n": n})["R"]
assert approx_dict_equal(got3, ref3), (got3, ref3)
print("matmul OK")

# --- 4. scalar while loop ---
src4 = """
var k: long = 0;
var s: long = 0;
while (k < 5) { k += 1; s += k; };
"""
c4 = compile_program(src4)
env4 = run_program(c4, {}, spark)
assert env4["k"] == 5 and env4["s"] == 15, env4
print("while OK")

print("ALL SMOKE TESTS PASSED")
