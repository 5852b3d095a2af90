"""Hand-written Spark baselines must agree with the DIABLO translation
(they are the 'hand-written' side of the paper's Figure 3)."""
import pytest

from repro.core import ast as A
from repro.core.convert import approx_dict_equal, df_to_dict
from repro.core.pipeline import compile_program, run_program
from repro.programs.handwritten import HANDWRITTEN
from repro.programs.suite import BY_NAME, build_envs


@pytest.fixture(scope="module")
def pair_results(spark):
    out = {}
    for name, fn in HANDWRITTEN.items():
        prog = BY_NAME[name]
        spark_env, _, types = build_envs(prog, "tiny", spark)
        compiled = compile_program(prog.source, types)
        diablo = run_program(compiled, spark_env, spark)
        hand = fn(spark_env)
        out[name] = (compiled, diablo, hand)
    return out


@pytest.mark.parametrize("name", sorted(HANDWRITTEN), ids=str)
def test_handwritten_agrees_with_diablo(pair_results, name):
    compiled, diablo, hand = pair_results[name]
    for out, hv in hand.items():
        t = compiled.types.get(out)
        if isinstance(t, A.TArray):
            d = df_to_dict(diablo[out], t.ndims)
            h = df_to_dict(hv, t.ndims)
            assert approx_dict_equal(h, d), (
                f"{name}/{out}: handwritten != diablo\n"
                f"  hand={sorted(h.items())[:4]}\n  diablo={sorted(d.items())[:4]}"
            )
        else:
            d = diablo[out]
            if isinstance(d, float):
                assert abs(hv - d) <= 1e-6 * max(1.0, abs(d)), (name, out, hv, d)
            else:
                assert hv == d, (name, out, hv, d)
