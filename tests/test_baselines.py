"""MOLD-like and CASPER-like baseline translators: success/failure
profile (paper Table 1) and sanity of the synthesized artifacts."""
import pytest

from repro.baselines import casper_like, mold_like
from repro.programs.suite import BY_NAME


def src(name):
    return BY_NAME[name].source


# ------------------------------------------------------------ MOLD-like
MOLD_OK = [
    "Sum", "Count", "Average", "Conditional Count", "Conditional Sum",
    "Equal", "String Match", "Word Count", "Histogram", "Group-By",
    "Linear Regression", "Matrix Addition", "Matrix Multiplication",
    "PCA", "KMeans", "Equal Frequency",
]
MOLD_FAIL = ["PageRank", "Matrix Factorization"]


@pytest.mark.parametrize("name", MOLD_OK, ids=str)
def test_mold_succeeds(name):
    plan = mold_like.translate(src(name))
    assert plan and all(isinstance(p, str) for p in plan)


@pytest.mark.parametrize("name", MOLD_FAIL, ids=str)
def test_mold_fails(name):
    # the paper: "neither of the related systems can translate PageRank
    # or Matrix Factorization"
    with pytest.raises(mold_like.MoldFail):
        mold_like.translate(src(name), max_states=500)


def test_mold_sum_plan_shape():
    plan = mold_like.translate(src("Sum"))
    assert any("reduce" in p for p in plan)


def test_mold_wordcount_plan_shape():
    plan = mold_like.translate(src("Word Count"))
    assert any("reduceByKey" in p for p in plan)


def test_mold_matmul_plan_shape():
    plan = mold_like.translate(src("Matrix Multiplication"))
    assert any("join" in p and "reduceByKey" in p for p in plan)


def test_mold_kmeans_whole_scope_template():
    plan = mold_like.translate(src("KMeans"))
    assert "broadcast" in plan[0]


def test_mold_fission_reaches_templates():
    # Histogram needs loop fission before its three keyed folds match
    plan = mold_like.translate(src("Histogram"))
    assert len([p for p in plan if "reduceByKey" in p]) == 3


# ---------------------------------------------------------- CASPER-like
CASPER_OK = [
    "Sum", "Count", "Average", "Conditional Count", "Conditional Sum",
    "Equal", "String Match", "Word Count", "Histogram",
]
CASPER_FAIL = [
    "Matrix Multiplication", "KMeans", "PCA", "PageRank",
    "Matrix Factorization", "Linear Regression", "Equal Frequency",
]


@pytest.mark.parametrize("name", CASPER_OK, ids=str)
def test_casper_succeeds(name):
    summaries = casper_like.translate(src(name), budget_s=60.0)
    assert summaries
    outs = {s.out for s in summaries}
    assert outs <= set(BY_NAME[name].outputs) | outs  # every summary names an output


@pytest.mark.parametrize("name", CASPER_FAIL, ids=str)
def test_casper_fails(name):
    # paper Table 1: fail on MatMul/KMeans/PCA, >19 h on Linear
    # Regression (our multi-phase formulations of Equal Frequency and
    # Linear Regression are outside the flat summary grammar)
    with pytest.raises(casper_like.CasperFail):
        casper_like.translate(src(name), budget_s=10.0, max_candidates=50_000)


def test_casper_sum_summary_is_correct():
    (s,) = [x for x in casper_like.translate(src("Sum")) if x.out == "sum"]
    env = {"V": {0: 1.0, 1: 2.0, 2: 3.5}}
    assert s.evaluate(env) == 6.5


def test_casper_conditional_sum_has_filter():
    (s,) = [
        x for x in casper_like.translate(src("Conditional Sum")) if x.out == "sum"
    ]
    assert s.pred is not None and "100" in s.pred[0]
    assert s.evaluate({"V": {0: 5.0, 1: 500.0}}) == 5.0


def test_casper_wordcount_summary_keyed():
    (s,) = [x for x in casper_like.translate(src("Word Count")) if x.out == "C"]
    assert s.keyed
    assert s.evaluate({"W": {0: "a", 1: "b", 2: "a"}}) == {"a": 2, "b": 1}


def test_casper_equal_uses_first_element():
    summaries = casper_like.translate(src("Equal"))
    (s,) = [x for x in summaries if x.out == "eq"]
    assert s.evaluate({"W": {0: "x", 1: "x"}}) in (True, 1)
    assert not s.evaluate({"W": {0: "x", 1: "y"}})


def test_casper_timeout_raised():
    with pytest.raises(casper_like.CasperFail):
        casper_like.translate(src("PageRank"), budget_s=0.5)
