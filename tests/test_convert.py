"""Array representation conversions (DataFrame dicts, canonical values)."""
import pytest

from repro.core import ast as A
from repro.core.convert import (
    approx_dict_equal,
    df_to_dict,
    dict_to_df,
)

VEC_D = A.TArray(1, A.TBasic("double"))
MAT_D = A.TArray(2, A.TBasic("double"))
VEC_T = A.TArray(1, A.TTuple((A.TBasic("double"), A.TBasic("long"))))
VEC_R = A.TArray(1, A.TRecord((("a", A.TBasic("long")), ("b", A.TBasic("double")))))


def test_vector_roundtrip(spark):
    d = {0: 1.5, 3: 2.5}
    assert df_to_dict(dict_to_df(spark, d, VEC_D), 1) == d


def test_matrix_roundtrip(spark):
    d = {(0, 1): 1.0, (2, 2): 3.0}
    assert df_to_dict(dict_to_df(spark, d, MAT_D), 2) == d


def test_tuple_values_roundtrip(spark):
    d = {0: (1.5, 2), 1: (0.5, 7)}
    assert df_to_dict(dict_to_df(spark, d, VEC_T), 1) == d


def test_record_values_roundtrip(spark):
    d = {0: {"a": 1, "b": 2.0}}
    assert df_to_dict(dict_to_df(spark, d, VEC_R), 1) == d


def test_string_keys_roundtrip(spark):
    t = A.TArray(1, A.TBasic("long"), A.TBasic("string"))
    d = {"x": 1, "y": 2}
    assert df_to_dict(dict_to_df(spark, d, t), 1) == d


def test_approx_equal_tolerance():
    assert approx_dict_equal({0: 1.0}, {0: 1.0 + 1e-9})
    assert not approx_dict_equal({0: 1.0}, {0: 1.01})


def test_approx_equal_key_mismatch():
    assert not approx_dict_equal({0: 1.0}, {1: 1.0})


def test_approx_equal_tuples():
    assert approx_dict_equal({0: (1.0, 2)}, {0: (1.0 + 1e-9, 2)})
    assert not approx_dict_equal({0: (1.0, 2)}, {0: (1.0, 3)})
