"""Tiled matrices (Section 5): pack/unpack round-trips and tiled
operators agreeing with the sparse reference and the DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data as sd
from repro.core.convert import df_to_dict
from repro.oracle import assert_equivalent
from repro.tiling.tiled import pack, sparse_matmul, tiled_add, tiled_matmul, unpack


@pytest.fixture(scope="module")
def mats(spark):
    M = sd.dense_matrix(8, 8, seed=31)
    N = sd.dense_matrix(8, 8, seed=32)
    return M, N, M.df(spark), N.df(spark)


def test_pack_unpack_roundtrip(mats, spark):
    M, _, Mdf, _ = mats
    t = pack(Mdf, 4, 4)
    back = df_to_dict(unpack(t, 4, 4), 2)
    assert back == pytest.approx(M.dict())


def test_pack_tile_count(mats, spark):
    _, _, Mdf, _ = mats
    t = pack(Mdf, 4, 4)
    assert t.count() == 4  # 8x8 in 4x4 tiles


def test_pack_nonsquare_tiles(mats, spark):
    _, _, Mdf, _ = mats
    t = pack(Mdf, 2, 4)
    assert t.count() == 8
    back = df_to_dict(unpack(t, 2, 4), 2)
    assert len(back) == 64


def test_pack_sparse_fills_zero(spark):
    from repro.core import ast as A
    from repro.core.convert import dict_to_df

    MAT_D = A.TArray(2, A.TBasic("double"))
    df = dict_to_df(spark, {(0, 0): 5.0, (3, 3): 7.0}, MAT_D)
    t = pack(df, 4, 4)
    back = df_to_dict(unpack(t, 4, 4), 2)
    assert back[(0, 0)] == 5.0 and back[(3, 3)] == 7.0
    assert back[(1, 2)] == 0.0 and len(back) == 16


def test_tiled_add_equals_sparse(mats, spark):
    M, N, Mdf, Ndf = mats
    got = df_to_dict(unpack(tiled_add(pack(Mdf, 4, 4), pack(Ndf, 4, 4)), 4, 4), 2)
    want = {k: M.dict()[k] + N.dict()[k] for k in M.dict()}
    assert got == pytest.approx(want)


def test_tiled_matmul_equals_sparse(mats, spark):
    _, _, Mdf, Ndf = mats
    got = df_to_dict(unpack(tiled_matmul(pack(Mdf, 4, 4), pack(Ndf, 4, 4), 4), 4, 4), 2)
    want = df_to_dict(sparse_matmul(Mdf, Ndf), 2)
    assert got == pytest.approx(want)


def test_tiled_matmul_oracle(mats, spark):
    M, N, Mdf, Ndf = mats
    got = unpack(tiled_matmul(pack(Mdf, 4, 4), pack(Ndf, 4, 4), 4), 4, 4).select(
        F.col("_k1").alias("i"), F.col("_k2").alias("j"), F.col("_v").alias("v")
    )
    assert_equivalent(
        got,
        """
        select M._k1 as i, N._k2 as j, sum(M.v * N.v) as v
        from M join N on M._k2 = N._k1
        group by M._k1, N._k2
        """,
        M=M.pdf,
        N=N.pdf,
    )


def test_unpack_drop_zeros(spark):
    from repro.core import ast as A
    from repro.core.convert import dict_to_df

    MAT_D = A.TArray(2, A.TBasic("double"))
    df = dict_to_df(spark, {(0, 1): 5.0}, MAT_D)
    back = df_to_dict(unpack(pack(df, 2, 2), 2, 2, keep_zeros=False), 2)
    assert back == {(0, 1): 5.0}
