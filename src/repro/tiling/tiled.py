"""Tiled (packed) matrices — paper Section 5.

A sparse matrix ``(_k1, _k2, _v)`` is packed into fixed-size dense
tiles: a DataFrame ``(ti, tj, tile: array<double>)`` where tile cell
``(a, b)`` (row-major, ``a*m + b``) holds element
``(ti*n + a, tj*m + b)``. ``pack``/``unpack`` are the paper's
conversion comprehensions; ``tiled_add`` runs entirely inside Catalyst
(``zip_with``), and ``tiled_matmul`` joins tiles on the shared tile
coordinate and multiplies the dense blocks with NumPy
(``applyInPandas``), reducing partial blocks per output tile — the
tile is the unit of distributed processing, as in the paper."""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql import types as T

TILE_SCHEMA = T.StructType(
    [
        T.StructField("ti", T.LongType()),
        T.StructField("tj", T.LongType()),
        T.StructField("tile", T.ArrayType(T.DoubleType())),
    ]
)


def pack(df: DataFrame, n: int, m: int) -> DataFrame:
    """Sparse matrix → tiled matrix with n×m dense tiles (the paper's
    ``pack``: group elements by tile coordinate and form a dense
    block; absent elements become 0.0)."""

    def form(key, pdf):
        a = np.zeros(n * m)
        li = (pdf["_k1"].to_numpy() % n) * m + pdf["_k2"].to_numpy() % m
        a[li] = pdf["_v"].to_numpy()
        return pd.DataFrame({"ti": [key[0]], "tj": [key[1]], "tile": [a.tolist()]})

    with_coords = df.withColumn(
        "ti", ((F.col("_k1") - F.col("_k1") % n) / n).cast("long")
    ).withColumn("tj", ((F.col("_k2") - F.col("_k2") % m) / m).cast("long"))
    return with_coords.groupBy("ti", "tj").applyInPandas(form, TILE_SCHEMA)


def unpack(tiled: DataFrame, n: int, m: int, keep_zeros: bool = True) -> DataFrame:
    """Tiled matrix → sparse matrix (the paper's ``unpack``/``scan``
    comprehension, via ``posexplode``)."""
    out = tiled.select(
        "ti", "tj", F.posexplode("tile").alias("pos", "_v")
    ).select(
        (F.col("ti") * n + (F.col("pos") / m).cast("long")).alias("_k1"),
        (F.col("tj") * m + F.col("pos") % m).alias("_k2"),
        "_v",
    )
    if not keep_zeros:
        out = out.filter(F.col("_v") != 0.0)
    return out


def tiled_add(a: DataFrame, b: DataFrame) -> DataFrame:
    """Elementwise addition of two tiled matrices without leaving
    Catalyst: join on tile coordinates, ``zip_with(+)`` on the blocks."""
    bb = b.toDF("ti", "tj", "tile2")
    return a.join(bb, ["ti", "tj"]).select(
        "ti",
        "tj",
        F.zip_with("tile", "tile2", lambda x, y: x + y).alias("tile"),
    )


def tiled_matmul(a: DataFrame, b: DataFrame, n: int) -> DataFrame:
    """Product of two tiled matrices with square n×n tiles: join on the
    shared tile index, dense-multiply each block pair with NumPy, and
    sum the partial blocks per output tile."""
    aa = a.toDF("ti", "tk", "ta")
    bb = b.toDF("tk", "tj", "tb")
    joined = aa.join(bb, "tk").select("ti", "tj", "ta", "tb")

    def mult(key, pdf):
        acc = np.zeros((n, n))
        for ta, tb in zip(pdf["ta"], pdf["tb"]):
            acc += np.asarray(ta).reshape(n, n) @ np.asarray(tb).reshape(n, n)
        return pd.DataFrame(
            {"ti": [key[0]], "tj": [key[1]], "tile": [acc.ravel().tolist()]}
        )

    return joined.groupBy("ti", "tj").applyInPandas(mult, TILE_SCHEMA)


def sparse_matmul(a: DataFrame, b: DataFrame) -> DataFrame:
    """Reference sparse product (join + groupBy), for comparison."""
    aa = a.toDF("i", "k", "m")
    bb = b.toDF("k", "j", "n")
    return (
        aa.join(bb, "k")
        .groupBy(F.col("i").alias("_k1"), F.col("j").alias("_k2"))
        .agg(F.sum(F.col("m") * F.col("n")).alias("_v"))
    )
