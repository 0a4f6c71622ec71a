"""Coreset construction by row sampling (paper §3.1).

* ``uniform_sample`` — order by a seeded ``rand()`` and take the first
  ``size`` rows: a deterministic uniform sample without replacement,
  expressed entirely in Catalyst.
* ``stratified_sample`` — proportional allocation per label value via a
  ``row_number`` window over a seeded random order within each stratum,
  so no label is overlooked (the paper's motivation for stratification).

Both return exactly ``min(size, count)`` rows and are deterministic in
``seed`` for a fixed input.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

__all__ = ["uniform_sample", "stratified_sample", "build_coreset"]


def uniform_sample(df: DataFrame, size: int, seed: int = 0) -> DataFrame:
    return (df.withColumn("__r", F.rand(seed))
              .orderBy("__r").limit(size).drop("__r"))


def stratified_sample(df: DataFrame, size: int, label_col: str,
                      seed: int = 0) -> DataFrame:
    n = df.count()
    if n <= size:
        return df
    frac = size / n
    w = Window.partitionBy(label_col).orderBy(F.rand(seed))
    cnt = Window.partitionBy(label_col)
    ranked = (df.withColumn("__rn", F.row_number().over(w))
                .withColumn("__cnt", F.count(F.lit(1)).over(cnt)))
    # ceil keeps at least one row per stratum; trim the overshoot by a
    # second global pass ordered by within-stratum rank so proportions hold.
    picked = ranked.filter(F.col("__rn") <= F.ceil(F.col("__cnt") * F.lit(frac)))
    picked = (picked.withColumn("__key", F.col("__rn") / F.col("__cnt"))
                    .orderBy("__key", F.rand(seed + 1)).limit(size))
    return picked.drop("__rn", "__cnt", "__key")


def build_coreset(df: DataFrame, size: int, method: str = "uniform",
                  label_col: str | None = None, seed: int = 0) -> DataFrame:
    """Dispatch on the paper's coreset methods. ``sketch`` is applied
    post-join on the numeric matrix (see ``repro.coreset.sketch``), so the
    pre-join coreset for it falls back to uniform — matching §3.1
    ("ARDA sketches tables after the join is performed")."""
    if df.count() <= size:
        return df
    if method in ("uniform", "sketch"):
        return uniform_sample(df, size, seed)
    if method == "stratified":
        if label_col is None:
            raise ValueError("stratified sampling needs label_col")
        return stratified_sample(df, size, label_col, seed)
    raise ValueError(f"unknown coreset method {method!r}")
